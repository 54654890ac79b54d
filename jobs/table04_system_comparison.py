#!/usr/bin/env python
"""spark-submit entrypoint — Table 4: TC/MCF/GM across systems

Usage: spark-submit jobs/table04_system_comparison.py  (or: python jobs/table04_system_comparison.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t04_system


def main():
    spark = (
        SparkSession.builder.appName("table04_system_comparison")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t04_system.run(spark)
    spark.stop()


if __name__ == "__main__":
    main()
