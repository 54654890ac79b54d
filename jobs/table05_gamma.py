#!/usr/bin/env python
"""spark-submit entrypoint — Table 5: effect of gamma

Usage: spark-submit jobs/table05_gamma.py  (or: python jobs/table05_gamma.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t05_06_params


def main():
    spark = (
        SparkSession.builder.appName("table05_gamma")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t05_06_params.run_gamma(spark)
    spark.stop()


if __name__ == "__main__":
    main()
