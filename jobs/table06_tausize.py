#!/usr/bin/env python
"""spark-submit entrypoint — Table 6: effect of tau_size

Usage: spark-submit jobs/table06_tausize.py  (or: python jobs/table06_tausize.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t05_06_params


def main():
    spark = (
        SparkSession.builder.appName("table06_tausize")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t05_06_params.run_tsize(spark)
    spark.stop()


if __name__ == "__main__":
    main()
