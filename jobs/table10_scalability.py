#!/usr/bin/env python
"""spark-submit entrypoint — Table 10: vertical/horizontal scalability

Usage: spark-submit jobs/table10_scalability.py  (or: python jobs/table10_scalability.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t10_scalability


def main():
    spark = (
        SparkSession.builder.appName("table10_scalability")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t10_scalability.run(spark)
    spark.stop()


if __name__ == "__main__":
    main()
