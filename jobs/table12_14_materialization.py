#!/usr/bin/env python
"""spark-submit entrypoint — Tables 12-14: mining vs materialization time

Usage: spark-submit jobs/table12_14_materialization.py  (or: python jobs/table12_14_materialization.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t12_14_materialization


def main():
    spark = (
        SparkSession.builder.appName("table12_14_materialization")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    for ds in ("Patent", "YouTube", "Hyves"):
        t12_14_materialization.run(spark, dataset=ds)
    spark.stop()


if __name__ == "__main__":
    main()
