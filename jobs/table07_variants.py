#!/usr/bin/env python
"""spark-submit entrypoint — Table 7: A_base vs A_split vs A_time on all datasets

Usage: spark-submit jobs/table07_variants.py  (or: python jobs/table07_variants.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t07_variants


def main():
    spark = (
        SparkSession.builder.appName("table07_variants")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t07_variants.run(spark)
    spark.stop()


if __name__ == "__main__":
    main()
