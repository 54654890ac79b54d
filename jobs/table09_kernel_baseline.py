#!/usr/bin/env python
"""spark-submit entrypoint — Table 9: kernel-expansion baseline [31]

Usage: spark-submit jobs/table09_kernel_baseline.py  (or: python jobs/table09_kernel_baseline.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t09_11_kernel


def main():
    spark = (
        SparkSession.builder.appName("table09_kernel_baseline")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t09_11_kernel.run_t9(spark)
    spark.stop()


if __name__ == "__main__":
    main()
