#!/usr/bin/env python
"""spark-submit entrypoint — Table 8: (tau_split, tau_time) grids

Usage: spark-submit jobs/table08_grid.py  (or: python jobs/table08_grid.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t08_grid


def main():
    spark = (
        SparkSession.builder.appName("table08_grid")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t08_grid.run(spark)
    spark.stop()


if __name__ == "__main__":
    main()
