#!/usr/bin/env python
"""spark-submit entrypoint — Tables 1-2: per-task features + failed time prediction

Usage: spark-submit jobs/table01_02_task_features.py  (or: python jobs/table01_02_task_features.py)
"""
from pyspark.sql import SparkSession

from repro.tables import t01_02_task_features


def main():
    spark = (
        SparkSession.builder.appName("table01_02_task_features")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    t01_02_task_features.run(spark, dataset="YouTube")
    t01_02_task_features.run(spark, dataset="Patent")
    spark.stop()


if __name__ == "__main__":
    main()
