"""Dataflow-system baselines for Table 4.

The paper compares G-thinker against Arabesque, Giraph and G-Miner —
all IO-bound data-intensive dataflow systems. Offline we represent that
archetype with Spark-SQL join plans (Catalyst): subgraph enumeration
expressed as multiway self-joins that shuffle intermediate expansions,
exactly the execution pattern those systems implement. A DuckDB
single-node run of the same SQL serves as the "COST" single-thread
reference the paper cites [2].
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import duckdb
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..graphs.spark_ops import symmetrize, triangle_count

__all__ = [
    "BaselineResult",
    "triangle_count_sql",
    "square_count_sql",
    "triangle_count_duckdb",
    "square_count_duckdb",
]


@dataclass
class BaselineResult:
    value: int
    job_time: float


def triangle_count_sql(spark: SparkSession, edges: DataFrame) -> BaselineResult:
    t0 = time.perf_counter()
    val = triangle_count(edges)
    return BaselineResult(int(val), time.perf_counter() - t0)


def square_count_sql(spark: SparkSession, edges: DataFrame) -> BaselineResult:
    """4-cycle count via Catalyst joins: min vertex a, cycle-neighbours
    b < d of a, apex c > a (matches the task-engine formulation)."""
    t0 = time.perf_counter()
    sym = symmetrize(edges)
    ab = sym.select(F.col("u").alias("a"), F.col("v").alias("b")).filter("b > a")
    ad = sym.select(F.col("u").alias("a"), F.col("v").alias("d")).filter("d > a")
    bc = sym.select(F.col("u").alias("b"), F.col("v").alias("c"))
    dc = sym.select(F.col("u").alias("d"), F.col("v").alias("c"))
    squares = (
        ab.join(ad, "a")
        .filter("b < d")
        .join(bc, "b")
        .join(dc, ["d", "c"])
        .filter("c > a")
    )
    val = squares.count()
    return BaselineResult(int(val), time.perf_counter() - t0)


_DUCK_TRI = """
SELECT count(*) AS n
FROM edges e1 JOIN edges e2 ON e2.src = e1.dst
              JOIN edges e3 ON e3.src = e1.src AND e3.dst = e2.dst
"""

_DUCK_SQ = """
WITH sym AS (
  SELECT src AS u, dst AS v FROM edges
  UNION ALL
  SELECT dst AS u, src AS v FROM edges
)
SELECT count(*) AS n
FROM sym ab, sym ad, sym bc, sym dc
WHERE ab.u = ad.u AND ab.v < ad.v AND ab.v > ab.u
  AND bc.u = ab.v AND dc.u = ad.v AND dc.v = bc.v AND bc.v > ab.u
"""


def _duck(edges_pdf: pd.DataFrame, sql: str) -> BaselineResult:
    t0 = time.perf_counter()
    con = duckdb.connect()
    try:
        con.register("edges", edges_pdf)
        val = con.execute(sql).fetchone()[0]
    finally:
        con.close()
    return BaselineResult(int(val), time.perf_counter() - t0)


def triangle_count_duckdb(edges_pdf: pd.DataFrame) -> BaselineResult:
    return _duck(edges_pdf, _DUCK_TRI)


def square_count_duckdb(edges_pdf: pd.DataFrame) -> BaselineResult:
    return _duck(edges_pdf, _DUCK_SQ)
