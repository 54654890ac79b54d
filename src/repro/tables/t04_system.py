"""Table 4 — system comparison on TC / MCF / GM.

Paper columns: Arabesque, Giraph, G-Miner (IO-bound dataflow systems),
G-thinker (old engine), G-thinker+ (redesigned). Offline mapping
(DESIGN.md §3): the dataflow archetype is one Catalyst multiway-join
implementation (``sql_dataflow``); the old engine is the task engine
with big-task prioritization off; G-thinker+ prioritizes. A DuckDB
single-node run is the single-thread "COST" reference. Every system's
answer is asserted identical before times are reported.
"""
from __future__ import annotations

import pandas as pd

from ..graphs.spark_ops import to_spark_edges
from ..gthinker import apps, baselines
from .common import cached_dataset, print_table

DEFAULT_DATASETS = ["Enron", "Hyves", "YouTube", "Patent", "Amazon"]


def _one(spark, name: str, app: str) -> dict:
    gg, _ = cached_dataset(name)
    pdf = gg.to_edge_pdf()
    row: dict = {"Dataset": name, "Workload": app.upper()}
    values = {}
    if app in ("tc", "gm"):
        e = to_spark_edges(spark, pdf)
        sql = (baselines.triangle_count_sql if app == "tc"
               else baselines.square_count_sql)(spark, e)
        duck = (baselines.triangle_count_duckdb if app == "tc"
                else baselines.square_count_duckdb)(pdf)
        row["sql_dataflow_s"] = round(sql.job_time, 3)
        row["duckdb_1thread_s"] = round(duck.job_time, 3)
        values["sql"] = sql.value
        values["duck"] = duck.value
    else:
        serial = apps.run_app_serial(gg, app)
        row["serial_1thread_s"] = round(serial.job_time, 3)
        values["serial"] = serial.value
    old = apps.run_app_spark(spark, gg, app, prioritize_big=False)
    new = apps.run_app_spark(spark, gg, app, prioritize_big=True)
    row["gthinker_s"] = round(old.job_time, 3)
    row["gthinker_plus_s"] = round(new.job_time, 3)
    values["old"], values["new"] = old.value, new.value
    assert len(set(values.values())) == 1, (name, app, values)
    row["answer"] = new.value
    return row


def run(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    datasets = datasets or DEFAULT_DATASETS
    rows = [
        _one(spark, name, app)
        for app in ("tc", "mcf", "gm")
        for name in datasets
    ]
    return print_table("Table 4: system comparison (TC / MCF / GM)",
                       pd.DataFrame(rows))
