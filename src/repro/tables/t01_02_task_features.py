"""Tables 1 & 2 — features of the top-10 most expensive tasks.

Runs A_base (per-spawn-vertex tasks, no decomposition) collecting the
per-task subgraph features and serial mining time, fits the regression
model of :mod:`repro.analysis.regression` on *all* tasks, and reports
the 10 longest-running tasks with their predicted times — showing, as
the paper does, that the predictions are way off for stragglers.
"""
from __future__ import annotations

import pandas as pd

from ..analysis.regression import fit_predict_task_times
from ..gthinker.engine import run_serial, run_spark
from .common import cached_dataset, print_table

COLUMNS = ["num_vertices", "num_edges", "max_degree", "avg_degree",
           "core_number", "task_time_ms", "predicted_ms"]


def run(spark=None, dataset: str = "YouTube", top_n: int = 10,
        gamma: float | None = None) -> pd.DataFrame:
    gg, spec = cached_dataset(dataset)
    gam = spec.gamma if gamma is None else gamma
    if spark is None:
        job = run_serial(gg, gam, spec.tau_size, strategy="base",
                         collect_task_features=True)
    else:
        job = run_spark(spark, gg, gam, spec.tau_size, strategy="base",
                        collect_task_features=True)
    feats = job.task_features
    fitted = fit_predict_task_times(feats)
    top = fitted.nlargest(top_n, "task_time_ms").sort_values("task_time_ms")
    out = top[COLUMNS].reset_index(drop=True)
    table_no = 1 if dataset == "YouTube" else 2
    print_table(
        f"Table {table_no}: top-{top_n} most expensive tasks on {dataset} "
        f"(gamma={gam}, tau_size={spec.tau_size})",
        out,
    )
    return out
