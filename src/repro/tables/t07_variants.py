"""Table 7 — A_base vs A_split vs A_time on all datasets.

The paper's headline comparison: per dataset, job time of the three
strategies under tuned (τ_split, τ_time), plus #maximal and the
postprocessing time. All three runs must agree on the maximal set —
asserted here, not assumed.
"""
from __future__ import annotations

import pandas as pd

from ..gthinker.engine import run_spark
from .common import DATASETS, cached_dataset, print_table


def run(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    rows = []
    for name in datasets or list(DATASETS):
        gg, spec = cached_dataset(name)
        jobs = {}
        for strat in ("base", "split", "time"):
            jobs[strat] = run_spark(
                spark, gg, spec.gamma, spec.tau_size, strategy=strat,
                tau_split=spec.tau_split, tau_time=spec.tau_time,
            )
        assert jobs["base"].maximal == jobs["split"].maximal == jobs["time"].maximal, name
        rows.append({
            "Dataset": name,
            "Tsplit": spec.tau_split, "Ttime_s": spec.tau_time,
            "A_base_s": round(jobs["base"].job_time, 2),
            "A_split_s": round(jobs["split"].job_time, 2),
            "A_time_s": round(jobs["time"].job_time, 2),
            "Subtasks_split": jobs["split"].n_subtasks,
            "Subtasks_time": jobs["time"].n_subtasks,
            "Maximal": jobs["time"].n_maximal,
            "Postprocess_s": round(jobs["time"].postprocess_time, 3),
        })
    return print_table("Table 7: A_base vs A_split vs A_time", pd.DataFrame(rows))
