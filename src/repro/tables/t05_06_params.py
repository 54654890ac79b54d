"""Tables 5 & 6 — sensitivity of runtime/result counts to (γ, τ_size).

Reproduces the paper's observation that small perturbations of γ or
τ_size change the result count by orders of magnitude. Runs A_base on
the Spark engine with the dataset's default value ± small steps.
"""
from __future__ import annotations

import pandas as pd

from ..gthinker.engine import run_serial, run_spark
from .common import cached_dataset, print_table

# (dataset, list of γ values) / (dataset, list of τ_size values) chosen
# around each stand-in's default like the paper's ±0.01/±1 sweeps.
GAMMA_SWEEPS = {
    "Patent": [0.91, 0.9, 0.89],
    "Hyves": [0.92, 0.91, 0.9, 0.89, 0.88],
    "Enron": [0.92, 0.91, 0.9, 0.89, 0.88],
}
TSIZE_SWEEPS = {
    "Patent": [17, 16, 15, 14],
    "Hyves": [13, 12, 11],
    "Enron": [13, 12, 11, 10],
}


def _sweep(spark, dataset: str, *, gammas=None, tsizes=None) -> list[dict]:
    gg, spec = cached_dataset(dataset)
    rows = []
    for gam in gammas or [spec.gamma]:
        for tau in tsizes or [spec.tau_size]:
            if spark is None:
                job = run_serial(gg, gam, tau, strategy="base")
            else:
                job = run_spark(spark, gg, gam, tau, strategy="base")
            rows.append({
                "Dataset": dataset, "Tsize": tau, "gamma": gam,
                "Time_s": round(job.job_time, 2),
                "Results": job.n_results, "Maximal": job.n_maximal,
                "Postprocess_s": round(job.postprocess_time, 3),
            })
    return rows


def run_gamma(spark=None, sweeps: dict | None = None) -> pd.DataFrame:
    rows = []
    for ds, gammas in (sweeps or GAMMA_SWEEPS).items():
        rows += _sweep(spark, ds, gammas=gammas)
    return print_table("Table 5: effect of gamma", pd.DataFrame(rows))


def run_tsize(spark=None, sweeps: dict | None = None) -> pd.DataFrame:
    rows = []
    for ds, tsizes in (sweeps or TSIZE_SWEEPS).items():
        rows += _sweep(spark, ds, tsizes=tsizes)
    return print_table("Table 6: effect of tau_size", pd.DataFrame(rows))
