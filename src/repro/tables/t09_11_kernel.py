"""Tables 9 & 11 — the kernel-expansion baseline of [31].

Table 9: full (γ', k', γ, k) pipeline per dataset vs A_base's time —
the baseline is slower than exact mining and returns fewer results.
Table 11: kernel expansion "inside G-thinker": γ' = 1.0 kernels
(cliques) on the YouTube stand-in, sweeping τ_size, γ and k.
"""
from __future__ import annotations

import pandas as pd

from ..core.kernel import kernel_expansion
from ..gthinker.engine import run_serial, run_spark
from .common import cached_dataset, print_table

# (dataset, gamma', k', gamma, k) — gamma' = gamma + 0.05 like the
# paper's fallback setting, k' = 3k
T9_CONFIGS = [
    ("CX_GSE1730", 0.95, 30, 0.9, 10),
    ("CX_GSE10158", 0.85, 30, 0.8, 10),
    ("Ca-GrQc", 0.85, 30, 0.8, 10),
    ("Enron", 0.95, 30, 0.9, 10),
    ("Amazon", 0.55, 30, 0.5, 10),
    ("Hyves", 0.95, 30, 0.9, 10),
    ("YouTube", 0.95, 30, 0.9, 10),
]


def run_t9(spark=None, configs=None) -> pd.DataFrame:
    rows = []
    for name, gp, kp, gam, k in configs or T9_CONFIGS:
        gg, spec = cached_dataset(name)
        out = kernel_expansion(gg, gamma_prime=gp, k_prime=kp, gamma=gam,
                               k=k, tau_size=spec.tau_size)
        if spark is None:
            base = run_serial(gg, gam, spec.tau_size, strategy="base")
        else:
            base = run_spark(spark, gg, gam, spec.tau_size, strategy="base")
        rows.append({
            "Dataset": name, "Tsize": spec.tau_size, "k": k, "gamma": gam,
            "k'": kp, "gamma'": gp,
            "Kernel_s": round(out.job_time, 2),
            "Results": len(out.results),
            "A_base_s": round(base.job_time, 2),
            "Exact_maximal": base.n_maximal,
            "Missed": len(base.maximal - out.all_found),
        })
    return print_table("Table 9: kernel-expansion baseline [31] vs A_base",
                       pd.DataFrame(rows))


def _t11_row(gg, tau, gam, k) -> dict:
    out = kernel_expansion(gg, gamma_prime=1.0, k_prime=k, gamma=gam,
                           k=k, tau_size=tau)
    return {
        "Tsize": tau, "gamma": gam, "k": k,
        "Time_s": round(out.job_time, 2),
        "Results": len(out.all_found),
        "Maximal_topk": len(out.results),
    }


def run_t11(dataset: str = "YouTube") -> pd.DataFrame:
    gg, spec = cached_dataset(dataset)
    rows = []
    # (a) effect of tau_size at default gamma, top-1 kernel
    for tau in (spec.tau_size + 1, spec.tau_size, spec.tau_size - 1):
        rows.append({"Sweep": "tau_size", **_t11_row(gg, tau, spec.gamma, 1)})
    # (b) effect of gamma at default tau_size, top-1 kernel
    for gam in (spec.gamma, round(spec.gamma - 0.03, 2)):
        rows.append({"Sweep": "gamma", **_t11_row(gg, spec.tau_size, gam, 1)})
    # (c) effect of k
    for k in (1, 2, 4):
        rows.append({"Sweep": "k", **_t11_row(gg, spec.tau_size, spec.gamma, k)})
    return print_table(
        f"Table 11: top-k kernel expansion in G-thinker ({dataset})",
        pd.DataFrame(rows),
    )
