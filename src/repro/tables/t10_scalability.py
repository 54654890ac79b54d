"""Table 10 — vertical/horizontal scalability of A_time.

The cluster is simulated by the ``parallelism`` knob (number of
partitions over local cores — DESIGN.md §3): "vertical" scaling sweeps
threads-per-machine 1→16 on one simulated machine; "horizontal" scaling
sweeps machines 1→4 at 4 threads each (partitions = machines × 4).
"""
from __future__ import annotations

import pandas as pd

from ..gthinker.engine import run_spark
from .common import cached_dataset, print_table

VERTICAL_THREADS = [1, 2, 4, 8, 16]
HORIZONTAL_MACHINES = [1, 2, 4]
THREADS_PER_MACHINE = 4


def run(spark, datasets: list[str] | None = None) -> pd.DataFrame:
    rows = []
    for name in datasets or ["Patent", "Hyves", "Enron"]:
        gg, spec = cached_dataset(name)
        for t in VERTICAL_THREADS:
            job = run_spark(spark, gg, spec.gamma, spec.tau_size,
                            strategy="time", tau_split=spec.tau_split,
                            tau_time=spec.tau_time, parallelism=t)
            rows.append({"Dataset": name, "Mode": "vertical",
                         "Machines": 1, "Threads": t,
                         "Time_s": round(job.job_time, 2),
                         "Maximal": job.n_maximal})
        for m in HORIZONTAL_MACHINES:
            job = run_spark(spark, gg, spec.gamma, spec.tau_size,
                            strategy="time", tau_split=spec.tau_split,
                            tau_time=spec.tau_time,
                            parallelism=m * THREADS_PER_MACHINE)
            rows.append({"Dataset": name, "Mode": "horizontal",
                         "Machines": m, "Threads": THREADS_PER_MACHINE,
                         "Time_s": round(job.job_time, 2),
                         "Maximal": job.n_maximal})
    return print_table("Table 10: scalability of A_time", pd.DataFrame(rows))
