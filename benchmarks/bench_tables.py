"""pytest-benchmark targets — one per evaluation table.

Each benchmark regenerates its table's experiment at a *reduced* scale
(small datasets / trimmed sweeps) so `pytest benchmarks/ --benchmark-only`
stays minutes, not hours; the full-scale numbers in EXPERIMENTS.md come
from the ``jobs/`` entrypoints. Every benchmark runs the same code path
as its job (``repro.tables.*``), so a regression here is a regression
in the table pipeline.
"""
import pytest

from repro.tables import (
    t01_02_task_features,
    t03_datasets,
    t04_system,
    t05_06_params,
    t07_variants,
    t08_grid,
    t09_11_kernel,
    t10_scalability,
    t12_14_materialization,
    t15_16_quick,
)

SMALL = ["CX_GSE1730", "CX_GSE10158", "Ca-GrQc", "Hyves", "Enron", "kmer"]


def _once(benchmark, fn):
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)


def bench_table01_02(benchmark, spark):
    """Tables 1–2: per-task features + regression (Hyves stand-in)."""
    out = _once(benchmark, lambda: t01_02_task_features.run(
        spark, dataset="Hyves", top_n=5))
    assert len(out) > 0


def bench_table03(benchmark):
    out = _once(benchmark, lambda: t03_datasets.run())
    assert len(out[0]) == 10


def bench_table04(benchmark, spark):
    out = _once(benchmark, lambda: t04_system.run(spark, datasets=["Enron", "Hyves"]))
    assert (out.groupby("Workload")["answer"].count() == 2).all()


def bench_table05(benchmark, spark):
    out = _once(benchmark, lambda: t05_06_params.run_gamma(
        spark, sweeps={"Hyves": [0.92, 0.9, 0.88], "Enron": [0.92, 0.9, 0.88]}))
    assert len(out) == 6


def bench_table06(benchmark, spark):
    out = _once(benchmark, lambda: t05_06_params.run_tsize(
        spark, sweeps={"Hyves": [13, 12, 11], "Enron": [12, 11]}))
    assert len(out) == 5


def bench_table07(benchmark, spark):
    out = _once(benchmark, lambda: t07_variants.run(spark, datasets=SMALL))
    assert len(out) == len(SMALL)


def bench_table08(benchmark, spark):
    out = _once(benchmark, lambda: t08_grid.run(
        spark, datasets=["Hyves", "USA Road"]))
    assert len(out) > 0


def bench_table09(benchmark, spark):
    out = _once(benchmark, lambda: t09_11_kernel.run_t9(
        spark, configs=[("CX_GSE1730", 0.95, 10, 0.9, 5),
                        ("Hyves", 0.95, 10, 0.9, 5)]))
    assert len(out) == 2


def bench_table10(benchmark, spark):
    out = _once(benchmark, lambda: t10_scalability.run(spark, datasets=["Hyves"]))
    assert len(out) == 8


def bench_table11(benchmark):
    out = _once(benchmark, lambda: t09_11_kernel.run_t11(dataset="Hyves"))
    assert len(out) == 8


def bench_table12_14(benchmark, spark):
    out = _once(benchmark, lambda: t12_14_materialization.run(
        spark, dataset="Hyves", sweep=[0.1, 0.01, 0.002]))
    assert len(out) == 3


def bench_table15(benchmark):
    out = _once(benchmark, lambda: t15_16_quick.run_t15(SMALL))
    assert (out["QuickPlus_maximal"] >= out["Quick_maximal"]).all()


def bench_table16(benchmark):
    out = _once(benchmark, lambda: t15_16_quick.run_t16(
        ["CX_GSE1730", "CX_GSE10158", "Hyves"]))
    assert len(out) == 3
