"""Smoke tests for the per-table harnesses (cheap configurations).

These don't re-verify mining correctness (the cross-check suites do);
they pin the table schemas and the invariants each table's narrative
rests on.
"""
import pytest

from repro.tables import (
    t01_02_task_features,
    t03_datasets,
    t05_06_params,
    t09_11_kernel,
    t15_16_quick,
)


class TestTable03:
    def test_schema_and_rows(self):
        a, b = t03_datasets.run()
        assert list(a["Data"]) == list(b["Data"])
        assert len(a) == 10
        # pruning never increases the graph
        merged = a.merge(b, on="Data", suffixes=("_raw", "_pruned"))
        assert (merged["V_pruned"] <= merged["V_raw"]).all()
        assert (merged["E_pruned"] <= merged["E_raw"]).all()
        assert (b["k"] >= 2).all()


class TestTable01Shape:
    def test_task_features_table(self):
        out = t01_02_task_features.run(dataset="Hyves", top_n=5)
        assert list(out.columns) == t01_02_task_features.COLUMNS
        assert len(out) <= 5
        # ascending task time like the paper's presentation
        assert out["task_time_ms"].is_monotonic_increasing


class TestTable05_06:
    def test_gamma_sensitivity_on_hyves(self):
        """Paper's Table 5 claim: small γ perturbations swing the result
        count a lot. (Counts are not strictly monotone in γ because the
        k-core prune k = ceil(γ(τ-1)) moves with γ.)"""
        out = t05_06_params.run_gamma(sweeps={"Hyves": [0.92, 0.9, 0.88]})
        res = out["Results"].tolist()
        assert len(out) == 3 and all(r >= 0 for r in res)
        assert max(res) > min(res), "result count should be γ-sensitive"
        assert (out["Maximal"] <= out["Results"]).all()

    def test_tsize_sensitivity_on_hyves(self):
        out = t05_06_params.run_tsize(sweeps={"Hyves": [13, 12, 11]})
        maxi = out.sort_values("Tsize", ascending=False)["Maximal"].tolist()
        # maximal count grows (weakly) as the size threshold drops
        assert maxi == sorted(maxi)


class TestTable15:
    def test_quickplus_never_slower_shape(self):
        out = t15_16_quick.run_t15(["CX_GSE1730", "CX_GSE10158", "Hyves"])
        # Quick may not find more maximal results than Quick+
        assert (out["QuickPlus_maximal"] >= out["Quick_maximal"]).all()
        assert (out["Missed_by_Quick"] >= 0).all()


class TestTable16:
    def test_phase_columns(self):
        out = t15_16_quick.run_t16(["CX_GSE1730"])
        for col in ("Lookahead_ms", "Cover_ms", "Critical_ms", "LB_UB_ms"):
            assert (out[col] >= 0).all()


class TestTable11:
    def test_k_sweep_monotone_results(self):
        out = t09_11_kernel.run_t11(dataset="Hyves")
        ks = out[out["Sweep"] == "k"]
        found = ks.sort_values("k")["Results"].tolist()
        assert found == sorted(found)  # more kernels -> no fewer results
