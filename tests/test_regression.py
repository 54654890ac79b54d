"""Task-time regression harness (repro/analysis/regression.py)."""
import numpy as np
import pandas as pd
import pytest

from repro.analysis.regression import FEATURES, fit_predict_task_times


def _frame(n=50, seed=0):
    rng = np.random.default_rng(seed)
    df = pd.DataFrame({f: rng.integers(1, 100, n).astype(float) for f in FEATURES})
    df["task_time_ms"] = rng.random(n) * 10
    return df


class TestRegression:
    def test_adds_prediction_column(self):
        out = fit_predict_task_times(_frame())
        assert "predicted_ms" in out and len(out) == 50
        assert np.isfinite(out["predicted_ms"]).all()

    def test_deterministic(self):
        a = fit_predict_task_times(_frame(), seed=1)
        b = fit_predict_task_times(_frame(), seed=1)
        assert np.allclose(a["predicted_ms"], b["predicted_ms"])

    def test_fits_smooth_function_in_sample(self):
        # when time really is a smooth feature function, the model fits it
        df = _frame(80, seed=2)
        df["task_time_ms"] = df["num_vertices"] * 2 + df["max_degree"]
        out = fit_predict_task_times(df, alpha=1e-4, gamma_rbf=0.2, cv_folds=1)
        r = np.corrcoef(out["task_time_ms"], out["predicted_ms"])[0, 1]
        assert r > 0.95

    def test_cv_generalizes_smooth_function(self):
        df = _frame(100, seed=4)
        df["task_time_ms"] = df["num_vertices"] * 3.0
        out = fit_predict_task_times(df, alpha=1e-3, gamma_rbf=0.1)
        r = np.corrcoef(out["task_time_ms"], out["predicted_ms"])[0, 1]
        assert r > 0.8

    def test_cannot_fit_adversarial_straggler(self):
        """The paper's point (Tables 1–2): identical features, wildly
        different time — no feature-based model can separate them."""
        df = _frame(40, seed=3)
        # duplicate one feature row with 1000x the time
        row = df.iloc[0].copy()
        row["task_time_ms"] = df["task_time_ms"].iloc[0] * 1000 + 1000
        df = pd.concat([df, row.to_frame().T], ignore_index=True)
        out = fit_predict_task_times(df)
        straggler = out.iloc[-1]
        # cross-validated prediction never saw the straggler — way off
        assert straggler["predicted_ms"] < straggler["task_time_ms"] / 2

    def test_single_row(self):
        df = _frame(1)
        out = fit_predict_task_times(df)
        assert len(out) == 1
