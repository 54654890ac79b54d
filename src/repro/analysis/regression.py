"""Task-time regression (Tables 1–2, "Predicted Time" column).

The paper trains a support-vector regressor on task-subgraph features
and shows it cannot predict the expensive tasks. sklearn is not
available offline, so we implement kernel ridge regression with an RBF
feature map in numpy — the same model family as SVR with an RBF kernel
(L2 loss instead of ε-insensitive), and it fails on the straggler tasks
for the same structural reason: the features do not determine the
exponential search cost.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

__all__ = ["FEATURES", "fit_predict_task_times"]

FEATURES = ["num_vertices", "num_edges", "max_degree", "avg_degree", "core_number"]


def _standardize(x: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    mu = x.mean(axis=0)
    sd = x.std(axis=0)
    sd[sd == 0] = 1.0
    return (x - mu) / sd, mu, sd


def _krr_predict(x_tr, y_tr, x_te, alpha, gamma_rbf, max_centers, rng):
    centers = x_tr[rng.permutation(len(x_tr))[: min(max_centers, len(x_tr))]]
    def phi(x):
        d2 = ((x[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
        return np.exp(-gamma_rbf * d2)
    p_tr = phi(x_tr)
    a = p_tr.T @ p_tr + alpha * np.eye(p_tr.shape[1])
    w = np.linalg.solve(a, p_tr.T @ y_tr)
    return phi(x_te) @ w


def fit_predict_task_times(
    feats: pd.DataFrame,
    *,
    alpha: float = 1.0,
    gamma_rbf: float = 0.5,
    max_centers: int = 256,
    seed: int = 0,
    cv_folds: int = 5,
) -> pd.DataFrame:
    """Predict task_time_ms from ``FEATURES`` with kernel ridge (RBF).

    Predictions are k-fold cross-validated (each task predicted by a
    model that never saw it) — the honest analogue of the paper's SVR
    experiment: a straggler whose features match cheap tasks *cannot*
    be predicted, because nothing in the training folds separates it.
    With ``cv_folds <= 1`` the fit is in-sample.
    """
    df = feats.copy()
    x_raw = df[FEATURES].to_numpy(dtype=float)
    y = df["task_time_ms"].to_numpy(dtype=float)
    x, _, _ = _standardize(x_raw)
    rng = np.random.default_rng(seed)
    n = len(df)
    pred = np.zeros(n)
    if cv_folds <= 1 or n < cv_folds:
        pred = _krr_predict(x, y, x, alpha, gamma_rbf, max_centers, rng)
    else:
        order = rng.permutation(n)
        folds = np.array_split(order, cv_folds)
        for te in folds:
            tr = np.setdiff1d(order, te)
            pred[te] = _krr_predict(
                x[tr], y[tr], x[te], alpha, gamma_rbf, max_centers, rng
            )
    df["predicted_ms"] = pred
    return df
