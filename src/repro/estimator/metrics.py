"""Regression accuracy metrics used in Section VI-C [16].

MSE, MAE, WMAPE (weighted absolute mean percentage error) and sMAPE
(symmetric mean absolute percentage error, in percent).
"""
from __future__ import annotations

import numpy as np


def _arr(y, yhat):
    y = np.asarray(y, dtype=float)
    yhat = np.asarray(yhat, dtype=float)
    if y.shape != yhat.shape:
        raise ValueError(f"shape mismatch {y.shape} vs {yhat.shape}")
    return y, yhat


def mse(y, yhat) -> float:
    y, yhat = _arr(y, yhat)
    return float(((y - yhat) ** 2).mean())


def mae(y, yhat) -> float:
    y, yhat = _arr(y, yhat)
    return float(np.abs(y - yhat).mean())


def wmape(y, yhat) -> float:
    y, yhat = _arr(y, yhat)
    denom = np.abs(y).sum()
    return float(np.abs(y - yhat).sum() / denom) if denom > 0 else np.inf


def smape(y, yhat) -> float:
    """Symmetric MAPE in percent (0..200)."""
    y, yhat = _arr(y, yhat)
    denom = (np.abs(y) + np.abs(yhat))
    ok = denom > 0
    out = np.zeros_like(y)
    out[ok] = 2.0 * np.abs(y - yhat)[ok] / denom[ok]
    return float(out.mean() * 100.0)


ALL = {"MSE": mse, "MAE": mae, "WMAPE": wmape, "sMAPE": smape}


def evaluate(y, yhat) -> dict[str, float]:
    return {name: fn(y, yhat) for name, fn in ALL.items()}
