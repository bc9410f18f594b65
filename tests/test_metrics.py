"""Metric-function tests (MSE/MAE/WMAPE/sMAPE)."""
import numpy as np
import pytest

from repro.estimator import metrics as M


def test_perfect_prediction_is_zero():
    y = np.array([1.0, 2.0, 3.0])
    for fn in M.ALL.values():
        assert fn(y, y) == 0.0


def test_mse_mae_values():
    y = np.array([0.0, 0.0])
    yh = np.array([1.0, -1.0])
    assert M.mse(y, yh) == 1.0
    assert M.mae(y, yh) == 1.0


def test_wmape_value():
    y = np.array([10.0, 10.0])
    yh = np.array([12.0, 8.0])
    assert M.wmape(y, yh) == pytest.approx(0.2)


def test_smape_bounds():
    y = np.array([1.0, 2.0])
    yh = np.array([100.0, 200.0])
    s = M.smape(y, yh)
    assert 0 < s <= 200


def test_smape_zero_denominator_safe():
    assert M.smape(np.array([0.0]), np.array([0.0])) == 0.0


def test_shape_mismatch_raises():
    with pytest.raises(ValueError):
        M.mse(np.array([1.0]), np.array([1.0, 2.0]))


def test_evaluate_returns_all():
    out = M.evaluate([1.0, 2.0], [1.1, 1.9])
    assert set(out) == {"MSE", "MAE", "WMAPE", "sMAPE"}
