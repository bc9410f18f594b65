"""From-scratch estimator-baseline tests (ridge / GBT / MLP)."""
import numpy as np
import pytest

from repro.estimator.competitors import GBTRegressor, MLPRegressor, RidgeRegressor


@pytest.fixture(scope="module")
def linear_data():
    g = np.random.default_rng(0)
    X = g.normal(size=(200, 4))
    y = 3.0 + X @ np.array([1.0, -2.0, 0.5, 0.0])
    return X, y


@pytest.fixture(scope="module")
def nonlinear_data():
    g = np.random.default_rng(1)
    X = g.uniform(-2, 2, (300, 3))
    y = np.sin(X[:, 0]) * 2 + X[:, 1] ** 2 + 0.05 * g.normal(size=300)
    return X, y


def test_ridge_exact_on_linear(linear_data):
    X, y = linear_data
    m = RidgeRegressor(lam=1e-8).fit(X, y)
    np.testing.assert_allclose(m.predict(X), y, atol=1e-5)


def test_ridge_regularization_shrinks():
    g = np.random.default_rng(2)
    X = g.normal(size=(50, 3))
    y = X @ np.array([10.0, 0.0, 0.0])
    weak = RidgeRegressor(lam=1e-8).fit(X, y)
    strong = RidgeRegressor(lam=1e4).fit(X, y)
    assert np.abs(strong.coef_[1:]).sum() < np.abs(weak.coef_[1:]).sum()


def test_gbt_fits_nonlinear(nonlinear_data):
    X, y = nonlinear_data
    m = GBTRegressor(n_trees=60, colsample=1.0, seed=0).fit(X, y)
    resid = y - m.predict(X)
    base = ((y - y.mean()) ** 2).mean()
    assert (resid**2).mean() < 0.2 * base


def test_gbt_more_trees_fit_better(nonlinear_data):
    X, y = nonlinear_data
    few = GBTRegressor(n_trees=5, colsample=1.0).fit(X, y)
    many = GBTRegressor(n_trees=80, colsample=1.0).fit(X, y)
    assert ((y - many.predict(X)) ** 2).mean() < ((y - few.predict(X)) ** 2).mean()


def test_gbt_colsample_still_learns(nonlinear_data):
    X, y = nonlinear_data
    m = GBTRegressor(n_trees=100, colsample=0.3, seed=3).fit(X, y)
    base = ((y - y.mean()) ** 2).mean()
    assert ((y - m.predict(X)) ** 2).mean() < base


def test_gbt_deterministic(nonlinear_data):
    X, y = nonlinear_data
    a = GBTRegressor(n_trees=10, seed=7).fit(X, y).predict(X)
    b = GBTRegressor(n_trees=10, seed=7).fit(X, y).predict(X)
    np.testing.assert_array_equal(a, b)


def test_mlp_learns_linear(linear_data):
    X, y = linear_data
    m = MLPRegressor(epochs=400, lr=3e-3, seed=0).fit(X, y)
    base = ((y - y.mean()) ** 2).mean()
    assert ((y - m.predict(X)) ** 2).mean() < 0.1 * base


def test_mlp_constant_target():
    X = np.random.default_rng(0).normal(size=(50, 2))
    y = np.full(50, 7.0)
    m = MLPRegressor(epochs=300, lr=1e-3, seed=0).fit(X, y)
    np.testing.assert_allclose(m.predict(X), 7.0, atol=0.5)
