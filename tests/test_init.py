"""Centroid-initialization tests."""
import numpy as np
import pytest

from repro import datasets
from repro.core import init as cinit


@pytest.mark.parametrize("k", [1, 5, 50])
def test_random_init_distinct_points(k):
    X = datasets.make("tdrive", 200, seed=0)
    C = cinit.random_init(X, k, seed=1)
    assert C.shape == (k, 2)
    # every centroid is an actual data point, all distinct
    assert len({tuple(c) for c in C}) == k
    for c in C:
        assert (np.abs(X - c).sum(1) < 1e-12).any()


def test_random_init_deterministic():
    X = datasets.make("porto", 100, seed=0)
    np.testing.assert_array_equal(
        cinit.random_init(X, 10, seed=3), cinit.random_init(X, 10, seed=3)
    )


def test_random_init_k_too_large():
    with pytest.raises(ValueError):
        cinit.random_init(np.zeros((3, 2)), 5)


def test_kmeanspp_spreads_centroids():
    """D^2 sampling on separated blobs should hit most blobs."""
    g = np.random.default_rng(0)
    centers = np.array([[0, 0], [50, 0], [0, 50], [50, 50]], dtype=float)
    X = np.concatenate([g.normal(c, 0.5, (100, 2)) for c in centers])
    C = cinit.kmeanspp_init(X, 4, seed=2)
    # each chosen centroid is near a distinct blob
    nearest = {int(np.argmin(((centers - c) ** 2).sum(1))) for c in C}
    assert len(nearest) == 4


def test_kmeanspp_deterministic():
    X = datasets.make("argo_pc", 150, seed=0)
    np.testing.assert_array_equal(
        cinit.kmeanspp_init(X, 8, seed=1), cinit.kmeanspp_init(X, 8, seed=1)
    )


def test_kmeanspp_k_too_large():
    with pytest.raises(ValueError):
        cinit.kmeanspp_init(np.zeros((3, 2)), 5)
