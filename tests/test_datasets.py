"""Dataset-generator tests: shapes, determinism, and spatial structure."""
import numpy as np
import pytest

from repro import datasets


@pytest.mark.parametrize("name", sorted(datasets.PAPER_DATASETS))
def test_shape_and_dtype(name):
    n = 500
    X = datasets.make(name, n, seed=0)
    d_expected = datasets.PAPER_DATASETS[name][0]
    assert X.shape == (n, d_expected)
    assert X.dtype == np.float64
    assert np.isfinite(X).all()


@pytest.mark.parametrize("name", sorted(datasets.PAPER_DATASETS))
def test_deterministic_in_seed(name):
    a = datasets.make(name, 300, seed=7)
    b = datasets.make(name, 300, seed=7)
    np.testing.assert_array_equal(a, b)


@pytest.mark.parametrize("name", sorted(datasets.PAPER_DATASETS))
def test_different_seeds_differ(name):
    a = datasets.make(name, 300, seed=1)
    b = datasets.make(name, 300, seed=2)
    assert not np.array_equal(a, b)


@pytest.mark.parametrize("name,other", [("tdrive", "porto"), ("argo_pc", "shapenet")])
def test_datasets_differ_at_same_seed(name, other):
    a = datasets.make(name, 300, seed=0)
    b = datasets.make(other, 300, seed=0)
    assert not np.array_equal(a, b)


@pytest.mark.parametrize("name", datasets.LOW_DIM)
def test_low_dim_is_clustered(name):
    """Spatial data should be far from uniform: nearest-neighbor distances
    must be much smaller than the dataset extent (what Ball-tree pruning
    exploits)."""
    X = datasets.make(name, 2000, seed=0)
    extent = np.linalg.norm(X.max(0) - X.min(0))
    sub = X[:200]
    dd = np.sqrt(((sub[:, None, :] - X[None, :500, :]) ** 2).sum(-1))
    np.fill_diagonal(dd[:, :200], np.inf)
    nn = dd.min(axis=1)
    assert np.median(nn) < extent / 50


@pytest.mark.parametrize("name", datasets.HIGH_DIM)
def test_high_dim_dimensionality(name):
    X = datasets.make(name, 400, seed=0)
    assert X.shape[1] in (128, 256)
    # Low-rank latent structure: top singular values dominate.
    s = np.linalg.svd(X - X.mean(0), compute_uv=False)
    assert s[:12].sum() / s.sum() > 0.5


@pytest.mark.parametrize(
    "name,ratio", [("rd3d", 0.43), ("apoll_td", 0.5), ("tdrive", 1.0)]
)
def test_paper_scale_n(name, ratio):
    assert datasets.paper_scale_n(name, 1000) == int(1000 * ratio)


def test_unknown_dataset_raises():
    with pytest.raises(ValueError):
        datasets.make("nope", 10)
