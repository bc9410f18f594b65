"""Synthetic analogs of the paper's eight spatial-vector datasets (Table III).

The real datasets (T-drive, Porto, Argo-AVL, Argo-PC, 3D-RD, Shapenet,
Apoll-TD, Argo-ETD) are not available offline. Each generator below is a
deterministic synthetic stand-in that preserves the property the paper's
pruning mechanisms exploit:

* 2D trajectory datasets -> points clustered along road-network-like
  polylines (anisotropic Gaussian noise around piecewise-linear paths),
  giving the heavy spatial clustering of GPS traces.
* 3D point clouds -> points sampled on 2D manifolds (planes, spheres,
  boxes) embedded in 3D, the geometry that makes ball nodes tight.
* High-dimensional embedded trajectories -> Gaussian mixtures living on a
  low-rank subspace rotated into d=128/256, which keeps latent cluster
  structure while exhibiting the curse-of-dimensionality behaviour the
  paper reports in Table V.

All generators are deterministic in (name, n, seed) so the same matrix is
produced on the driver, in executors, and in the DuckDB oracle.
"""
from __future__ import annotations

import zlib

import numpy as np

#: Paper dataset name -> (dimensionality, relative scale wrt the 1M base).
PAPER_DATASETS = {
    "tdrive": (2, 1.0),
    "porto": (2, 1.0),
    "argo_avl": (2, 1.0),
    "argo_pc": (3, 1.0),
    "rd3d": (3, 0.43),
    "shapenet": (3, 1.0),
    "apoll_td": (128, 0.5),
    "argo_etd": (256, 0.5),
}

LOW_DIM = ["tdrive", "porto", "argo_avl", "argo_pc", "rd3d", "shapenet"]
HIGH_DIM = ["apoll_td", "argo_etd"]


def _polyline_trajectories(
    g: np.random.Generator, n: int, n_roads: int, wiggle: float, noise: float
) -> np.ndarray:
    """2D points scattered along random polylines (a road-network proxy)."""
    # Road endpoints and per-road densities (heavy-tailed, like taxi data).
    starts = g.random((n_roads, 2)) * 100.0
    headings = g.random(n_roads) * 2 * np.pi
    lengths = g.random(n_roads) * 30.0 + 5.0
    weights = g.pareto(1.5, n_roads) + 1.0
    weights /= weights.sum()
    road = g.choice(n_roads, size=n, p=weights)
    t = g.random(n)
    # Piecewise wiggle: perturb the heading along the road so paths curve.
    bend = np.sin(t * 4 * np.pi + road) * wiggle
    dx = np.cos(headings[road] + bend) * lengths[road] * t
    dy = np.sin(headings[road] + bend) * lengths[road] * t
    pts = starts[road] + np.stack([dx, dy], axis=1)
    pts += g.normal(0.0, noise, (n, 2))
    return pts


def _surface_cloud(
    g: np.random.Generator, n: int, n_shapes: int, noise: float
) -> np.ndarray:
    """3D points sampled on random planes/spheres/boxes (a lidar proxy)."""
    kinds = g.integers(0, 3, n_shapes)
    centers = g.random((n_shapes, 3)) * 60.0
    sizes = g.random(n_shapes) * 8.0 + 1.0
    weights = g.pareto(1.2, n_shapes) + 1.0
    weights /= weights.sum()
    which = g.choice(n_shapes, size=n, p=weights)
    u, v = g.random(n), g.random(n)
    out = np.empty((n, 3))
    for kind in range(3):
        m = kinds[which] == kind
        if not m.any():
            continue
        c, s = centers[which[m]], sizes[which[m]][:, None]
        if kind == 0:  # plane patch with a random normal
            nrm = g.normal(size=(m.sum(), 3))
            nrm /= np.linalg.norm(nrm, axis=1, keepdims=True)
            a = np.cross(nrm, np.roll(nrm, 1, axis=1))
            a /= np.linalg.norm(a, axis=1, keepdims=True) + 1e-12
            b = np.cross(nrm, a)
            out[m] = c + s * ((u[m][:, None] - 0.5) * a + (v[m][:, None] - 0.5) * b)
        elif kind == 1:  # sphere surface
            phi = u[m] * 2 * np.pi
            cos_t = v[m] * 2 - 1
            sin_t = np.sqrt(1 - cos_t**2)
            out[m] = c + s * np.stack(
                [sin_t * np.cos(phi), sin_t * np.sin(phi), cos_t], axis=1
            )
        else:  # axis-aligned box surface: pick a face, uniform on it
            face = g.integers(0, 6, m.sum())
            p = np.stack([u[m] - 0.5, v[m] - 0.5, np.zeros(m.sum())], axis=1)
            axis = face // 2
            sign = np.where(face % 2 == 0, -0.5, 0.5)
            # move the 0 coordinate to `axis` and set it to +-0.5
            q = np.zeros_like(p)
            for ax in range(3):
                sel = axis == ax
                others = [d for d in range(3) if d != ax]
                q[sel, others[0]] = p[sel, 0]
                q[sel, others[1]] = p[sel, 1]
                q[sel, ax] = sign[sel]
            out[m] = c + s * q
    out += g.normal(0.0, noise, (n, 3))
    return out


def _embedded_mixture(
    g: np.random.Generator, n: int, d: int, latent: int, n_clusters: int
) -> np.ndarray:
    """Gaussian mixture on a `latent`-dim subspace rotated into d dims."""
    means = g.normal(0.0, 5.0, (n_clusters, latent))
    scales = g.random(n_clusters) * 0.8 + 0.2
    which = g.integers(0, n_clusters, n)
    z = means[which] + g.normal(size=(n, latent)) * scales[which][:, None]
    basis, _ = np.linalg.qr(g.normal(size=(d, latent)))
    x = z @ basis.T
    x += g.normal(0.0, 0.05, (n, d))  # ambient noise in every dimension
    return x


def make(name: str, n: int, *, seed: int = 0) -> np.ndarray:
    """Generate dataset `name` with exactly `n` points (float64, n x d).

    `name` must be a key of :data:`PAPER_DATASETS`. `n` is the count for
    this call; the paper-relative scale factors in PAPER_DATASETS are
    applied by callers that want the Table III proportions (3D-RD at
    0.43x, embeddings at 0.5x).
    """
    if name not in PAPER_DATASETS:
        raise ValueError(f"unknown dataset {name!r}; choose from {sorted(PAPER_DATASETS)}")
    # Offset the seed per dataset so e.g. tdrive/porto differ at the same
    # seed. crc32, not hash(): hash() is salted per process and this must be
    # reproducible on driver, executors, and the oracle.
    g = np.random.default_rng(seed * 1000 + zlib.crc32(name.encode()) % 997)
    if name == "tdrive":  # dense urban grid: many short roads
        return _polyline_trajectories(g, n, n_roads=400, wiggle=0.3, noise=0.15)
    if name == "porto":  # fewer, longer, curvier roads
        return _polyline_trajectories(g, n, n_roads=150, wiggle=0.8, noise=0.25)
    if name == "argo_avl":  # test-vehicle loops: few routes, very dense
        return _polyline_trajectories(g, n, n_roads=40, wiggle=0.5, noise=0.1)
    if name == "argo_pc":
        return _surface_cloud(g, n, n_shapes=120, noise=0.05)
    if name == "rd3d":  # road network in 3D: elongated structures
        pts2 = _polyline_trajectories(g, n, n_roads=200, wiggle=0.4, noise=0.1)
        z = g.normal(0.0, 0.5, n) + 0.02 * pts2[:, 0]  # gentle elevation trend
        return np.column_stack([pts2, z])
    if name == "shapenet":
        return _surface_cloud(g, n, n_shapes=40, noise=0.02)
    if name == "apoll_td":
        return _embedded_mixture(g, n, d=128, latent=8, n_clusters=60)
    if name == "argo_etd":
        return _embedded_mixture(g, n, d=256, latent=10, n_clusters=80)
    raise AssertionError(name)


def paper_scale_n(name: str, base_n: int) -> int:
    """Table III-proportional size: base_n scaled by the dataset's ratio."""
    return max(1, int(base_n * PAPER_DATASETS[name][1]))
