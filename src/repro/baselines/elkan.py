"""Elkan's algorithm [21] — triangle-inequality k-means with n x k bounds.

Keeps a lower bound low[i, j] for every (point, centroid) pair plus one
upper bound u[i] per point; this is the scikit-learn default the paper
compares against. Memory is O(nk) floats, which is why the paper reports
it N/A at k = 1e4 — we reproduce that via ``memory_floats``.

Iteration semantics match Lloyd exactly (assignment then refinement;
iteration 1 performs the full exact assignment that seeds the bounds), so
this is an exact drop-in from the same init.
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.result import KMeansResult, refine_centroids


def pairwise(C: np.ndarray) -> np.ndarray:
    """Exact k x k Euclidean distance matrix between centroids."""
    g = C @ C.T
    sq = np.diag(g)
    d2 = np.maximum(sq[:, None] + sq[None, :] - 2 * g, 0.0)
    return np.sqrt(d2)


def fit(X: np.ndarray, init_centroids: np.ndarray, max_iter: int = 20) -> KMeansResult:
    C = init_centroids.copy()
    n, d = X.shape
    k = len(C)
    n_dist = 0
    iter_times: list[float] = []
    labels = np.full(n, -1, dtype=np.int64)
    u = np.zeros(n)
    low = np.zeros((n, k))

    converged = False
    it = 0
    for it in range(1, max_iter + 1):
        t_iter = time.perf_counter()
        old_labels = labels.copy()

        if it == 1:
            dists = np.sqrt(
                np.maximum(
                    (X * X).sum(1)[:, None] + (C * C).sum(1)[None, :] - 2 * X @ C.T,
                    0,
                )
            )
            n_dist += n * k
            labels = np.argmin(dists, axis=1)
            u = dists[np.arange(n), labels]
            low = dists
        else:
            cc = pairwise(C)
            n_dist += k * k
            np.fill_diagonal(cc, np.inf)
            s = 0.5 * cc.min(axis=1)

            tight = np.zeros(n, dtype=bool)
            active = u > s[labels]
            for j in range(k):
                cond = (
                    active
                    & (labels != j)
                    & (u > low[:, j])
                    & (u > 0.5 * cc[labels, j])
                )
                if not cond.any():
                    continue
                stale = cond & ~tight
                if stale.any():
                    rows = np.flatnonzero(stale)
                    du = np.sqrt(((X[rows] - C[labels[rows]]) ** 2).sum(1))
                    n_dist += len(rows)
                    u[rows] = du
                    low[rows, labels[rows]] = du
                    tight[rows] = True
                    cond = (
                        active
                        & (labels != j)
                        & (u > low[:, j])
                        & (u > 0.5 * cc[labels, j])
                    )
                rows = np.flatnonzero(cond)
                if len(rows) == 0:
                    continue
                dj = np.sqrt(((X[rows] - C[j]) ** 2).sum(1))
                n_dist += len(rows)
                low[rows, j] = dj
                better = dj < u[rows]
                if better.any():
                    rb = rows[better]
                    labels[rb] = j
                    u[rb] = dj[better]

        new_C = refine_centroids(X, labels, C)
        drift = np.sqrt(((new_C - C) ** 2).sum(1))
        n_dist += k
        C = new_C
        low = np.maximum(low - drift[None, :], 0.0)
        u += drift[labels]
        iter_times.append(time.perf_counter() - t_iter)
        if (labels == old_labels).all():
            converged = True
            break

    return KMeansResult(
        centroids=C, labels=labels, n_iter=it, converged=converged,
        iter_times=iter_times, n_dist=n_dist,
        memory_floats=n * k + 2 * n + k * k,
    )
