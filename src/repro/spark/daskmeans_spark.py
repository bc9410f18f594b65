"""Distributed Dask-means: per-partition Ball-trees + broadcast centroids.

The paper's future-work section sketches a distributed Dask-means for
edge fleets; the reproduction plan realizes it as a Spark per-partition
operator:

* **state** — each partition owns (ids, Ball-tree, labels, node-cluster
  array). The tree is built once; the a(N)/a(i) state evolves across
  iterations. The state lives in a persisted RDD and is *functionally*
  replaced each iteration (PySpark caches pickled partitions, so in-task
  mutation would be lost — instead every iteration maps the old state to
  (new state, partial aggregates) and persists the new RDD).
* **per iteration** — the driver builds the centroid index and the inter
  bounds exactly as the local algorithm does (``compute_cb``), broadcasts
  (C, ctree, cb), and each partition runs the *same*
  ``daskmeans.assign_pass`` over its own tree, returning per-cluster
  (count, sum) partials. The driver tree-aggregates partials, refines
  centroids, and loops until no partition changed a label.

Because every partition applies the exact algorithm to its share of the
points and refinement uses global sums, the result equals the local
algorithm (and Lloyd) from the same initial centroids.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.core import balltree as bt
from repro.core import daskmeans
from repro.core.balltree import NO_CLUSTER
from repro.spark import data as sdata


@dataclass
class SparkKMeansResult:
    centroids: np.ndarray          # final (refined) centroids
    labels_centroids: np.ndarray   # centroids the final assignment used —
    # labels are the argmin w.r.t. *these* (assignment precedes the last
    # refinement), which is what oracle validation must check against
    n_iter: int
    converged: bool
    labels_df: DataFrame           # [id, cluster]
    n_dist: int
    pruned_vectors: int


def _build_state(part, f: int):
    for ids, X in part:
        tree = bt.build(X, f)
        labels = np.full(len(ids), NO_CLUSTER, dtype=np.int64)
        yield ids, tree, labels


def fit(
    spark: SparkSession,
    df: DataFrame,
    k: int,
    *,
    d: int,
    f: int = 30,
    max_iter: int = 20,
    seed: int = 0,
    use_knn: bool = True,
    use_inter_bound: bool = True,
    init_centroids: np.ndarray | None = None,
) -> SparkKMeansResult:
    """Distributed Dask-means over a [id, x0..x{d-1}] DataFrame.

    Pass ``init_centroids`` to start from a known init (used by the
    equivalence tests against the local algorithm); otherwise k distinct
    points are sampled with ``seed``.
    """
    sc = spark.sparkContext
    arrays = sdata.partition_arrays(df, d)
    cached = arrays.mapPartitions(lambda p: _build_state(p, f)).persist()
    cached.count()  # materialize the trees once
    state = cached

    if init_centroids is not None:
        C = np.array(init_centroids, dtype=np.float64, copy=True)
        assert len(C) == k
    else:
        # Deterministic init: k distinct points, seeded; sorted by id for
        # a stable order regardless of partitioning.
        sample = state.flatMap(
            lambda s: [(int(i), s[1].X[j]) for j, i in enumerate(s[0])]
        ).takeSample(False, k, seed)
        sample.sort(key=lambda t: t[0])
        C = np.array([v for _, v in sample])

    cb = None
    drift = None
    n_dist = 0
    pruned = 0
    converged = False
    it = 0
    # Per-iteration broadcasts are referenced by the cached state RDD's
    # pickled closure, so they cannot be destroyed until the final state
    # has been collected — they are tiny (k x d floats + the centroid
    # index), so we keep them and destroy all at the end.
    broadcasts = []
    labels_C = C
    for it in range(1, max_iter + 1):
        ctree = bt.build(C, f) if use_knn else None
        if use_inter_bound:
            cb, nd = daskmeans.compute_cb(C, ctree, cb, drift, use_knn=use_knn)
            n_dist += nd
        bc = sc.broadcast((C, ctree, cb))
        broadcasts.append(bc)

        def step(s):
            ids, tree, labels = s
            C_, ctree_, cb_ = bc.value
            stats = daskmeans.assign_pass(
                tree, C_, ctree_, cb_, labels,
                use_knn=use_knn, use_inter_bound=use_inter_bound,
            )
            return (
                (ids, tree, labels),
                (stats.sv, stats.cnt, stats.changed, stats.n_dist, stats.pruned_vectors),
            )

        # Persist + localCheckpoint truncates lineage each iteration so the
        # DAG does not grow with the iteration count.
        new_full = state.map(step).persist()
        new_full.localCheckpoint()
        partials = new_full.map(lambda t: t[1]).collect()
        cached.unpersist()
        cached = new_full
        state = new_full.map(lambda t: t[0])

        sv = sum(p[0] for p in partials)
        cnt = sum(p[1] for p in partials)
        changed = any(p[2] for p in partials)
        n_dist += sum(p[3] for p in partials)
        pruned += sum(p[4] for p in partials)

        labels_C = C.copy()
        new_C = C.copy()
        nz = cnt > 0
        new_C[nz] = sv[nz] / cnt[nz, None]
        drift = np.sqrt(((new_C - C) ** 2).sum(axis=1))
        n_dist += k
        C = new_C
        if not changed:
            converged = True
            break

    # Final labels back into the DataFrame world — collected to the driver
    # first so labels_df carries no lineage into the (unpersisted) state.
    import pandas as pd

    parts = state.map(lambda s: (s[0], s[2])).collect()
    ids = np.concatenate([p[0] for p in parts])
    labs = np.concatenate([p[1] for p in parts])
    labels_df = spark.createDataFrame(
        pd.DataFrame({"id": ids.astype(np.int64), "cluster": labs.astype(np.int64)})
    )
    cached.unpersist()
    for bc in broadcasts:
        bc.destroy()
    return SparkKMeansResult(
        centroids=C, labels_centroids=labels_C, n_iter=it, converged=converged,
        labels_df=labels_df, n_dist=n_dist, pruned_vectors=pruned,
    )
