"""DataFrame-native Lloyd tests: Catalyst aggregation vs DuckDB, and the
MLlib comparator."""
import numpy as np
import pandas as pd
import pyspark.sql.functions as Fn
import pytest

from repro import datasets
from repro.baselines import lloyd as lloyd_local
from repro.core import init as cinit
from repro.oracle import assert_equivalent
from repro.spark import assign_sql, data as sdata, lloyd_spark


@pytest.fixture(scope="module")
def fixture2d(spark):
    X = np.round(datasets.make("tdrive", 2000, seed=0), 2)
    C0 = cinit.random_init(X, 8, seed=1)
    df = sdata.to_spark(spark, X, n_partitions=4)
    pts = pd.DataFrame(X, columns=["x0", "x1"])
    pts.insert(0, "id", np.arange(len(X)))
    return X, C0, df, pts


def test_matches_local_lloyd(spark, fixture2d):
    X, C0, df, _ = fixture2d
    ref = lloyd_local.fit(X, C0, 6)
    r = lloyd_spark.fit(spark, df, 8, d=2, max_iter=6, init_centroids=C0)
    np.testing.assert_allclose(r.centroids, ref.centroids, atol=1e-8)


def test_assign_df_vs_duckdb(spark, fixture2d):
    X, C0, df, pts = fixture2d
    assigned = lloyd_spark.assign_df(df, C0, 2).select("id", "cluster")
    assert_equivalent(
        assigned,
        assign_sql.assignment_sql(2),
        points=pts,
        centroids=assign_sql.centroids_pdf(C0),
    )


def test_catalyst_refinement_vs_duckdb(spark, fixture2d):
    """The groupBy().agg() refinement (Catalyst path) equals DuckDB's
    GROUP BY over the same assignment."""
    X, C0, df, pts = fixture2d
    assigned = lloyd_spark.assign_df(df, C0, 2)
    agg = assigned.groupBy("cluster").agg(
        Fn.count("*").alias("cnt"),
        Fn.sum("x0").alias("s_x0"),
        Fn.sum("x1").alias("s_x1"),
    )
    assert_equivalent(
        agg,
        assign_sql.refine_sql(2),
        points=pts,
        centroids=assign_sql.centroids_pdf(C0),
    )


def test_convergence_detection(spark):
    """A dataset with well-separated blobs converges quickly and the flag
    reports it."""
    g = np.random.default_rng(0)
    X = np.concatenate([g.normal(c, 0.05, (200, 2)) for c in ((0, 0), (10, 10), (20, 0))])
    C0 = np.array([[0.5, 0.5], [10.5, 10.5], [20.5, 0.5]])
    df = sdata.to_spark(spark, X, n_partitions=2)
    r = lloyd_spark.fit(spark, df, 3, d=2, max_iter=10, init_centroids=C0)
    assert r.converged and r.n_iter < 10


def test_mllib_kmeans_comparator(spark, fixture2d):
    """pyspark.ml KMeans (the MLlib comparator of the repro plan) reaches a
    comparable SSE on the same data."""
    from pyspark.ml.clustering import KMeans as MLKMeans
    from pyspark.ml.feature import VectorAssembler

    X, C0, df, _ = fixture2d
    feats = VectorAssembler(inputCols=["x0", "x1"], outputCol="features").transform(df)
    model = MLKMeans(k=8, maxIter=6, seed=1, initMode="random").fit(feats)
    sse_ml = model.summary.trainingCost
    ref = lloyd_local.fit(X, C0, 6)
    sse_ours = ref.sse(X)
    assert sse_ml < sse_ours * 3 and sse_ours < sse_ml * 3
