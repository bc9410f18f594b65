"""Benchmarks for the distributed layer: per-partition Dask-means vs the
DataFrame-native Lloyd and MLlib KMeans at SF~=0.1-class scale.

Run: pytest benchmarks/bench_spark.py --benchmark-only -q
"""
import numpy as np
import pytest

from repro import datasets
from repro.core import init as cinit
from repro.spark import daskmeans_spark, data as sdata, lloyd_spark

_N = 60_000
_K = 64


@pytest.fixture(scope="module")
def dist_data(spark):
    X = datasets.make("tdrive", _N, seed=0)
    C0 = cinit.random_init(X, _K, seed=1)
    df = sdata.to_spark(
        spark, X, n_partitions=spark.sparkContext.defaultParallelism
    ).persist()
    df.count()
    yield spark, X, C0, df
    df.unpersist()


def test_spark_daskmeans(benchmark, dist_data):
    spark, X, C0, df = dist_data
    result = benchmark.pedantic(
        lambda: daskmeans_spark.fit(
            spark, df, _K, d=2, f=30, max_iter=5, init_centroids=C0
        ),
        rounds=2, iterations=1,
    )
    benchmark.extra_info["n_dist"] = result.n_dist
    benchmark.extra_info["pruned_vectors"] = result.pruned_vectors


def test_spark_lloyd(benchmark, dist_data):
    spark, X, C0, df = dist_data
    result = benchmark.pedantic(
        lambda: lloyd_spark.fit(spark, df, _K, d=2, max_iter=5, init_centroids=C0),
        rounds=2, iterations=1,
    )
    benchmark.extra_info["n_iter"] = result.n_iter


def test_mllib_kmeans(benchmark, dist_data):
    from pyspark.ml.clustering import KMeans as MLKMeans
    from pyspark.ml.feature import VectorAssembler

    spark, X, C0, df = dist_data
    feats = VectorAssembler(inputCols=["x0", "x1"], outputCol="features").transform(df)
    feats.persist().count()
    benchmark.pedantic(
        lambda: MLKMeans(k=_K, maxIter=5, seed=1, initMode="random").fit(feats),
        rounds=2, iterations=1,
    )
    feats.unpersist()


def test_results_agree(benchmark, dist_data):
    """The two distributed implementations compute the same clustering
    (timed as one combined round so it also runs under --benchmark-only)."""
    spark, X, C0, df = dist_data

    def both():
        rd = daskmeans_spark.fit(
            spark, df, _K, d=2, f=30, max_iter=5, init_centroids=C0
        )
        rl = lloyd_spark.fit(spark, df, _K, d=2, max_iter=5, init_centroids=C0)
        return rd, rl

    rd, rl = benchmark.pedantic(both, rounds=1, iterations=1)
    np.testing.assert_allclose(rd.centroids, rl.centroids, atol=1e-6)
