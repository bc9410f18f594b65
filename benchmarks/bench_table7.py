"""Benchmarks for Table VII (memory-tunable index under budgets).

Run: pytest benchmarks/bench_table7.py --benchmark-only -q
"""
import pytest

from repro import datasets
from repro.core import daskmeans, init as cinit
from repro.estimator import memory as mem
from repro.experiments import table7


@pytest.mark.parametrize("target_f", table7.TARGET_F)
def test_budgeted_run(benchmark, target_f):
    """Timed Dask-means run at each paper-equivalent memory budget."""
    n, k = 10_000, 64
    X = datasets.make("tdrive", n, seed=0)
    C0 = cinit.random_init(X, k, seed=1)
    budget = mem.estimate_total_floats(n, k, target_f, exact=False) * 1.001
    f = mem.tune_f(n, k, budget)
    result = benchmark.pedantic(
        lambda: daskmeans.fit(X, C0, 5, f=f), rounds=3, iterations=1
    )
    benchmark.extra_info["f"] = f
    benchmark.extra_info["pruned_vectors"] = result.pruned_vectors
    assert result.memory_floats <= budget * 1.2


def test_full_table7(benchmark, capsys):
    """Bench scale is half the jobs scale (base_n=1e4 vs 2e4); see
    `jobs/table7_memory_limit.py` for the EXPERIMENTS.md numbers."""
    rows = benchmark.pedantic(
        lambda: table7.run(datasets.LOW_DIM, base_n=10_000),
        rounds=1, iterations=1,
    )
    with capsys.disabled():
        print("\n== Table VII, bench scale n=1e4 (runtime / pruned vectors) ==")
        print(table7.format_table(rows))
