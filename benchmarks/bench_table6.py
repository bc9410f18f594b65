"""Benchmarks for Table VI (memory estimation accuracy).

Run: pytest benchmarks/bench_table6.py --benchmark-only -q
"""
import pytest

from repro import datasets
from repro.core import balltree as bt
from repro.estimator import memory as mem
from repro.experiments import table6


@pytest.mark.parametrize("f", [30, 100, 200])
def test_index_build_cost(benchmark, f):
    """Index build is the estimator's main input — time it per f."""
    X = datasets.make("argo_pc", 50_000, seed=0)
    tree = benchmark.pedantic(lambda: bt.build(X, f), rounds=3, iterations=1)
    benchmark.extra_info["measured_floats"] = mem.measured_floats(tree)
    benchmark.extra_info["estimated_floats"] = mem.estimate_index_floats(50_000, f)


def test_full_table6(benchmark, capsys):
    rows = benchmark.pedantic(lambda: table6.run(), rounds=1, iterations=1)
    with capsys.disabled():
        print("\n== Table VI (estimated / actual memory ratio) ==")
        print(table6.format_table(rows))
