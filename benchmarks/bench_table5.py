"""Benchmarks for Table V (high-dimensional datasets).

Run: pytest benchmarks/bench_table5.py --benchmark-only -q
"""
import pytest

from repro import datasets
from repro.algorithms import ALGORITHMS
from repro.core import init as cinit
from repro.experiments import table4

_ALGOS = ["Lloyd", "Hamerly", "Elkan", "NoInB", "Dask-means"]


@pytest.fixture(scope="module")
def cell_data():
    X = datasets.make("apoll_td", 3_000, seed=0)
    C0 = cinit.random_init(X, 64, seed=1)
    return X, C0


@pytest.mark.parametrize("algo", _ALGOS)
def test_highdim_cell(benchmark, cell_data, algo):
    """Timed cell: apoll_td (d=128), n=3e3, k=64, 5 iterations."""
    X, C0 = cell_data
    result = benchmark.pedantic(
        lambda: ALGORITHMS[algo](X, C0, 5), rounds=3, iterations=1
    )
    benchmark.extra_info["n_dist"] = result.n_dist


def test_full_table5(benchmark, capsys):
    rows = benchmark.pedantic(
        lambda: table4.run(datasets.HIGH_DIM, base_n=8_000),
        rounds=1, iterations=1,
    )
    with capsys.disabled():
        print("\n== Table V (runtime, seconds) ==")
        print(table4.format_table(rows, "time_s"))
        print("== Table V (distance computations) ==")
        print(table4.format_table(rows, "n_dist"))
