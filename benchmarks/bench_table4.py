"""Benchmarks for Table IV: per-algorithm timing on a representative cell
plus a one-shot regeneration of the full table (printed to stdout).

Run: pytest benchmarks/bench_table4.py --benchmark-only -q
"""
import pytest

from repro import datasets
from repro.algorithms import ALGORITHMS, TABLE4_ORDER
from repro.core import init as cinit
from repro.experiments import table4

_N = 10_000
_K = 64


@pytest.fixture(scope="module")
def cell_data():
    X = datasets.make("tdrive", _N, seed=0)
    C0 = cinit.random_init(X, _K, seed=1)
    return X, C0


@pytest.mark.parametrize("algo", TABLE4_ORDER)
def test_algorithm_cell(benchmark, cell_data, algo):
    """Timed cell: tdrive, n=1e4, k=64, 5 iterations."""
    X, C0 = cell_data
    result = benchmark.pedantic(
        lambda: ALGORITHMS[algo](X, C0, 5), rounds=3, iterations=1
    )
    benchmark.extra_info["n_dist"] = result.n_dist
    benchmark.extra_info["memory_floats"] = result.memory_floats


def test_full_table4(benchmark, capsys):
    """Regenerates the whole Table IV grid once and prints it.

    Bench scale is half the jobs scale (base_n=1e4 vs 2e4) so the whole
    benchmark suite fits one run; `jobs/table4_runtime.py` produces the
    full-scale numbers recorded in EXPERIMENTS.md.
    """
    rows = benchmark.pedantic(
        lambda: table4.run(datasets.LOW_DIM, base_n=10_000), rounds=1, iterations=1
    )
    with capsys.disabled():
        print("\n== Table IV, bench scale n=1e4 (runtime, seconds) ==")
        print(table4.format_table(rows, "time_s"))
        print("== Table IV, bench scale n=1e4 (distance computations) ==")
        print(table4.format_table(rows, "n_dist"))
