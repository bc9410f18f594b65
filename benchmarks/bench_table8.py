"""Benchmarks for Table VIII (cost-model ablation) and the Fig. 11 analog.

The shared 200-task sample set is generated once and cached on disk, so
the timed parts here are estimator training/evaluation, not sample
generation.

Run: pytest benchmarks/bench_table8.py --benchmark-only -q
"""
import pytest

from repro.estimator import samples as S
from repro.estimator.runtime import RuntimePredictor
from repro.experiments import fig11, table8


@pytest.fixture(scope="module")
def sample_set():
    return S.generate(table8.N_TASKS, seed=0, max_iter=12)


@pytest.mark.parametrize("beta", [1, 4])
def test_estimator_training(benchmark, sample_set, beta):
    """Training cost of the paper's estimator (one-pass OLS)."""
    train, _va, _te = S.split(sample_set)
    benchmark.pedantic(
        lambda: RuntimePredictor(beta=beta, q=12).fit(train),
        rounds=3, iterations=1,
    )


def test_estimator_prediction(benchmark, sample_set):
    train, _va, test = S.split(sample_set)
    rp = RuntimePredictor(beta=4, q=12).fit(train)
    benchmark.pedantic(
        lambda: [rp.predict_total(s) for s in test], rounds=5, iterations=1
    )


def test_full_table8(benchmark, capsys):
    rows = benchmark.pedantic(lambda: table8.run(), rounds=1, iterations=1)
    with capsys.disabled():
        print("\n== Table VIII (beta x features ablation) ==")
        print(table8.format_table(rows))


def test_full_fig11(benchmark, capsys):
    rows = benchmark.pedantic(lambda: fig11.run(), rounds=1, iterations=1)
    with capsys.disabled():
        print("\n== Fig. 11 analog (prediction cost + accuracy) ==")
        print(fig11.format_table(rows))
    ours = next(r for r in rows if r["model"] == "Dask-means")
    best_other = min(
        r["MSE"] for r in rows if r["model"] != "Dask-means"
    )
    # The abstract's claim is "MSE up to 33.3% lower than SOTA"; at our
    # scale we only require ours to be competitive (within 2x of the best).
    assert ours["MSE"] <= best_other * 2.0
