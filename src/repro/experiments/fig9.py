"""Fig. 9 analog (supplementary table): memory cost of each algorithm.

The paper fixes k = 1e3 and reports the extra memory (indexes + bounds)
each algorithm keeps beyond the dataset. We reproduce at k = 256 with the
same accounting used throughout: float slots (8 bytes each), converted
to MB.
"""
from __future__ import annotations

from repro import datasets
from repro.algorithms import ALGORITHMS, TABLE4_ORDER
from repro.core import init as cinit
from repro.estimator.memory import floats_to_mb

SCALE_N = 20_000
K = 256


def run(names: list[str], *, base_n: int = SCALE_N, k: int = K,
        max_iter: int = 5, seed: int = 0) -> list[dict]:
    rows = []
    for name in names:
        n = datasets.paper_scale_n(name, base_n)
        X = datasets.make(name, n, seed=seed)
        C0 = cinit.random_init(X, k, seed=seed + 1)
        for algo in TABLE4_ORDER:
            r = ALGORITHMS[algo](X, C0, max_iter)
            rows.append({
                "dataset": name, "algo": algo,
                "memory_floats": r.memory_floats,
                "memory_mb": floats_to_mb(r.memory_floats),
            })
    return rows


def format_table(rows: list[dict]) -> str:
    algos = [a for a in TABLE4_ORDER if any(r["algo"] == a for r in rows)]
    names = sorted({r["dataset"] for r in rows})
    by = {(r["dataset"], r["algo"]): r for r in rows}
    head = f"{'dataset':<10s} " + " ".join(f"{a:>12s}" for a in algos)
    lines = [head, "-" * len(head)]
    for name in names:
        lines.append(
            f"{name:<10s} "
            + " ".join(f"{by[(name, a)]['memory_mb']:12.3f}" for a in algos)
        )
    return "\n".join(lines)
