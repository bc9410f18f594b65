"""Table VIII: cost-model ablation — degree beta x interaction features.

Protocol (Section VI-C, scaled): a cached sample set of Dask-means runs,
80/10/10 split, a RuntimePredictor trained per (beta, interaction)
configuration, and MSE/MAE/WMAPE/sMAPE on the held-out tasks. Paper
runtimes are seconds-to-minutes; ours are milliseconds-to-seconds, so
absolute metric values are smaller — the shape to check is the minimum
around beta = 3-4 and interaction features helping.
"""
from __future__ import annotations

import numpy as np

from repro.estimator import metrics as M
from repro.estimator import samples as S
from repro.estimator.runtime import RuntimePredictor

N_TASKS = 200
BETAS = (1, 2, 3, 4, 5, 6)


def run(*, n_tasks: int = N_TASKS, seed: int = 0, max_iter: int = 12,
        sample_kwargs: dict | None = None) -> list[dict]:
    smp = S.generate(n_tasks, seed=seed, max_iter=max_iter,
                     **(sample_kwargs or {}))
    train, _val, test = S.split(smp, seed=seed)
    y = np.array([s.total_time for s in test])
    rows = []
    for beta in BETAS:
        for interaction in (False, True):
            rp = RuntimePredictor(beta=beta, interaction=interaction,
                                  q=max_iter).fit(train)
            yhat = np.array([rp.predict_total(s) for s in test])
            row = {"beta": beta, "interaction": interaction}
            row.update(M.evaluate(y, yhat))
            rows.append(row)
    return rows


def format_table(rows: list[dict]) -> str:
    head = (f"{'beta':>4s} | "
            + " ".join(f"{m:>10s}" for m in ("MSE", "MAE", "WMAPE", "sMAPE"))
            + "  (Basic) | "
            + " ".join(f"{m:>10s}" for m in ("MSE", "MAE", "WMAPE", "sMAPE"))
            + "  (Interaction)")
    lines = [head, "-" * len(head)]
    by = {(r["beta"], r["interaction"]): r for r in rows}
    for beta in BETAS:
        parts = []
        for inter in (False, True):
            r = by[(beta, inter)]
            parts.append(" ".join(
                f"{r[m]:10.4g}" for m in ("MSE", "MAE", "WMAPE", "sMAPE")))
        lines.append(f"{beta:>4d} | " + parts[0] + "          | " + parts[1])
    return "\n".join(lines)
