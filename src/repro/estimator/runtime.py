"""Runtime prediction (Section V-B): iteration count x per-iteration time.

The paper's estimator decomposes total runtime t into (a) an iteration
count v predicted by a *linear* regressor over the meta-features,
expressed as the dummy vector u = [1]*v + [0]*(q-v) (Eq. 13), and (b) a
per-iteration runtime predicted by a *non-linear* (polynomial) regressor
with optional interaction features (Eq. 14-17), solved by OLS. Both are
single-pass closed-form fits — the "lightweight" property Fig. 11(a)
measures against XGBoost/DisNet training loops.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.estimator import features as F


@dataclass
class TaskSample:
    """One recorded k-means run used to train/evaluate the estimator."""

    n: int
    k: int
    d: int
    f: int
    iter_times: list[float]          # actual per-iteration runtimes (sec)
    tree_stats: np.ndarray | None = None  # optional task_features override

    @property
    def n_iter(self) -> int:
        return len(self.iter_times)

    @property
    def total_time(self) -> float:
        return float(sum(self.iter_times))

    def features(self) -> np.ndarray:
        if self.tree_stats is not None:
            return self.tree_stats
        return F.task_features(self.n, self.k, self.d, self.f)


class IterationCountLR:
    """Linear regressor for the iteration count v (Section V-B1).

    Plain least squares from standardized meta-features to v; the
    prediction is rounded and clipped to [1, q] before being turned into
    the dummy vector u.
    """

    def fit(self, samples: list[TaskSample], q: int) -> "IterationCountLR":
        self.q = q
        Z = np.array([s.features() for s in samples])
        v = np.array([s.n_iter for s in samples], dtype=float)
        self.std = F.Standardizer().fit(Z)
        A = np.column_stack([np.ones(len(Z)), self.std.transform(Z)])
        self.coef_, *_ = np.linalg.lstsq(A, v, rcond=None)
        return self

    def predict_v(self, feat: np.ndarray) -> int:
        a = np.concatenate([[1.0], self.std.transform(feat[None, :])[0]])
        v = float(a @ self.coef_)
        return int(np.clip(round(v), 1, self.q))

    def predict_u(self, feat: np.ndarray) -> np.ndarray:
        """Dummy vector u: ones for the predicted first v iterations."""
        v = self.predict_v(feat)
        u = np.zeros(self.q)
        u[:v] = 1.0
        return u


class PerIterationNLR:
    """Polynomial OLS for each iteration's runtime (Eq. 14-17).

    Design rows are [n, k, d, f, iteration index j] — the paper's Eq. 14
    meta-features (lambda = 4) plus the iteration position — standardized,
    then expanded into all monomials of total degree <= beta (cross terms
    only when ``interaction``). Solved in one pass by lstsq — the OLS
    solution of Eq. 17. The index-shape features stay with the
    iteration-count LR; putting all 8 into a degree-4 interaction basis
    yields ~700 collinear terms and OLS blows up, which is why the basis
    is restricted to the paper's own feature set here.
    """

    #: Eq. 14 meta-features: the first entries of F.TASK_FEATURES.
    N_CORE = 4

    def __init__(self, beta: int = 4, interaction: bool = True):
        self.beta = beta
        self.interaction = interaction

    def fit(self, samples: list[TaskSample]) -> "PerIterationNLR":
        rows, y = [], []
        for s in samples:
            feat = s.features()[: self.N_CORE]
            rows.append(F.iteration_rows(feat, s.n_iter))
            y.extend(s.iter_times)
        Z = np.vstack(rows)
        y = np.array(y)
        self.std = F.Standardizer().fit(Z)
        self.expos = F.monomial_exponents(Z.shape[1], self.beta, self.interaction)
        A = F.expand(self.std.transform(Z), self.expos)
        self.coef_, *_ = np.linalg.lstsq(A, y, rcond=None)
        return self

    def predict_iters(self, feat: np.ndarray, q: int) -> np.ndarray:
        """Predicted runtime of iterations 1..q (clipped at >= 0)."""
        Z = F.iteration_rows(feat[: self.N_CORE], q)
        A = F.expand(self.std.transform(Z), self.expos)
        return np.maximum(A @ self.coef_, 0.0)


@dataclass
class RuntimePredictor:
    """The full estimator: t_hat = sum_i u_i * y_hat_i (Eq. 13)."""

    beta: int = 4
    interaction: bool = True
    q: int = 20
    lr: IterationCountLR = field(default=None)
    nlr: PerIterationNLR = field(default=None)

    def fit(self, samples: list[TaskSample]) -> "RuntimePredictor":
        self.lr = IterationCountLR().fit(samples, self.q)
        self.nlr = PerIterationNLR(self.beta, self.interaction).fit(samples)
        return self

    def predict_profile(self, sample: TaskSample) -> tuple[np.ndarray, np.ndarray]:
        """(u, per-iteration predictions over 1..q) for one task."""
        feat = sample.features()
        u = self.lr.predict_u(feat)
        yhat = self.nlr.predict_iters(feat, self.q)
        return u, yhat

    def predict_total(self, sample: TaskSample) -> float:
        u, yhat = self.predict_profile(sample)
        return float((u * yhat).sum())
