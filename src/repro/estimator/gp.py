"""Runtime adjustment with a Gaussian Process (Section V-B2).

A GP is placed over g(i) = predicted/actual runtime ratio of iteration i,
with prior mean 1 (perfect prediction before the task starts). As each
iteration completes, its observed ratio conditions the GP and rescales
the predictions of the *remaining* iterations.

The kernel (Eq. 20) is asymmetric on purpose: completed iterations must
influence upcoming ones but not vice versa, so cov(i, i') is zero for
i' - i <= -1 and exp(-h(i'-i)^2 / (2 sigma^2)) otherwise, where h
(Eq. 21) is ln(delta+1) on (-1, 0] and delta beyond — continuously
differentiable at the boundary. Such a kernel is not a valid (PSD)
covariance in the classical sense; following the paper we use it as a
similarity weighting and solve the (jittered, non-symmetric) linear
system directly.
"""
from __future__ import annotations

import numpy as np


def h(delta: np.ndarray) -> np.ndarray:
    """Eq. 21: continuously differentiable distance warp."""
    delta = np.asarray(delta, dtype=float)
    out = np.where(delta > 0, delta, np.log1p(np.clip(delta, -1 + 1e-15, None)))
    return out


def cov(i: np.ndarray, ip: np.ndarray, sigma: float = 50.0) -> np.ndarray:
    """Eq. 20: asymmetric kernel; rows = observed i, cols = target i'."""
    i = np.asarray(i, dtype=float)
    ip = np.asarray(ip, dtype=float)
    delta = ip[None, :] - i[:, None]
    k = np.where(
        delta <= -1.0,
        0.0,
        np.exp(-(h(delta) ** 2) / (2.0 * sigma**2)),
    )
    return k


class RuntimeAdjuster:
    """Conditions the ratio-GP on completed iterations (Fig. 5(c)).

    ``adjust(yhat, y_obs)`` takes the per-iteration predictions yhat
    (1..q) and the actual runtimes of the first c iterations, and returns
    adjusted predictions where iterations 1..c are replaced by their
    actuals and iterations c+1..q are divided by the posterior mean ratio
    E[g | observations].
    """

    def __init__(self, sigma: float = 50.0, jitter: float = 1e-6):
        self.sigma = sigma
        self.jitter = jitter

    def posterior_ratio(self, obs_iters: np.ndarray, g_obs: np.ndarray, target_iters: np.ndarray) -> np.ndarray:
        """Posterior mean of g at target iterations given observed ratios."""
        if len(obs_iters) == 0:
            return np.ones(len(target_iters))
        K = cov(obs_iters, obs_iters, self.sigma) + self.jitter * np.eye(len(obs_iters))
        Ks = cov(obs_iters, target_iters, self.sigma)
        try:
            alpha = np.linalg.solve(K, g_obs - 1.0)
        except np.linalg.LinAlgError:
            alpha = np.linalg.lstsq(K, g_obs - 1.0, rcond=None)[0]
        return 1.0 + Ks.T @ alpha

    def adjust(self, yhat: np.ndarray, y_obs: np.ndarray) -> np.ndarray:
        """Adjusted per-iteration runtimes after observing len(y_obs) iters."""
        q = len(yhat)
        c = len(y_obs)
        out = np.asarray(yhat, dtype=float).copy()
        if c == 0:
            return out
        c = min(c, q)
        obs_i = np.arange(1, c + 1, dtype=float)
        safe = np.maximum(np.asarray(y_obs[:c], dtype=float), 1e-12)
        g_obs = out[:c] / safe
        out[:c] = y_obs[:c]
        if c < q:
            tgt = np.arange(c + 1, q + 1, dtype=float)
            ratio = self.posterior_ratio(obs_i, g_obs, tgt)
            ratio = np.clip(ratio, 0.1, 10.0)  # keep the correction sane
            out[c:] = out[c:] / ratio
        return out


class WeightedAverageAdjuster:
    """The [63]-style baseline: scale the future by the mean observed ratio."""

    def adjust(self, yhat: np.ndarray, y_obs: np.ndarray) -> np.ndarray:
        q = len(yhat)
        c = min(len(y_obs), q)
        out = np.asarray(yhat, dtype=float).copy()
        if c == 0:
            return out
        safe = np.maximum(np.asarray(y_obs[:c], dtype=float), 1e-12)
        ratio = float((out[:c] / safe).mean())
        out[:c] = y_obs[:c]
        if c < q:
            out[c:] = out[c:] / np.clip(ratio, 0.1, 10.0)
        return out
