"""Querying the maintained model (Algorithm 3) and error metrics.

A :class:`CountModel` wraps a flat vector of counter values — exact
counts for EXACTMLE, coordinator estimates for the approximate
algorithms — and answers joint-probability queries by the factorization
of Equation 2: ``P[x] = prod_i A_i(x_i, x_par) / A_i(x_par)``.

Smoothing: both exact and approximate models use the same pseudo-count
``lam`` per cell (``(A + lam) / (A_par + lam * J_i)``) so queries on
configurations with zero observed mass are well defined and the
model-vs-MLE ratio is meaningful (DESIGN.md substitution #6).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.bayesnet.structure import BayesNet


@dataclass
class CountModel:
    """A Bayesian-network model defined by counter values."""

    net: BayesNet
    values: np.ndarray  # (n_counters,) exact counts or estimates
    lam: float = 0.5

    def __post_init__(self) -> None:
        if self.values.shape != (self.net.n_counters,):
            raise ValueError("values must have one entry per counter")
        self.values = np.maximum(self.values.astype(np.float64), 0.0)

    def log_factor(self, i: int, xi: np.ndarray, pidx: np.ndarray) -> np.ndarray:
        """``log( A_i(x_i, x_par) / A_i(x_par) )`` with smoothing,
        vectorized over events."""
        xi = np.asarray(xi, dtype=np.int64)
        pidx = np.asarray(pidx, dtype=np.int64)
        fam = self.values[self.net.fam_offset[i] + pidx * self.net.cards[i] + xi]
        par = self.values[self.net.par_offset[i] + pidx]
        J = float(self.net.cards[i])
        return np.log((fam + self.lam) / (par + self.lam * J))

    def log_prob(self, X: np.ndarray) -> np.ndarray:
        """Log joint probability of each row of ``X`` (Algorithm 3)."""
        out = np.zeros(X.shape[0], dtype=np.float64)
        for i in range(self.net.n):
            pidx = self.net.parent_config_index(X, i)
            out += self.log_factor(i, X[:, i], pidx)
        return out


def mean_abs_ratio_error(logp_model: np.ndarray, logp_ref: np.ndarray) -> float:
    """Paper's testing error: average of ``|P_model(x)/P_ref(x) - 1|``
    over the test events, computed stably in log space."""
    return float(np.mean(np.abs(np.expm1(logp_model - logp_ref))))


def median_abs_ratio_error(logp_model: np.ndarray, logp_ref: np.ndarray) -> float:
    return float(np.median(np.abs(np.expm1(logp_model - logp_ref))))
