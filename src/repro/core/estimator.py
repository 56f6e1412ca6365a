"""Plug-in estimates and the combined stratified estimator.

Algorithm 1 computes, per stratum k, from sampled records R_k and their
positive subset X_k = {f(x) : x ∈ R_k, O(x)=1}:

* p̂_k = |X_k| / |R_k|          (predicate positive rate)
* μ̂_k = mean(X_k)  (0 if empty)
* σ̂_k = sample std of X_k (ddof=1; 0 if fewer than 2 positives)

and returns the combined estimate Σ_k p̂_k μ̂_k / Σ_k p̂_k.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class StratumEstimate:
    """Plug-in estimates for one stratum."""

    n_draws: int
    n_pos: int
    p_hat: float
    mu_hat: float
    sigma_hat: float


def plugin_estimates(values: np.ndarray, labels: np.ndarray) -> StratumEstimate:
    """Compute (p̂, μ̂, σ̂) from one stratum's sampled draws.

    Args:
        values: f(x) for each sampled record (any value for negatives —
            they are masked by ``labels``).
        labels: O(x) ∈ {0,1} per sampled record.
    """
    labels = np.asarray(labels)
    values = np.asarray(values, dtype=float)
    n = int(labels.size)
    pos = values[labels == 1]
    n_pos = int(pos.size)
    p_hat = n_pos / n if n > 0 else 0.0
    mu_hat = float(pos.mean()) if n_pos > 0 else 0.0
    sigma_hat = float(pos.std(ddof=1)) if n_pos > 1 else 0.0
    return StratumEstimate(n, n_pos, p_hat, mu_hat, sigma_hat)


def combine(p_hats: np.ndarray, mu_hats: np.ndarray) -> float:
    """μ̂_all = Σ_k p̂_k μ̂_k / Σ_k p̂_k (Algorithm 1 line 20).

    Returns 0.0 when no stratum produced a positive sample — the same
    convention as the per-stratum means.
    """
    p_hats = np.asarray(p_hats, dtype=float)
    mu_hats = np.asarray(mu_hats, dtype=float)
    denom = p_hats.sum()
    if denom <= 0.0:
        return 0.0
    return float((p_hats * mu_hats).sum() / denom)


def true_strata_params(
    strata: list[tuple[np.ndarray, np.ndarray]],
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Exhaustive (p_k, σ_k, μ_k) over full strata — the "perfect
    information" quantities of §4.2, used by tests and by the
    deterministic-draw formulas."""
    p = np.zeros(len(strata))
    sigma = np.zeros(len(strata))
    mu = np.zeros(len(strata))
    for k, (vals, labs) in enumerate(strata):
        est = plugin_estimates(vals, labs)
        p[k], sigma[k], mu[k] = est.p_hat, est.sigma_hat, est.mu_hat
    return p, sigma, mu
