"""Optimal sample allocation and MSE formulas (§4.2, Props. 1–2).

Proposition 1: with known p_k (predicate positive rate) and σ_k
(statistic std among positives), the MSE-minimizing allocation of a
budget N across strata is T_k* ∝ √p_k · σ_k.

Proposition 2: under T*, the MSE is (Σ_k √p_k σ_k)² / (N · p_all²).

These formulas drive Stage 2 of ABAE (with plug-in estimates), the
group-by objectives (Eqs. 10–11), and proxy selection (§3.4).
"""
from __future__ import annotations

import numpy as np


def optimal_allocation(p: np.ndarray, sigma: np.ndarray) -> np.ndarray:
    """T_k* = √p_k σ_k / Σ_i √p_i σ_i  (Proposition 1, Eq. 2).

    Falls back to uniform allocation when every √p_k σ_k is zero (e.g.
    a pilot that found no positives anywhere, or all-constant values) —
    any allocation is then equally (un)informative.
    """
    p = np.asarray(p, dtype=float)
    sigma = np.asarray(sigma, dtype=float)
    if p.shape != sigma.shape:
        raise ValueError(f"shape mismatch: {p.shape} vs {sigma.shape}")
    raw = np.sqrt(np.clip(p, 0.0, None)) * np.clip(sigma, 0.0, None)
    total = raw.sum()
    if total <= 0.0:
        return np.full(p.size, 1.0 / p.size)
    return raw / total


def mse_for_allocation(
    p: np.ndarray, sigma: np.ndarray, t: np.ndarray, n: int
) -> float:
    """MSE of the combined estimator under allocation ``t`` with
    deterministic draws: Σ_k w_k² σ_k² / (p_k T_k N)  (Eq. 3).

    Strata with p_k = 0 contribute 0 (w_k = 0); strata with T_k = 0 but
    p_k σ_k > 0 make the MSE infinite (they are never sampled).
    """
    p = np.asarray(p, dtype=float)
    sigma = np.asarray(sigma, dtype=float)
    t = np.asarray(t, dtype=float)
    p_all = p.sum()
    if p_all <= 0:
        return 0.0
    w = p / p_all
    num = w**2 * sigma**2
    out = 0.0
    for k in range(p.size):
        if num[k] == 0.0:
            continue
        denom = p[k] * t[k] * n
        if denom <= 0.0:
            return float("inf")
        out += num[k] / denom
    return float(out)


def optimal_mse(p: np.ndarray, sigma: np.ndarray, n: int) -> float:
    """MSE under the optimal allocation: (Σ √p_k σ_k)² / (N p_all²)
    (Proposition 2, Eq. 4). Used for proxy selection (§3.4) and as the
    per-group Err(g) in the group-by objectives."""
    p = np.asarray(p, dtype=float)
    sigma = np.asarray(sigma, dtype=float)
    p_all = p.sum()
    if p_all <= 0 or n <= 0:
        return 0.0
    return float((np.sqrt(np.clip(p, 0, None)) * sigma).sum() ** 2 / (n * p_all**2))


def uniform_mse(p: np.ndarray, sigma: np.ndarray, n: int) -> float:
    """MSE of uniform allocation T_k = 1/K under deterministic draws —
    the §4.2 comparison point (≈ σ²/(N p_avg) in the homoscedastic
    case)."""
    k = np.asarray(p).size
    return mse_for_allocation(p, sigma, np.full(k, 1.0 / k), n)


def stage2_counts(t_hat: np.ndarray, n2: int) -> np.ndarray:
    """⌊N₂·T̂_k⌋ draws per stratum in Stage 2 (Algorithm 1 line 16).

    The paper rounds the fractional allocation down; §4.4.2 shows this
    does not change the convergence rate.
    """
    return np.floor(np.asarray(t_hat, dtype=float) * n2).astype(np.int64)
