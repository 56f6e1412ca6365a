"""Nonparametric bootstrap confidence intervals (Algorithm 2).

ABAE resamples the per-stratum draws from *both* stages (they are
i.i.d. within a stratum), recomputes p̂*_k and μ̂*_k per replicate, and
returns the percentile interval of the combined estimates.

The paper notes the bootstrap is cheap relative to oracle calls; we
additionally vectorize across replicates (one (B, m_k) gather per
stratum) so 1000 replicates cost milliseconds.
"""
from __future__ import annotations

import numpy as np


def bootstrap_ci(
    samples: list[tuple[np.ndarray, np.ndarray]],
    rng: np.random.Generator,
    *,
    n_boot: int = 1000,
    alpha: float = 0.05,
) -> tuple[float, float]:
    """Percentile bootstrap CI for the combined estimator.

    Args:
        samples: per-stratum (values, labels) of all draws made by the
            trial (``TrialResult.samples``).
        rng: generator for the resampling.
        n_boot: number of bootstrap replicates β.
        alpha: 1 − confidence level (0.05 → 95% CI).

    Returns:
        (lower, upper) percentile interval.
    """
    mu_b = bootstrap_replicates(samples, rng, n_boot=n_boot)
    lo, hi = np.percentile(mu_b, [100 * alpha / 2, 100 * (1 - alpha / 2)])
    return float(lo), float(hi)


def bootstrap_replicates(
    samples: list[tuple[np.ndarray, np.ndarray]],
    rng: np.random.Generator,
    *,
    n_boot: int = 1000,
) -> np.ndarray:
    """The β combined-estimate replicates μ̂*_b (Algorithm 2 lines 2–8),
    vectorized over replicates."""
    n_boot = int(n_boot)
    num = np.zeros(n_boot)  # Σ_k p̂*_k μ̂*_k
    den = np.zeros(n_boot)  # Σ_k p̂*_k
    for vals, labs in samples:
        m = int(vals.size)
        if m == 0:
            continue
        idx = rng.integers(0, m, size=(n_boot, m))
        lab_b = np.asarray(labs)[idx]
        val_b = np.asarray(vals, dtype=float)[idx] * lab_b
        pos = lab_b.sum(axis=1)
        p_star = pos / m
        with np.errstate(invalid="ignore", divide="ignore"):
            mu_star = np.where(pos > 0, val_b.sum(axis=1) / np.maximum(pos, 1), 0.0)
        num += p_star * mu_star
        den += p_star
    with np.errstate(invalid="ignore", divide="ignore"):
        return np.where(den > 0, num / np.maximum(den, 1e-300), 0.0)
