"""Evaluation metrics (§5.1 "Metrics").

The paper's primary metric is RMSE of the estimate against the
exhaustive ground truth; Fig. 4 uses the normalized Q-error
100·(q − 1) with q = max(μ̂/μ, μ/μ̂); Fig. 5 uses bootstrap CI width
and nominal coverage. Cost is always counted in oracle invocations.
"""
from __future__ import annotations

import numpy as np


def rmse(estimates: np.ndarray, truth: float) -> float:
    """Root mean squared error over trials."""
    e = np.asarray(estimates, dtype=float)
    return float(np.sqrt(np.mean((e - truth) ** 2)))


def normalized_qerror(estimates: np.ndarray, truth: float) -> float:
    """Mean normalized Q-error 100·(q−1) over trials.

    q penalizes under- and over-estimation symmetrically; estimates of
    0 (no positive sample drawn) give an infinite q, which we clip to
    the worst finite trial to keep the mean meaningful.
    """
    e = np.asarray(estimates, dtype=float)
    if truth == 0:
        return 0.0
    with np.errstate(divide="ignore", invalid="ignore"):
        q = np.maximum(e / truth, truth / np.where(e != 0, e, np.nan))
    q = np.where(np.isfinite(q), q, np.nan)
    if np.all(np.isnan(q)):
        return float("inf")
    worst = np.nanmax(q)
    q = np.where(np.isnan(q), worst, q)
    return float(100.0 * (np.mean(q) - 1.0))


def relative_error(estimates: np.ndarray, truth: float) -> float:
    """Mean |μ̂ − μ| / |μ| over trials (percent)."""
    e = np.asarray(estimates, dtype=float)
    if truth == 0:
        return 0.0
    return float(100.0 * np.mean(np.abs(e - truth)) / abs(truth))


def ci_width(lo: np.ndarray, hi: np.ndarray) -> float:
    """Mean CI width over trials."""
    return float(np.mean(np.asarray(hi) - np.asarray(lo)))


def ci_coverage(lo: np.ndarray, hi: np.ndarray, truth: float) -> float:
    """Fraction of trials whose CI contains the truth (nominal: 1−α)."""
    lo = np.asarray(lo, dtype=float)
    hi = np.asarray(hi, dtype=float)
    return float(np.mean((lo <= truth) & (truth <= hi)))


def max_group_rmse(estimates: np.ndarray, truths: np.ndarray) -> float:
    """Fig. 7/8 metric: max over groups of per-group RMSE.

    Args:
        estimates: (n_trials, n_groups) per-trial group estimates.
        truths: (n_groups,) exhaustive per-group answers.
    """
    e = np.atleast_2d(np.asarray(estimates, dtype=float))
    t = np.asarray(truths, dtype=float)
    per_group = np.sqrt(np.mean((e - t[None, :]) ** 2, axis=0))
    return float(per_group.max())
