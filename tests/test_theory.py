"""Numerical checks of the §4 theory beyond what test_allocation and
test_sampler already cover: Prop. 3/4 structure and Theorem 4.1's
regimes (stochastic draws, small-p strata, fractional allocations)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.allocation import optimal_allocation, optimal_mse, stage2_counts
from repro.core.estimator import true_strata_params
from repro.core.sampler import abae_trial
from repro.experiments.metrics import rmse


def _make_strata(p_list, mu_list, n=4000, sd=1.0, seed=0):
    rng = np.random.default_rng(seed)
    out = []
    for p, mu in zip(p_list, mu_list):
        labels = (rng.random(n) < p).astype(np.int64)
        values = np.where(labels == 1, rng.normal(mu, sd, n), 0.0)
        out.append((values, labels))
    return out


def _truth(strata):
    v = np.concatenate([x for x, _ in strata])
    l = np.concatenate([x for _, x in strata])
    return float(v[l == 1].mean())


class TestStochasticDraws:
    def test_small_p_stratum_contribution_negligible(self):
        """§4.4.3: a stratum with p_k ≈ 1/N² contributes O(p_k) to the
        error — ABAE's estimate should be nearly unchanged by it."""
        base = _make_strata([0.5, 0.5], [5.0, 6.0], seed=1)
        with_tiny = base + _make_strata([0.0005], [100.0], seed=2)
        t_base = _truth(base)
        e_with = [
            abae_trial(with_tiny, 1000, np.random.default_rng(i)).estimate
            for i in range(300)
        ]
        # Truth shifts only marginally; the estimator must track it.
        assert np.mean(e_with) == pytest.approx(_truth(with_tiny), abs=0.15)
        assert abs(_truth(with_tiny) - t_base) < 0.2

    def test_zero_positive_stage1_stratum_recovers(self):
        """A stratum that yields no Stage-1 positives gets T̂_k = 0 but
        its Stage-1 draws still feed the final p̂ — the estimate stays
        finite and anchored by the other strata."""
        strata = _make_strata([0.001, 0.8], [50.0, 5.0], seed=3)
        ests = [
            abae_trial(strata, 200, np.random.default_rng(i)).estimate
            for i in range(200)
        ]
        assert np.all(np.isfinite(ests))
        assert np.median(ests) == pytest.approx(5.0, abs=0.5)


class TestFractionalAllocations:
    def test_rounding_down_loses_at_most_k_draws(self):
        rng = np.random.default_rng(4)
        for _ in range(50):
            k = rng.integers(2, 8)
            t = rng.dirichlet(np.ones(k))
            n2 = int(rng.integers(10, 5000))
            c = stage2_counts(t, n2)
            assert n2 - k < c.sum() <= n2

    def test_rate_unchanged_by_rounding(self):
        """§4.4.2: floor-rounding must not change the O(1/N) rate —
        MSE(4N)/MSE(N) ≈ 1/4 empirically."""
        strata = _make_strata([0.1, 0.3, 0.7], [2.0, 5.0, 9.0], seed=5)
        truth = _truth(strata)
        mses = []
        for n in (400, 1600):
            ests = [
                abae_trial(strata, n, np.random.default_rng(i)).estimate
                for i in range(400)
            ]
            mses.append(rmse(ests, truth) ** 2)
        assert mses[1] / mses[0] == pytest.approx(0.25, abs=0.15)


class TestPilotConvergence:
    def test_stage1_estimates_converge(self):
        """The √p̂σ̂ allocation must converge to the true optimal
        allocation as N₁ grows (the Prop.-3 premise)."""
        strata = _make_strata([0.2, 0.5, 0.9], [1.0, 4.0, 8.0], n=20000, seed=6)
        p, sigma, _ = true_strata_params(strata)
        t_true = optimal_allocation(p, sigma)
        devs = []
        for n in (150, 1500, 9000):
            res = abae_trial(strata, n, np.random.default_rng(0))
            devs.append(float(np.abs(res.allocation - t_true).max()))
        assert devs[2] < devs[0]
        assert devs[2] < 0.05

    def test_balanced_stages_achieve_near_optimal_mse(self):
        """Theorem 4.1 with N₁ = N₂: ABAE's realized MSE should be
        within a small constant of the perfect-information optimum.

        Uses equal per-stratum means: with μ_k spread, the estimator
        additionally pays Var(p̂)-driven weighting noise that Prop. 2
        (which assumes known p_k) does not model, so the constant-
        factor claim is only tight in the equal-means regime.
        """
        strata = _make_strata([0.1, 0.4, 0.8], [6.0, 6.0, 6.0], n=20000, seed=7)
        truth = _truth(strata)
        p, sigma, _ = true_strata_params(strata)
        n = 2000
        ests = [
            abae_trial(strata, n, np.random.default_rng(i)).estimate
            for i in range(400)
        ]
        mse = rmse(ests, truth) ** 2
        # Stage 2 holds half the budget, so 2-4x the N-budget optimum is
        # the expected constant-factor regime; assert a generous bound.
        assert mse < 6 * optimal_mse(p, sigma, n)
