"""Tests for optimize.logistic — the from-scratch IRLS solver used to
combine proxies (§3.4)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.optimize.logistic import LogisticModel, fit_logistic


def _gen(n=2000, seed=0, w=(2.0, -1.0), b=0.5):
    rng = np.random.default_rng(seed)
    x = rng.normal(0, 1, (n, len(w)))
    z = x @ np.array(w) + b
    y = (rng.random(n) < 1 / (1 + np.exp(-z))).astype(int)
    return x, y


class TestFitLogistic:
    def test_recovers_coefficients(self):
        x, y = _gen(n=20000)
        m = fit_logistic(x, y, l2=1e-6)
        np.testing.assert_allclose(m.weights, [2.0, -1.0], atol=0.15)
        assert m.intercept == pytest.approx(0.5, abs=0.1)

    def test_probabilities_calibrated(self):
        x, y = _gen(n=20000, seed=1)
        m = fit_logistic(x, y)
        p = m.predict_proba(x)
        # Bucket calibration: mean prediction ≈ empirical rate per decile.
        order = np.argsort(p)
        for chunk in np.array_split(order, 10):
            assert p[chunk].mean() == pytest.approx(y[chunk].mean(), abs=0.06)

    def test_separable_data_does_not_blow_up(self):
        x = np.linspace(-1, 1, 100).reshape(-1, 1)
        y = (x.ravel() > 0).astype(int)
        m = fit_logistic(x, y, l2=1e-3)
        assert np.isfinite(m.weights).all()
        assert (m.predict_proba(x) > 0.5).astype(int).tolist() == y.tolist()

    def test_junk_feature_near_zero_weight(self):
        rng = np.random.default_rng(2)
        x, y = _gen(n=10000, seed=3, w=(3.0,), b=0.0)
        xj = np.hstack([x, rng.random((10000, 1))])
        m = fit_logistic(xj, y)
        assert abs(m.weights[1]) < 0.25 * abs(m.weights[0])

    def test_constant_labels(self):
        x = np.random.default_rng(4).normal(0, 1, (100, 2))
        m = fit_logistic(x, np.ones(100))
        assert np.all(m.predict_proba(x) > 0.9)

    def test_shape_mismatch_raises(self):
        with pytest.raises(ValueError):
            fit_logistic(np.ones((10, 2)), np.ones(9))

    def test_predict_proba_bounds(self):
        x, y = _gen(n=500, seed=5)
        p = fit_logistic(x, y).predict_proba(x)
        assert np.all((p >= 0) & (p <= 1))

    def test_predict_single_row(self):
        m = LogisticModel(weights=np.array([1.0, 1.0]), intercept=0.0)
        assert m.predict_proba(np.array([0.0, 0.0]))[0] == pytest.approx(0.5)

    def test_better_than_chance_loss(self):
        x, y = _gen(n=5000, seed=6)
        p = np.clip(fit_logistic(x, y).predict_proba(x), 1e-9, 1 - 1e-9)
        nll = -np.mean(y * np.log(p) + (1 - y) * np.log(1 - p))
        base = y.mean()
        nll0 = -(base * np.log(base) + (1 - base) * np.log(1 - base))
        assert nll < nll0
