"""Tests for optimize.nelder_mead — the from-scratch simplex solver
used for the Eq. 10/11 minimax allocations."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.groupby import solve_minimax_multi
from repro.optimize.nelder_mead import minimize_on_simplex, nelder_mead, softmax


class TestNelderMead:
    def test_quadratic_1d(self):
        res = nelder_mead(lambda x: (x[0] - 3.0) ** 2, np.array([0.0]))
        assert res.x[0] == pytest.approx(3.0, abs=1e-4)
        assert res.converged

    def test_quadratic_nd(self):
        target = np.array([1.0, -2.0, 0.5])
        res = nelder_mead(lambda x: float(((x - target) ** 2).sum()), np.zeros(3))
        np.testing.assert_allclose(res.x, target, atol=1e-4)

    def test_anisotropic_quadratic(self):
        a = np.array([1.0, 100.0])
        res = nelder_mead(lambda x: float((a * x**2).sum()), np.array([2.0, 2.0]))
        np.testing.assert_allclose(res.x, 0.0, atol=1e-3)

    def test_rosenbrock_2d(self):
        def rosen(x):
            return float(100 * (x[1] - x[0] ** 2) ** 2 + (1 - x[0]) ** 2)

        res = nelder_mead(rosen, np.array([-1.2, 1.0]), max_iter=5000)
        np.testing.assert_allclose(res.x, [1.0, 1.0], atol=1e-2)

    def test_abs_nonsmooth(self):
        res = nelder_mead(lambda x: abs(x[0] - 2) + abs(x[1] + 1), np.zeros(2))
        np.testing.assert_allclose(res.x, [2.0, -1.0], atol=1e-3)

    def test_max_of_linear_minimax_flavor(self):
        # min over x of max(x, 1-x) = 0.5 at x=0.5
        res = nelder_mead(lambda x: max(x[0], 1 - x[0]), np.array([0.1]))
        assert res.x[0] == pytest.approx(0.5, abs=1e-3)

    def test_iteration_cap(self):
        res = nelder_mead(lambda x: float((x**2).sum()), np.ones(3), max_iter=5)
        assert res.n_iter <= 5


class TestSoftmax:
    def test_simplex(self):
        s = softmax(np.array([1.0, 2.0, 3.0]))
        assert s.sum() == pytest.approx(1.0)
        assert np.all(s > 0)

    def test_stability_large_inputs(self):
        s = softmax(np.array([1000.0, 1000.0]))
        np.testing.assert_allclose(s, 0.5)

    def test_ordering(self):
        s = softmax(np.array([0.0, 5.0]))
        assert s[1] > s[0]


class TestMinimizeOnSimplex:
    def test_stays_on_simplex(self):
        lam = minimize_on_simplex(lambda l: float((l**2).sum()), 4)
        assert lam.sum() == pytest.approx(1.0)
        np.testing.assert_allclose(lam, 0.25, atol=1e-3)

    def test_weighted_minimax_closed_form(self):
        """min_Λ max_g c_g/Λ_g has the closed form Λ_g ∝ c_g — the
        Eq. 11 oracle the solver must recover."""
        c = np.array([1.0, 4.0, 2.0])
        lam = minimize_on_simplex(lambda l: float(np.max(c / np.maximum(l, 1e-12))), 3)
        np.testing.assert_allclose(lam, c / c.sum(), atol=5e-3)

    def test_solve_minimax_multi_matches_closed_form(self):
        coefs = np.array([0.5, 3.0, 1.5, 0.1])
        lam = solve_minimax_multi(coefs, 1000)
        np.testing.assert_allclose(lam, coefs / coefs.sum(), atol=5e-3)

    def test_solve_minimax_multi_equal_coefs(self):
        lam = solve_minimax_multi(np.ones(5), 100)
        np.testing.assert_allclose(lam, 0.2, atol=5e-3)
