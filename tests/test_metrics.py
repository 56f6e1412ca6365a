"""Tests for experiments.metrics."""
from __future__ import annotations

import numpy as np
import pytest

from repro.experiments import metrics as M


class TestRmse:
    def test_zero_for_exact(self):
        assert M.rmse(np.full(10, 3.0), 3.0) == 0.0

    def test_constant_offset(self):
        assert M.rmse(np.full(10, 4.0), 3.0) == pytest.approx(1.0)

    def test_matches_formula(self):
        e = np.array([1.0, 2.0, 3.0])
        assert M.rmse(e, 2.0) == pytest.approx(np.sqrt(2 / 3))


class TestQError:
    def test_zero_when_exact(self):
        assert M.normalized_qerror(np.full(5, 2.0), 2.0) == 0.0

    def test_symmetric(self):
        over = M.normalized_qerror(np.array([4.0]), 2.0)
        under = M.normalized_qerror(np.array([1.0]), 2.0)
        assert over == pytest.approx(under) == pytest.approx(100.0)

    def test_zero_estimate_clipped_to_worst(self):
        q = M.normalized_qerror(np.array([0.0, 4.0]), 2.0)
        assert q == pytest.approx(100.0)  # both trials at q=2

    def test_zero_truth(self):
        assert M.normalized_qerror(np.array([1.0]), 0.0) == 0.0


class TestRelativeError:
    def test_percent(self):
        assert M.relative_error(np.array([1.1, 0.9]), 1.0) == pytest.approx(10.0)

    def test_zero_truth(self):
        assert M.relative_error(np.array([1.0]), 0.0) == 0.0


class TestCImetrics:
    def test_width(self):
        assert M.ci_width(np.array([0.0, 1.0]), np.array([2.0, 2.0])) == pytest.approx(1.5)

    def test_coverage(self):
        lo = np.array([0.0, 1.5, -1.0])
        hi = np.array([2.0, 2.0, 0.5])
        assert M.ci_coverage(lo, hi, 1.0) == pytest.approx(1 / 3)

    def test_full_coverage(self):
        assert M.ci_coverage(np.zeros(5), np.ones(5), 0.5) == 1.0


class TestMaxGroupRmse:
    def test_picks_worst_group(self):
        est = np.array([[1.0, 5.0], [1.0, 5.0]])
        truths = np.array([1.0, 4.0])
        assert M.max_group_rmse(est, truths) == pytest.approx(1.0)

    def test_single_trial(self):
        assert M.max_group_rmse(np.array([[2.0, 3.0]]), np.array([2.0, 2.0])) == 1.0
