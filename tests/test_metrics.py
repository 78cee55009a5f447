"""Unit tests for the evaluation metrics (repro.eval.metrics)."""
import math

import numpy as np
import pytest

from repro.eval import metrics


class TestAape:
    def test_perfect(self):
        assert metrics.aape([10, 20], [10, 20]) == 0.0

    def test_known_value(self):
        # |10-5|/10 = .5, |20-30|/20 = .5 → mean .5
        assert metrics.aape([10, 20], [5, 30]) == pytest.approx(0.5)

    def test_zero_truth_excluded(self):
        assert metrics.aape([0, 10], [99, 10]) == 0.0

    def test_all_zero_truth_nan(self):
        assert math.isnan(metrics.aape([0, 0], [1, 2]))

    def test_asymmetric_overshoot(self):
        assert metrics.aape([10], [30]) == pytest.approx(2.0)

    def test_numpy_input(self):
        assert metrics.aape(np.array([4.0]), np.array([2.0])) == pytest.approx(0.5)


class TestArmse:
    def test_perfect(self):
        assert metrics.armse([0.2, 0.8], [0.2, 0.8]) == 0.0

    def test_known_value(self):
        # errors .1 and .3 → sqrt((.01+.09)/2)
        assert metrics.armse([0.5, 0.5], [0.6, 0.2]) == pytest.approx(
            math.sqrt(0.05)
        )

    def test_empty_nan(self):
        assert math.isnan(metrics.armse([], []))

    def test_scale_invariance_of_sign(self):
        assert metrics.armse([0.5], [0.4]) == metrics.armse([0.5], [0.6])

    def test_bounded_by_max_error(self):
        assert metrics.armse([0.0, 1.0], [1.0, 0.0]) == pytest.approx(1.0)
