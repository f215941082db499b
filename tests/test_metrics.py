"""Tests for metrics (misclassification, MSE, expected shortfall)."""
import numpy as np
import pytest

from repro.ml.metrics import (
    expected_shortfall,
    mean_squared_error,
    misclassification_rate,
)


class TestMisclassification:
    def test_all_correct(self):
        assert misclassification_rate([1, 2, 3], [1, 2, 3]) == 0.0

    def test_all_wrong(self):
        assert misclassification_rate([1, 2], [2, 1]) == 100.0

    def test_half(self):
        assert misclassification_rate([1, 1, 2, 2], [1, 1, 1, 1]) == 50.0

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            misclassification_rate(np.array([]), np.array([]))

    def test_shape_mismatch_raises(self):
        with pytest.raises(ValueError):
            misclassification_rate([1, 2], [1])


class TestMSE:
    def test_zero(self):
        assert mean_squared_error([1.0, 2.0], [1.0, 2.0]) == 0.0

    def test_value(self):
        assert mean_squared_error([0.0, 0.0], [1.0, 3.0]) == 5.0

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            mean_squared_error([], [])


class TestExpectedShortfall:
    def test_worst_ten_percent(self):
        vals = list(range(1, 101))  # 1..100
        # worst 10% = {91..100}, mean 95.5
        assert expected_shortfall(vals, 0.10) == 95.5

    def test_single_worst(self):
        assert expected_shortfall([1, 2, 9], 0.10) == 9.0

    def test_full_fraction_is_mean(self):
        assert expected_shortfall([1.0, 2.0, 3.0], 1.0) == 2.0

    def test_es_at_least_mean(self):
        rng = np.random.default_rng(0)
        vals = rng.random(200)
        assert expected_shortfall(vals, 0.2) >= float(np.mean(vals))

    @pytest.mark.parametrize("z", [0.0, -0.1, 1.5])
    def test_bad_z_raises(self, z):
        with pytest.raises(ValueError):
            expected_shortfall([1.0], z)

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            expected_shortfall([], 0.1)
