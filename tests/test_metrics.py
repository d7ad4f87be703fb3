"""Tests for the decomposition-quality metrics (paper §7.3)."""
import numpy as np
import pytest

from repro.metrics import (
    log_trend_smoothness,
    mae,
    mase_residual,
    mase_vs_true,
    seasonal_naive_scale,
    trend_smoothness,
)


class TestSeasonalNaiveScale:
    def test_hand_computed(self):
        y = np.array([1.0, 2.0, 3.0, 4.0, 5.0, 6.0])
        # period 2: |3-1|,|4-2|,|5-3|,|6-4| -> mean = 2
        assert seasonal_naive_scale(y, 2) == pytest.approx(2.0)

    def test_periodic_series_scale_zero_guard(self):
        """An exactly m-periodic series has zero naive error; the guard
        returns 1.0 so MASE stays finite."""
        y = np.tile([1.0, 5.0, 2.0], 10)
        assert seasonal_naive_scale(y, 3) == 1.0

    def test_too_short_raises(self):
        with pytest.raises(ValueError):
            seasonal_naive_scale(np.ones(5), 5)


class TestMase:
    def test_zero_residual(self):
        y = np.array([1.0, 3.0, 2.0, 6.0, 4.0, 8.0])
        assert mase_residual(y, np.zeros(6), 2) == 0.0

    def test_hand_computed(self):
        y = np.array([1.0, 2.0, 3.0, 4.0])
        r = np.array([1.0, -1.0, 1.0, -1.0])
        # scale (m=1): mean|diff| = 1; mean|r| = 1 -> MASE = 1
        assert mase_residual(y, r, 1) == pytest.approx(1.0)

    def test_scale_invariance(self):
        rng = np.random.default_rng(0)
        y = rng.normal(size=50) + np.sin(np.arange(50))
        r = rng.normal(size=50) * 0.1
        a = mase_residual(y, r, 7)
        b = mase_residual(y * 100, r * 100, 7)
        assert a == pytest.approx(b)

    def test_nan_tolerant(self):
        y = np.arange(20, dtype=float)
        r = np.zeros(20)
        r[15:] = np.nan
        assert np.isfinite(mase_residual(y, r, 3))

    def test_mase_vs_true_zero_when_exact(self):
        y = np.arange(30, dtype=float)
        est = np.sin(np.arange(30))
        assert mase_vs_true(est, est.copy(), y, 5) == 0.0

    def test_mase_vs_true_hand_computed(self):
        y = np.arange(10, dtype=float)  # scale m=1 -> 1.0
        est = np.zeros(10)
        truth = np.full(10, 2.0)
        assert mase_vs_true(est, truth, y, 1) == pytest.approx(2.0)


class TestTrendSmoothness:
    def test_constant_trend_zero(self):
        assert trend_smoothness(np.full(20, 3.0)) == 0.0

    def test_line_zero(self):
        """std of first difference of a line is 0 — linear trends are
        maximally smooth under this metric."""
        assert trend_smoothness(1.0 + 2.0 * np.arange(15)) == pytest.approx(0.0)

    def test_hand_computed(self):
        t = np.array([0.0, 1.0, 0.0, 1.0])
        # diffs: 1, -1, 1 -> std = sqrt(mean(d^2) - mean(d)^2)
        d = np.diff(t)
        assert trend_smoothness(t) == pytest.approx(float(np.std(d)))

    def test_noisier_trend_less_smooth(self):
        rng = np.random.default_rng(1)
        smooth = np.sin(np.arange(100) / 30)
        rough = smooth + rng.normal(0, 0.5, 100)
        assert trend_smoothness(rough) > trend_smoothness(smooth)

    def test_log_version_monotone(self):
        a = np.sin(np.arange(100) / 30)
        b = a + np.random.default_rng(2).normal(0, 0.5, 100)
        assert log_trend_smoothness(b) > log_trend_smoothness(a)

    def test_short_input(self):
        assert trend_smoothness(np.array([1.0])) == 0.0

    def test_nan_tolerant(self):
        t = np.concatenate([np.arange(10, dtype=float), [np.nan]])
        assert trend_smoothness(t) == pytest.approx(0.0)


class TestMAE:
    def test_identical_zero(self):
        a = np.arange(5, dtype=float)
        assert mae(a, a.copy()) == 0.0

    def test_hand_computed(self):
        assert mae(np.array([1.0, 2.0]), np.array([2.0, 4.0])) == pytest.approx(1.5)

    def test_nan_pairs_skipped(self):
        a = np.array([1.0, np.nan, 3.0])
        b = np.array([2.0, 5.0, np.nan])
        assert mae(a, b) == pytest.approx(1.0)
