"""Tests for the batch baseline decomposers (paper §7.1).

Every baseline must satisfy the same contract: the additive identity holds
exactly, shapes line up, and planted trend + seasonal components are
recovered to a tolerance appropriate for each method (these are
simplified reimplementations — see DESIGN.md — so recovery bars are
method-specific but all well above chance).
"""
import numpy as np
import pytest

from repro.baselines import REGISTRY, mstl, robust_stl, ssa, stl, str_decompose, tbats
from repro.baselines.robust_stl import bilateral_denoise, l1_trend, nonlocal_seasonal
from repro.baselines.stl import stl_decompose

ALGOS = sorted(REGISTRY)


def _planted(n=300, period=12, amp=2.0, slope=0.02, noise=0.2, seed=0):
    rng = np.random.default_rng(seed)
    t = np.arange(n, dtype=float)
    trend = 5.0 + slope * t
    seasonal = amp * np.sin(2 * np.pi * t / period)
    return trend + seasonal + rng.normal(0, noise, n), trend, seasonal


class TestContract:
    """Contract shared by every baseline in the registry."""

    @pytest.mark.parametrize("name", ALGOS)
    def test_additive_identity(self, name):
        y, _, _ = _planted()
        d = REGISTRY[name](y, [12])
        np.testing.assert_allclose(
            y, d.trend + sum(d.seasonal) + d.residual, atol=1e-8
        )

    @pytest.mark.parametrize("name", ALGOS)
    def test_shapes(self, name):
        y, _, _ = _planted(n=200)
        d = REGISTRY[name](y, [12])
        assert d.trend.shape == (200,)
        assert len(d.seasonal) == 1
        assert d.seasonal[0].shape == (200,)
        assert d.residual.shape == (200,)

    @pytest.mark.parametrize("name", ALGOS)
    def test_seasonal_correlates_with_planted(self, name):
        y, _, seasonal = _planted(noise=0.1, seed=1)
        d = REGISTRY[name](y, [12])
        corr = np.corrcoef(d.seasonal[0][24:], seasonal[24:])[0, 1]
        assert corr > 0.8, f"{name}: corr={corr:.3f}"

    @pytest.mark.parametrize("name", ALGOS)
    def test_trend_correlates_with_planted(self, name):
        y, trend, _ = _planted(noise=0.1, seed=2)
        d = REGISTRY[name](y, [12])
        corr = np.corrcoef(d.trend[24:], trend[24:])[0, 1]
        assert corr > 0.9, f"{name}: corr={corr:.3f}"

    @pytest.mark.parametrize("name", ALGOS)
    def test_multi_seasonality(self, name):
        rng = np.random.default_rng(3)
        n = 400
        t = np.arange(n, dtype=float)
        s1 = 1.5 * np.sin(2 * np.pi * t / 10)
        s2 = 0.8 * np.sin(2 * np.pi * t / 35)
        y = 3.0 + s1 + s2 + rng.normal(0, 0.1, n)
        d = REGISTRY[name](y, [10, 35])
        assert len(d.seasonal) == 2
        combined = sum(d.seasonal)
        assert np.corrcoef(combined[70:], (s1 + s2)[70:])[0, 1] > 0.8


class TestSTL:
    def test_too_short_raises(self):
        with pytest.raises(ValueError):
            stl_decompose(np.ones(10), 12)

    def test_noiseless_sine_recovery(self):
        y, trend, seasonal = _planted(noise=0.0)
        d = stl_decompose(y, 12)
        assert np.abs(d.seasonal[0][24:-24] - seasonal[24:-24]).mean() < 0.1
        assert np.abs(d.trend[24:-24] - trend[24:-24]).mean() < 0.1

    def test_residual_small_on_clean_data(self):
        y, _, _ = _planted(noise=0.0)
        d = stl_decompose(y, 12)
        assert np.abs(d.residual[24:-24]).mean() < 0.1

    def test_dispatches_to_mstl_for_multiple_periods(self):
        y, _, _ = _planted(n=300)
        d = stl(y, [6, 12])
        assert len(d.seasonal) == 2

    def test_outer_robustness_iterations_run(self):
        y, _, _ = _planted()
        y[50] += 30.0  # gross outlier
        d = stl_decompose(y, 12, outer_iters=1)
        assert np.isfinite(d.trend).all()


class TestMSTL:
    def test_component_count(self):
        y, _, _ = _planted(n=300)
        assert len(mstl(y, [6, 12]).seasonal) == 2

    def test_identity(self):
        y, _, _ = _planted(n=250)
        d = mstl(y, [6, 25])
        np.testing.assert_allclose(y, d.trend + sum(d.seasonal) + d.residual, atol=1e-8)

    def test_single_period_close_to_stl(self):
        y, _, _ = _planted()
        a = mstl(y, [12])
        b = stl_decompose(y, 12)
        assert np.corrcoef(a.seasonal[0], b.seasonal[0])[0, 1] > 0.99


class TestSSA:
    def test_pure_trend_in_trend_component(self):
        t = np.arange(200, dtype=float)
        y = 1.0 + 0.05 * t
        d = ssa(y, [12])
        assert np.abs(d.trend[20:-20] - y[20:-20]).mean() < 0.5

    def test_pure_sine_in_seasonal_component(self):
        t = np.arange(240, dtype=float)
        s = np.sin(2 * np.pi * t / 12)
        d = ssa(s, [12])
        assert np.corrcoef(d.seasonal[0][24:-24], s[24:-24])[0, 1] > 0.95

    def test_window_override(self):
        y, _, _ = _planted()
        d = ssa(y, [12], window=48)
        assert d.trend.shape == y.shape


class TestSTR:
    def test_seasonal_profile_periodic(self):
        """STR fits a periodic profile, so its seasonal output is exactly
        m-periodic by construction."""
        y, _, _ = _planted()
        d = str_decompose(y, [12])
        s = d.seasonal[0]
        np.testing.assert_allclose(s[:-12], s[12:], atol=1e-8)

    def test_seasonal_profile_near_zero_mean(self):
        y, _, _ = _planted()
        d = str_decompose(y, [12])
        assert abs(d.seasonal[0][:12].sum()) < 0.1

    def test_trend_is_smooth(self):
        y, _, _ = _planted(noise=0.3, seed=5)
        d = str_decompose(y, [12])
        assert np.std(np.diff(d.trend)) < np.std(np.diff(y)) / 5


class TestTBATS:
    def test_trend_is_level_plus_slope(self):
        """Paper §7.1: TBATS 'trend' = level + trend; on a flat noiseless
        series with no seasonality amplitude it tracks the mean."""
        y = np.full(100, 7.0)
        d = tbats(y, [10])
        assert np.abs(d.trend[20:] - 7.0).max() < 0.5

    def test_identity(self):
        y, _, _ = _planted()
        d = tbats(y, [12])
        np.testing.assert_allclose(y, d.trend + sum(d.seasonal) + d.residual, atol=1e-8)


class TestRobustSTLPieces:
    def test_bilateral_reduces_noise(self):
        rng = np.random.default_rng(4)
        clean = np.sin(np.arange(300) / 20)
        noisy = clean + rng.normal(0, 0.3, 300)
        den = bilateral_denoise(noisy)
        assert np.abs(den - clean).mean() < np.abs(noisy - clean).mean()

    def test_bilateral_preserves_jump(self):
        """Value-distance weighting must not smear a level shift the way a
        plain Gaussian blur would."""
        y = np.concatenate([np.zeros(50), np.full(50, 10.0)])
        den = bilateral_denoise(y, sigma_i=1.0)
        assert abs(den[49] - 0.0) < 0.5
        assert abs(den[50] - 10.0) < 0.5

    def test_l1_trend_piecewise_linear(self):
        """ℓ1-on-differences trend filtering recovers a kinked line."""
        t = np.arange(200, dtype=float)
        y = np.where(t < 100, 0.1 * t, 10.0 - 0.05 * (t - 100))
        rng = np.random.default_rng(5)
        T = l1_trend(y + rng.normal(0, 0.2, 200), lam1=1.0, lam2=10.0)
        assert np.abs(T - y).mean() < 0.3

    def test_nonlocal_seasonal_periodicity(self):
        t = np.arange(144, dtype=float)
        s = np.sin(2 * np.pi * t / 12)
        out = nonlocal_seasonal(s, 12)
        assert np.corrcoef(out, s)[0, 1] > 0.95

    def test_robustness_to_outliers(self):
        """RobustSTL's selling point: a spike should not drag the trend."""
        y, trend, _ = _planted(noise=0.1, seed=6)
        y_spiked = y.copy()
        y_spiked[150] += 25.0
        d = robust_stl(y_spiked, [12])
        assert abs(d.trend[150] - trend[150]) < 3.0
