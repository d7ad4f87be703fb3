"""Tests for the sliding-window online counterpart construction (§7.1)."""
import numpy as np
import pytest

from repro.baselines import online_counterpart, online_update_times
from repro.baselines.stl import stl
from repro.core.online_stl import Decomposition


def _series(n=220, period=12, seed=0):
    rng = np.random.default_rng(seed)
    t = np.arange(n, dtype=float)
    return 2.0 + 0.01 * t + np.sin(2 * np.pi * t / period) + rng.normal(0, 0.1, n)


def _counting_decomposer():
    calls = []

    def fn(values, periods):
        calls.append(len(values))
        n = len(values)
        return Decomposition(
            trend=np.asarray(values, dtype=float),
            seasonal=[np.zeros(n) for _ in periods],
            residual=np.zeros(n),
        )

    return fn, calls


class TestOnlineCounterpart:
    def test_window_size_constant(self):
        """Every post-warm-up call sees exactly 4·max(period) points — the
        paper's fair-comparison window."""
        fn, calls = _counting_decomposer()
        y = _series(n=60, period=12)
        online_counterpart(fn, y, [12])
        assert calls[0] == 48  # warm-up batch
        assert all(c == 48 for c in calls[1:])
        assert len(calls) == 1 + (60 - 48)

    def test_last_point_taken(self):
        """The emitted decomposition at t is the window fit's last point."""
        fn, _ = _counting_decomposer()
        y = _series(n=55, period=12)
        d = online_counterpart(fn, y, [12])
        # our fake returns trend = input values, so emitted trend == y
        np.testing.assert_allclose(d.trend, y)

    def test_too_short_raises(self):
        fn, _ = _counting_decomposer()
        with pytest.raises(ValueError):
            online_counterpart(fn, np.ones(10), [12])

    def test_max_points_caps_and_nans_tail(self):
        fn, calls = _counting_decomposer()
        y = _series(n=80, period=12)
        d = online_counterpart(fn, y, [12], max_points=5)
        assert len(calls) == 1 + 5
        assert np.isnan(d.trend[48 + 5 :]).all()
        assert np.isfinite(d.trend[: 48 + 5]).all()

    def test_real_stl_online_runs(self):
        y = _series(n=200, period=12, seed=3)
        d = online_counterpart(stl, y, [12])
        assert np.isfinite(d.trend).all()
        np.testing.assert_allclose(
            y, d.trend + sum(d.seasonal) + d.residual, atol=1e-8
        )

    def test_multi_period_window(self):
        fn, calls = _counting_decomposer()
        y = _series(n=4 * 20 + 6)
        online_counterpart(fn, y, [5, 20])
        assert calls[0] == 80


class TestOnlineUpdateTimes:
    def test_count_and_positivity(self):
        y = _series(n=200, period=12)
        times = online_update_times(stl, y, [12], n_updates=3)
        assert len(times) == 3
        assert all(t > 0 for t in times)

    def test_too_short_raises(self):
        with pytest.raises(ValueError):
            online_update_times(stl, np.ones(50), [12], n_updates=10)
