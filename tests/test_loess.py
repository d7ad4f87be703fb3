"""Tests for the loess smoother underlying classical STL."""
import numpy as np
import pytest

from repro.baselines.loess import loess_at, loess_smooth, moving_average


class TestLoessSmooth:
    def test_constant_exact(self):
        y = np.full(30, 4.0)
        np.testing.assert_allclose(loess_smooth(y, 7), y, atol=1e-10)

    @pytest.mark.parametrize("q", [3, 7, 15, 31])
    def test_line_exact(self, q):
        """Degree-1 local regression reproduces straight lines exactly."""
        y = 2.0 + 0.5 * np.arange(40)
        np.testing.assert_allclose(loess_smooth(y, q), y, atol=1e-8)

    def test_smooths_noise(self):
        rng = np.random.default_rng(0)
        y = np.sin(np.arange(200) / 30) + rng.normal(0, 0.5, 200)
        sm = loess_smooth(y, 41)
        assert np.std(np.diff(sm)) < np.std(np.diff(y)) / 4

    def test_length_preserved(self):
        assert loess_smooth(np.ones(13), 5).shape == (13,)

    def test_singleton(self):
        np.testing.assert_allclose(loess_smooth(np.array([3.0]), 5), [3.0])

    def test_empty(self):
        assert loess_smooth(np.array([]), 5).size == 0

    def test_span_larger_than_series(self):
        y = 1.0 + 0.1 * np.arange(10)
        np.testing.assert_allclose(loess_smooth(y, 25), y, atol=1e-8)


class TestLoessAt:
    def test_line_extrapolation(self):
        """STL extends cyclic subseries one step beyond each end; a local
        linear fit must extrapolate lines exactly."""
        y = 1.0 + 2.0 * np.arange(10)
        got = loess_at(y, 5, np.array([-1.0, 10.0]))
        np.testing.assert_allclose(got, [-1.0, 21.0], atol=1e-8)

    def test_interior_matches_smooth(self):
        rng = np.random.default_rng(1)
        y = rng.normal(size=25)
        sm = loess_smooth(y, 9)
        at = loess_at(y, 9, np.arange(25, dtype=float))
        np.testing.assert_allclose(at, sm, atol=1e-10)

    def test_singleton_series(self):
        got = loess_at(np.array([2.0]), 3, np.array([-1.0, 0.0, 1.0]))
        np.testing.assert_allclose(got, [2.0, 2.0, 2.0])


class TestMovingAverage:
    def test_window_one_identity(self):
        y = np.arange(5, dtype=float)
        np.testing.assert_allclose(moving_average(y, 1), y)

    def test_matches_reference(self):
        y = np.array([1.0, 2.0, 3.0, 4.0, 5.0])
        np.testing.assert_allclose(moving_average(y, 3), [2.0, 3.0, 4.0])

    def test_output_length(self):
        y = np.ones(10)
        assert moving_average(y, 4).shape == (7,)

    def test_constant_preserved(self):
        np.testing.assert_allclose(moving_average(np.full(8, 2.5), 3), np.full(6, 2.5))
