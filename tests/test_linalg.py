"""Tests for the scipy-replacement linear-algebra substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.linalg import (
    conjugate_gradient,
    first_difference,
    first_difference_t,
    second_difference,
    second_difference_t,
)


def _d1_matrix(n):
    D = np.zeros((n - 1, n))
    for i in range(n - 1):
        D[i, i], D[i, i + 1] = -1.0, 1.0
    return D


def _d2_matrix(n):
    D = np.zeros((n - 2, n))
    for i in range(n - 2):
        D[i, i], D[i, i + 1], D[i, i + 2] = 1.0, -2.0, 1.0
    return D


class TestDifferenceOperators:
    @pytest.mark.parametrize("n", [3, 5, 17, 64])
    def test_first_difference_matches_matrix(self, n):
        rng = np.random.default_rng(n)
        x = rng.normal(size=n)
        np.testing.assert_allclose(first_difference(x), _d1_matrix(n) @ x)

    @pytest.mark.parametrize("n", [3, 5, 17, 64])
    def test_second_difference_matches_matrix(self, n):
        rng = np.random.default_rng(n)
        x = rng.normal(size=n)
        np.testing.assert_allclose(second_difference(x), _d2_matrix(n) @ x)

    @pytest.mark.parametrize("n", [4, 9, 33])
    def test_first_difference_transpose_matches_matrix(self, n):
        rng = np.random.default_rng(n)
        y = rng.normal(size=n - 1)
        np.testing.assert_allclose(
            first_difference_t(y, n), _d1_matrix(n).T @ y
        )

    @pytest.mark.parametrize("n", [4, 9, 33])
    def test_second_difference_transpose_matches_matrix(self, n):
        rng = np.random.default_rng(n)
        y = rng.normal(size=n - 2)
        np.testing.assert_allclose(
            second_difference_t(y, n), _d2_matrix(n).T @ y
        )

    @pytest.mark.parametrize("n", [5, 20])
    def test_adjoint_identity(self, n):
        """<D x, y> == <x, D^T y> — the property CG correctness rests on."""
        rng = np.random.default_rng(n + 1)
        x = rng.normal(size=n)
        y = rng.normal(size=n - 2)
        lhs = float(second_difference(x) @ y)
        rhs = float(x @ second_difference_t(y, n))
        assert lhs == pytest.approx(rhs)

    def test_second_difference_kills_lines(self):
        x = 3.0 + 2.0 * np.arange(10)
        np.testing.assert_allclose(second_difference(x), 0.0, atol=1e-12)


class TestConjugateGradient:
    @pytest.mark.parametrize("n", [2, 5, 20, 80])
    def test_matches_dense_solve(self, n):
        rng = np.random.default_rng(n)
        M = rng.normal(size=(n, n))
        A = M @ M.T + n * np.eye(n)  # SPD, well conditioned
        b = rng.normal(size=n)
        x = conjugate_gradient(lambda v: A @ v, b)
        np.testing.assert_allclose(x, np.linalg.solve(A, b), atol=1e-6)

    def test_identity_system(self):
        b = np.array([1.0, -2.0, 3.0])
        np.testing.assert_allclose(conjugate_gradient(lambda v: v, b), b)

    def test_warm_start_converges(self):
        rng = np.random.default_rng(9)
        A = np.diag(rng.uniform(1, 3, 30))
        b = rng.normal(size=30)
        exact = b / np.diag(A)
        x = conjugate_gradient(lambda v: A @ v, b, x0=exact + 1e-3)
        np.testing.assert_allclose(x, exact, atol=1e-8)

    def test_maxiter_respected(self):
        """With 0 iterations the initial guess is returned unchanged."""
        b = np.ones(4)
        x = conjugate_gradient(lambda v: 2 * v, b, maxiter=0)
        np.testing.assert_allclose(x, np.zeros(4))

    @given(st.integers(min_value=2, max_value=25))
    @settings(max_examples=20, deadline=None)
    def test_penalized_smoothing_system(self, n):
        """The exact system shape STR/RobustSTL solve: I + λ D2ᵀD2."""
        rng = np.random.default_rng(n)
        y = rng.normal(size=n)
        lam = 5.0
        D = _d2_matrix(n) if n > 2 else np.zeros((0, n))
        A = np.eye(n) + lam * D.T @ D

        def mv(v):
            out = v.copy()
            if n > 2:
                out += lam * second_difference_t(second_difference(v), n)
            return out

        np.testing.assert_allclose(
            conjugate_gradient(mv, y), np.linalg.solve(A, y), atol=1e-6
        )
