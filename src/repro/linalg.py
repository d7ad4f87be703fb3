"""Minimal sparse linear-algebra substrate (scipy is not installed here).

STR and RobustSTL pose penalized least-squares problems whose normal
equations are sparse (banded difference operators + small seasonal
blocks). We solve them with conjugate gradient over *matvec closures*,
so no dense matrix is ever materialized for the trend block.
"""
from __future__ import annotations

from typing import Callable

import numpy as np

MatVec = Callable[[np.ndarray], np.ndarray]


def conjugate_gradient(
    matvec: MatVec,
    b: np.ndarray,
    *,
    x0: np.ndarray | None = None,
    tol: float = 1e-10,
    maxiter: int | None = None,
) -> np.ndarray:
    """Solve ``A x = b`` for symmetric positive-definite ``A`` given as a matvec.

    Standard CG with the relative-residual stopping rule
    ``||r|| <= tol * ||b||``. ``maxiter`` defaults to ``10 * len(b)`` which is
    far beyond what the well-conditioned penalized systems here need.
    """
    b = np.asarray(b, dtype=np.float64)
    n = b.size
    x = np.zeros(n) if x0 is None else np.asarray(x0, dtype=np.float64).copy()
    r = b - matvec(x)
    p = r.copy()
    rs = float(r @ r)
    b_norm = float(np.linalg.norm(b)) or 1.0
    if maxiter is None:
        maxiter = 10 * n
    for _ in range(maxiter):
        if np.sqrt(rs) <= tol * b_norm:
            break
        Ap = matvec(p)
        denom = float(p @ Ap)
        if denom <= 0:  # lost positive-definiteness numerically
            break
        alpha = rs / denom
        x += alpha * p
        r -= alpha * Ap
        rs_new = float(r @ r)
        p = r + (rs_new / rs) * p
        rs = rs_new
    return x


def second_difference(x: np.ndarray) -> np.ndarray:
    """``D2 @ x`` where D2 is the (n-2) x n second-difference operator."""
    return x[2:] - 2.0 * x[1:-1] + x[:-2]


def second_difference_t(y: np.ndarray, n: int) -> np.ndarray:
    """``D2.T @ y`` for the (n-2) x n second-difference operator."""
    out = np.zeros(n)
    out[2:] += y
    out[1:-1] -= 2.0 * y
    out[:-2] += y
    return out


def first_difference(x: np.ndarray) -> np.ndarray:
    """``D1 @ x`` where D1 is the (n-1) x n first-difference operator."""
    return np.diff(x)


def first_difference_t(y: np.ndarray, n: int) -> np.ndarray:
    """``D1.T @ y`` for the (n-1) x n first-difference operator."""
    out = np.zeros(n)
    out[1:] += y
    out[:-1] -= y
    return out
