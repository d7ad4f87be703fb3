"""STR — Seasonal-Trend decomposition using Regression (paper baseline [18]).

Solves the joint penalized least-squares problem

    min_{T, s_1..s_k}  ||X - T - Σ_p Z_p s_p||²
                       + λ_T ||D2 T||²                (trend smoothness)
                       + Σ_p λ_S ||C2 s_p||²          (circular seasonal smoothness)
                       + Σ_p μ (Σ_r s_p[r])²          (identifiability: sum-to-zero)

where T ∈ R^n is a free trend, s_p ∈ R^{m_p} a periodic seasonal profile and
Z_p the phase-indicator design. The reference STR learns a 2-D time-varying
seasonal surface; the time-invariant profile here is the simplification
documented in DESIGN.md — it keeps the same "one big regularized regression"
structure and its superlinear solve cost, which is what the throughput
experiments exercise. The normal equations are solved matrix-free with
conjugate gradient (scipy is not available).
"""
from __future__ import annotations

import numpy as np

from repro.core.online_stl import Decomposition
from repro.linalg import conjugate_gradient, second_difference, second_difference_t


def _circ_d2(s: np.ndarray) -> np.ndarray:
    """Circular second difference over a seasonal profile."""
    return np.roll(s, -1) - 2.0 * s + np.roll(s, 1)


def str_decompose(
    values: np.ndarray,
    periods: list[int],
    *,
    lambda_trend: float | None = None,
    lambda_seasonal: float = 1.0,
    mu: float | None = None,
    tol: float = 1e-8,
) -> Decomposition:
    """Jointly fit trend + seasonal profiles by regularized regression."""
    y = np.asarray(values, dtype=np.float64)
    n = y.size
    ms = [int(p) for p in periods]
    if lambda_trend is None:
        # HP-filter-style smoothness scaled to the longest period so the
        # trend cannot absorb the seasonal oscillation.
        lambda_trend = float(max(ms)) ** 2
    if mu is None:
        mu = float(n)
    offsets = np.cumsum([n] + [m for m in ms])  # variable block boundaries
    total = offsets[-1]
    phase = [np.arange(n) % m for m in ms]

    def matvec(v: np.ndarray) -> np.ndarray:
        T = v[:n]
        svars = [v[offsets[i] : offsets[i + 1]] for i in range(len(ms))]
        # fitted series
        fit = T.copy()
        for ph, s in zip(phase, svars):
            fit += s[ph]
        out = np.empty_like(v)
        # trend block: Zᵀ(fit) + λ_T D2ᵀD2 T
        out[:n] = fit + lambda_trend * second_difference_t(second_difference(T), n)
        for i, (m, ph, s) in enumerate(zip(ms, phase, svars)):
            # seasonal block: scatter-add of fit over phases + penalties
            blk = np.bincount(ph, weights=fit, minlength=m)
            blk += lambda_seasonal * _circ_d2(_circ_d2(s))
            blk += mu * s.sum()
            out[offsets[i] : offsets[i + 1]] = blk
        return out

    b = np.empty(total)
    b[:n] = y
    for i, (m, ph) in enumerate(zip(ms, phase)):
        b[offsets[i] : offsets[i + 1]] = np.bincount(ph, weights=y, minlength=m)

    v = conjugate_gradient(matvec, b, tol=tol, maxiter=5 * total)
    trend = v[:n]
    seasonal = [
        v[offsets[i] : offsets[i + 1]][phase[i]] for i in range(len(ms))
    ]
    residual = y - trend - sum(seasonal)
    return Decomposition(trend=trend, seasonal=seasonal, residual=residual)
