"""RobustSTL / Fast-RobustSTL (simplified) — paper baselines [40, 41].

The reference RobustSTL is (1) bilateral-filter denoising, (2) trend
extraction by least-absolute-deviation regression with sparse (ℓ1)
difference regularization, (3) non-local seasonal filtering, (4) residual.
This reimplementation keeps that pipeline with the ℓ1 trend program solved
by IRLS over conjugate gradient (no scipy/convex solver in the container);
DESIGN.md records the substitution. Fast-RobustSTL extends to multiple
seasonalities by applying the pipeline per period on the progressively
deseasonalized series, as in [41].
"""
from __future__ import annotations

import numpy as np

from repro.core.online_stl import Decomposition
from repro.linalg import (
    conjugate_gradient,
    first_difference,
    first_difference_t,
    second_difference,
    second_difference_t,
)


def bilateral_denoise(y: np.ndarray, *, half: int = 3, sigma_d: float = 2.0,
                      sigma_i: float | None = None) -> np.ndarray:
    """Bilateral filter: average neighbours close in time *and* in value."""
    y = np.asarray(y, dtype=np.float64)
    n = y.size
    if sigma_i is None:
        sigma_i = float(np.std(y)) or 1.0
    out = np.empty(n)
    offs = np.arange(-half, half + 1)
    wd = np.exp(-(offs**2) / (2 * sigma_d**2))
    for t in range(n):
        lo, hi = max(0, t - half), min(n, t + half + 1)
        seg = y[lo:hi]
        w = wd[lo - t + half : hi - t + half] * np.exp(
            -((seg - y[t]) ** 2) / (2 * sigma_i**2)
        )
        out[t] = float(w @ seg) / float(w.sum())
    return out


def l1_trend(y: np.ndarray, *, lam1: float, lam2: float, iters: int = 8,
             eps: float = 1e-6) -> np.ndarray:
    """LAD trend with sparse regularization:
    min |y−T|_1 + λ1 |D1 T|_1 + λ2 |D2 T|_1.

    IRLS: each ℓ1 term |d| is majorized by d²/(2(|d̂|+ε)) at the current
    iterate, giving a weighted-ridge system solved matrix-free by CG. The
    LAD fidelity keeps spike outliers out of the trend (RobustSTL's
    robustness claim); the ℓ1-on-differences penalties let the trend jump
    at changepoints while staying flat elsewhere.
    """
    y = np.asarray(y, dtype=np.float64)
    n = y.size
    T = y.copy()
    # Fidelity IRLS weights are capped relative to the residual scale so a
    # single exactly-interpolated point cannot acquire unbounded weight.
    scale = float(np.median(np.abs(y - np.median(y)))) + eps
    for _ in range(iters):
        w0 = 1.0 / np.maximum(np.abs(y - T), 0.1 * scale)
        w1 = 1.0 / (np.abs(first_difference(T)) + eps)
        w2 = 1.0 / (np.abs(second_difference(T)) + eps)

        def matvec(v: np.ndarray) -> np.ndarray:
            out = w0 * v
            out += lam1 * first_difference_t(w1 * first_difference(v), n)
            out += lam2 * second_difference_t(w2 * second_difference(v), n)
            return out

        T = conjugate_gradient(matvec, w0 * y, x0=T, tol=1e-8, maxiter=4 * n)
    return T


def nonlocal_seasonal(detrended: np.ndarray, period: int, *, cycles: int = 3,
                      half: int = 1, sigma_i: float | None = None) -> np.ndarray:
    """Non-local seasonal filter: weighted mean of same-phase neighbours in
    the previous/following ``cycles`` cycles, ±``half`` positions, with
    Gaussian weights on value distance (robust to residual outliers)."""
    d = np.asarray(detrended, dtype=np.float64)
    n = d.size
    if sigma_i is None:
        sigma_i = float(np.std(d)) or 1.0
    out = np.empty(n)
    for t in range(n):
        vals = []
        for c in range(-cycles, cycles + 1):
            base = t + c * period
            for h in range(-half, half + 1):
                j = base + h
                if 0 <= j < n:
                    vals.append(d[j])
        vals_arr = np.array(vals)
        w = np.exp(-((vals_arr - d[t]) ** 2) / (2 * sigma_i**2))
        out[t] = float(w @ vals_arr) / float(w.sum())
    return out


def _single_period(y: np.ndarray, m: int) -> tuple[np.ndarray, np.ndarray]:
    """One RobustSTL pass → (trend, seasonal) for period ``m``."""
    x = bilateral_denoise(y)
    # Rough seasonal (cyclic-subseries median of MA-detrended series) so the
    # trend program does not have to explain the oscillation.
    ma = np.convolve(x, np.ones(m) / m, mode="same")
    rough = x - ma
    prof = np.array([np.median(rough[r::m]) for r in range(m)])
    prof -= prof.mean()
    seas0 = prof[np.arange(x.size) % m]
    T = l1_trend(x - seas0, lam1=1.0, lam2=float(m))
    S = nonlocal_seasonal(x - T, m)
    S = S - S.mean()
    return T, S


def robust_stl(values: np.ndarray, periods: list[int], **kw) -> Decomposition:
    """RobustSTL (single period) / Fast-RobustSTL (multiple periods)."""
    y = np.asarray(values, dtype=np.float64)
    work = y.copy()
    seasonal: list[np.ndarray] = []
    trend = np.zeros(y.size)
    # Fast-RobustSTL: peel seasonalities longest-first, re-estimating the
    # trend on each progressively deseasonalized series.
    desc = sorted(range(len(periods)), key=lambda i: -periods[i])
    by_orig: dict[int, np.ndarray] = {}
    for i in desc:
        T, S = _single_period(work, int(periods[i]))
        trend = T
        by_orig[i] = S
        work = work - S
    seasonal = [by_orig[i] for i in range(len(periods))]
    residual = y - trend - sum(seasonal)
    return Decomposition(trend=trend, seasonal=seasonal, residual=residual)
