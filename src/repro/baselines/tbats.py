"""TBATS (simplified) — trigonometric-seasonality exponential smoothing.

The reference TBATS [29] is a Box-Cox + ARMA-error + trigonometric-seasonal
state-space model fit by full likelihood optimization. The simplification
here (documented in DESIGN.md) keeps the parts the paper's comparison
exercises: an additive state-space pass with level, trend and rotating
Fourier-harmonic seasonal states per period, smoothing parameters picked by
a small grid search over one-step-ahead SSE. Per the paper §7.1, the
reported "trend" is level + trend.
"""
from __future__ import annotations

import itertools

import numpy as np

from repro.core.online_stl import Decomposition


def _harmonic_count(m: int) -> int:
    return int(min(max(1, m // 2), 6))


def _init_seasonal_states(y: np.ndarray, m: int, J: int) -> tuple[np.ndarray, np.ndarray]:
    """Seed harmonic states from the Fourier coefficients of early cycles."""
    k = max(1, (y.size // m)) * m
    seg = y[:k] - y[:k].mean()
    prof = seg[:k].reshape(-1, m).mean(axis=0)
    f = np.fft.rfft(prof) / m
    s = np.zeros(J)
    s_star = np.zeros(J)
    for j in range(1, J + 1):
        if j < len(f):
            s[j - 1] = 2.0 * f[j].real
            s_star[j - 1] = -2.0 * f[j].imag
    return s, s_star


def _run(
    y: np.ndarray,
    ms: list[int],
    alpha: float,
    beta: float,
    gamma: float,
) -> tuple[np.ndarray, list[np.ndarray], np.ndarray, float]:
    """One filtering pass; returns (trend, seasonal components, residual, SSE)."""
    n = y.size
    level = float(np.mean(y[: max(ms)]))
    slope = 0.0
    Js = [_harmonic_count(m) for m in ms]
    lams = [2.0 * np.pi * np.arange(1, J + 1) / m for m, J in zip(ms, Js)]
    states = [list(_init_seasonal_states(y, m, J)) for m, J in zip(ms, Js)]
    trend_out = np.empty(n)
    seas_out = [np.empty(n) for _ in ms]
    resid = np.empty(n)
    sse = 0.0
    for t in range(n):
        seas_now = [float(st[0].sum()) for st in states]
        yhat = level + slope + sum(seas_now)
        e = y[t] - yhat
        sse += e * e
        level = level + slope + alpha * e
        slope = slope + beta * e
        for (st, lam) in zip(states, lams):
            s, s_star = st
            c, sn = np.cos(lam), np.sin(lam)
            s_new = s * c + s_star * sn + gamma * e
            s_star_new = -s * sn + s_star * c + gamma * e
            st[0], st[1] = s_new, s_star_new
        trend_out[t] = level + slope  # paper: trend := level + trend
        for i, sv in enumerate(seas_now):
            seas_out[i][t] = sv
        resid[t] = y[t] - trend_out[t] - sum(seas_now)
    return trend_out, seas_out, resid, sse


def tbats(
    values: np.ndarray,
    periods: list[int],
    *,
    alphas: tuple[float, ...] = (0.05, 0.2, 0.5),
    betas: tuple[float, ...] = (0.01, 0.1),
    gammas: tuple[float, ...] = (0.01, 0.1),
) -> Decomposition:
    """Grid-searched simplified TBATS decomposition."""
    y = np.asarray(values, dtype=np.float64)
    ms = [int(p) for p in periods]
    best = None
    for a, b, g in itertools.product(alphas, betas, gammas):
        trend, seas, resid, sse = _run(y, ms, a, b, g)
        if best is None or sse < best[3]:
            best = (trend, seas, resid, sse)
    assert best is not None
    return Decomposition(trend=best[0], seasonal=best[1], residual=best[2])
