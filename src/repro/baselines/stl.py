"""Classical STL (Cleveland et al., 1990) — from scratch on numpy loess.

The baseline the paper calls "offline stl": the inner loop of
detrend → cyclic-subseries loess → low-pass filter → seasonal → trend loess.
Robustness (outer) iterations are supported but default to 0, matching the
standard configuration used in throughput comparisons.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.loess import loess_at, loess_smooth, moving_average
from repro.core.online_stl import Decomposition


def _next_odd(x: float) -> int:
    n = int(np.ceil(x))
    return n if n % 2 == 1 else n + 1


def stl_decompose(
    values: np.ndarray,
    period: int,
    *,
    seasonal_span: int = 7,
    trend_span: int | None = None,
    inner_iters: int = 2,
    outer_iters: int = 0,
) -> Decomposition:
    """Decompose ``values`` with seasonality ``period``.

    Spans follow Cleveland's defaults: ``n_t`` = smallest odd integer
    ≥ 1.5·m / (1 − 1.5/n_s); low-pass span ``n_l`` = smallest odd ≥ m.
    """
    y = np.asarray(values, dtype=np.float64)
    n = y.size
    m = int(period)
    if n < 2 * m:
        raise ValueError(f"need at least 2 periods of data: n={n}, m={m}")
    n_s = seasonal_span
    n_t = trend_span or _next_odd(1.5 * m / (1 - 1.5 / n_s))
    n_l = _next_odd(m)

    trend = np.zeros(n)
    seasonal = np.zeros(n)
    rho = np.ones(n)  # robustness weights (all 1 unless outer_iters > 0)

    for _ in range(max(1, outer_iters + 1)):
        for _ in range(inner_iters):
            # 1. detrend
            detr = y - trend
            # 2. cyclic subseries smoothing, extended one period each side.
            # C covers times -m .. n+m-1 (index = time + m); each phase-k
            # subseries is smoothed and evaluated one cycle beyond both ends.
            C = np.empty(n + 2 * m)
            for k in range(m):
                sub = detr[k::m]
                slots = C[k::m].size  # = len(sub) + 2 (±1 when m ∤ n)
                pos = np.arange(-1, slots - 1, dtype=np.float64)
                C[k::m] = loess_at(sub, min(n_s, max(sub.size, 2)), pos)
            # 3. low-pass: MA(m), MA(m), MA(3), then loess n_l
            L = moving_average(moving_average(moving_average(C, m), m), 3)
            # lengths: (n+2m) - m+1 - m+1 - 3+1 → n; guard for off-by-one
            L = loess_smooth(L[:n], n_l)
            # 4. seasonal
            seasonal = C[m : m + n] - L
            # 5-6. deseasonalize and trend smooth
            trend = loess_smooth(y - seasonal, n_t)
        if outer_iters > 0:
            r = y - trend - seasonal
            h = 6.0 * np.median(np.abs(r)) + 1e-12
            u = np.clip(np.abs(r) / h, 0, 1)
            rho = (1 - u**2) ** 2
            # Robustness weights feed the loess fits in full STL; our loess
            # does not take weights, so we damp outliers directly instead.
            y = trend + seasonal + np.clip(r, -h, h) * rho
    residual = np.asarray(values, dtype=np.float64) - trend - seasonal
    return Decomposition(trend=trend, seasonal=[seasonal], residual=residual)


def stl(values: np.ndarray, periods: list[int], **kw) -> Decomposition:
    """Uniform batch-decomposer signature. Single period only — multi-period
    series go through :func:`repro.baselines.mstl.mstl`."""
    if len(periods) != 1:
        from repro.baselines.mstl import mstl

        return mstl(values, periods, **kw)
    return stl_decompose(values, periods[0], **kw)
