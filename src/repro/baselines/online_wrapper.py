"""Online counterparts of batch decomposition algorithms (paper §7.1).

"We can easily construct an online counterpart of any algorithm by adding
the newest point in the time series and then applying the batch
decomposition on some past window of points." For fair comparison the paper
uses a sliding window of 4·seasonality — the same window OnlineSTL's
filters use (§7.2). Per arriving point the batch algorithm is re-run on the
window and the last point's decomposition is emitted. This is exactly the
computational pattern whose cost Table 1 / Figure 2 measure.
"""
from __future__ import annotations

from typing import Callable

import numpy as np

from repro.core.online_stl import Decomposition

BatchDecomposer = Callable[..., Decomposition]


def online_counterpart(
    decompose: BatchDecomposer,
    values: np.ndarray,
    periods: list[int],
    *,
    window_mult: int = 4,
    max_points: int | None = None,
    **kw,
) -> Decomposition:
    """Run the sliding-window online version of ``decompose`` over ``values``.

    The first full window is decomposed in one batch call (the "warm-up",
    mirroring OnlineSTL's init); every later point triggers a fresh batch
    decomposition of the trailing window. ``max_points`` caps the number of
    post-warm-up re-runs (used by throughput benchmarks that extrapolate
    from a few points); accuracy experiments leave it None.
    """
    y = np.asarray(values, dtype=np.float64)
    n = y.size
    w = window_mult * max(periods)
    if n < w:
        raise ValueError(f"series length {n} < window {w}")
    trend = np.empty(n)
    seasonal = [np.empty(n) for _ in periods]
    residual = np.empty(n)
    head = decompose(y[:w], periods, **kw)
    trend[:w] = head.trend
    for j in range(len(periods)):
        seasonal[j][:w] = head.seasonal[j]
    residual[:w] = head.residual
    end = n if max_points is None else min(n, w + max_points)
    for t in range(w, end):
        fit = decompose(y[t + 1 - w : t + 1], periods, **kw)
        trend[t] = fit.trend[-1]
        for j in range(len(periods)):
            seasonal[j][t] = fit.seasonal[j][-1]
        residual[t] = fit.residual[-1]
    if end < n:  # unfilled tail when capped (throughput runs only)
        trend[end:] = np.nan
        for j in range(len(periods)):
            seasonal[j][end:] = np.nan
        residual[end:] = np.nan
    return Decomposition(trend=trend, seasonal=seasonal, residual=residual)


def online_update_times(
    decompose: BatchDecomposer,
    values: np.ndarray,
    periods: list[int],
    *,
    n_updates: int,
    window_mult: int = 4,
    **kw,
) -> list[float]:
    """Wall-clock seconds for each of ``n_updates`` per-point online re-runs.

    Used by the Table 1 / Figure 2 throughput harness: throughput of the
    online counterpart = 1 / mean(per-point time).
    """
    import time

    y = np.asarray(values, dtype=np.float64)
    w = window_mult * max(periods)
    if y.size < w + n_updates:
        raise ValueError("series too short for requested updates")
    times = []
    for t in range(w, w + n_updates):
        t0 = time.perf_counter()
        decompose(y[t + 1 - w : t + 1], periods, **kw)
        times.append(time.perf_counter() - t0)
    return times
