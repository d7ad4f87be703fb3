"""SSA — Singular Spectrum Analysis decomposition (paper baseline [22]).

Pipeline: fold the series into a Hankel trajectory matrix, take its SVD,
reconstruct each leading eigentriple by diagonal averaging, and classify
every reconstructed component as trend / seasonal(p) / residual by its
dominant periodogram frequency. This is the "matrix decomposition" family
the paper benchmarks; numpy's LAPACK SVD stands in for the reference
Caterpillar-SSA implementation.
"""
from __future__ import annotations

import numpy as np

from repro.core.online_stl import Decomposition


def _hankel(y: np.ndarray, L: int) -> np.ndarray:
    K = y.size - L + 1
    idx = np.arange(L)[:, None] + np.arange(K)[None, :]
    return y[idx]


def _diag_average(rank1: np.ndarray) -> np.ndarray:
    """Average the antidiagonals of an L x K matrix back into a series."""
    L, K = rank1.shape
    n = L + K - 1
    out = np.zeros(n)
    counts = np.zeros(n)
    for i in range(L):
        out[i : i + K] += rank1[i]
        counts[i : i + K] += 1.0
    return out / counts


def _dominant_freq(series: np.ndarray) -> float:
    """Frequency (cycles/sample) of the largest non-DC periodogram peak."""
    x = series - series.mean()
    spec = np.abs(np.fft.rfft(x)) ** 2
    if spec.size <= 1 or spec[1:].max() <= 0:
        return 0.0
    peak = 1 + int(np.argmax(spec[1:]))
    return peak / x.size


def ssa(
    values: np.ndarray,
    periods: list[int],
    *,
    window: int | None = None,
    max_components: int = 24,
    energy: float = 0.995,
) -> Decomposition:
    """SSA decomposition with frequency-based eigentriple grouping.

    ``window`` defaults to the usual n/2 capped so at least two columns
    exist; components beyond ``energy`` cumulative singular-value mass or
    ``max_components`` go straight to the residual.
    """
    y = np.asarray(values, dtype=np.float64)
    n = y.size
    m_max = max(periods)
    if window is None:
        # Cap the embedding window so the SVD stays O(L²·K) with bounded L;
        # the reference SSA would use n/2, which is minutes of LAPACK time
        # at the paper's seasonality-1440 windows (SSA is an O(1)/s-tier
        # algorithm in Table 1 either way).
        window = min(n // 2, max(2 * m_max, 10), 512)
    L = int(max(2, min(window, n - 1)))
    X = _hankel(y, L)
    U, s, Vt = np.linalg.svd(X, full_matrices=False)
    cum = np.cumsum(s**2) / np.sum(s**2)
    r = int(np.searchsorted(cum, energy) + 1)
    r = min(r, max_components, s.size)

    trend = np.zeros(n)
    seasonal = [np.zeros(n) for _ in periods]
    # A component is "trend" if its dominant frequency is far below the
    # slowest seasonal frequency; "seasonal p" if it lies within 20% of a
    # harmonic of 1/m_p (longest matching period wins); otherwise it stays
    # in the residual.
    f_trend = 0.5 / m_max
    by_len = sorted(range(len(periods)), key=lambda j: -periods[j])
    for i in range(r):
        comp = _diag_average(s[i] * np.outer(U[:, i], Vt[i]))
        f = _dominant_freq(comp)
        if f <= f_trend:
            trend += comp
            continue
        for p in by_len:
            mp = periods[p]
            base = 1.0 / mp
            harmonic = max(1, round(f / base))
            if harmonic <= mp // 2 and abs(f - harmonic * base) <= 0.2 * base:
                seasonal[p] += comp
                break
    residual = y - trend - sum(seasonal)
    return Decomposition(trend=trend, seasonal=seasonal, residual=residual)
