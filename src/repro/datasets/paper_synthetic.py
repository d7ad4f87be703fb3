"""The paper's synthetic benchmark series (§7.3.1, Figure 4, Table 4).

"Our randomly generated dataset contains 750 points, with seasonal
components of length 25 and 50. The trend changes at 5 randomly chosen
points, and the final series is constructed by adding trend, seasonal
components, together with random gaussian noise." Figure 4 shows the
period-25 component with magnitude −1.5..1.5 and the period-50 component
with magnitude −0.5..0.5.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class SyntheticSeries:
    """A generated series together with its ground-truth components."""

    values: np.ndarray
    trend: np.ndarray
    seasonal: list[np.ndarray]  # aligned with `periods`
    noise: np.ndarray
    periods: list[int]


def _periodic_pattern(
    rng: np.random.Generator, period: int, amplitude: float, n: int
) -> np.ndarray:
    """Random smooth periodic wave of exact ``period``, scaled to ±amplitude."""
    harmonics = rng.integers(2, 5)
    t = np.arange(period)
    wave = np.zeros(period)
    for j in range(1, harmonics + 1):
        wave += rng.normal() * np.cos(2 * np.pi * j * t / period)
        wave += rng.normal() * np.sin(2 * np.pi * j * t / period)
    wave -= wave.mean()
    peak = np.abs(wave).max() or 1.0
    wave *= amplitude / peak
    return wave[np.arange(n) % period]


def _changepoint_trend(
    rng: np.random.Generator, n: int, n_changepoints: int, slope_scale: float
) -> np.ndarray:
    """Piecewise-linear trend whose slope changes at random changepoints."""
    cps = np.sort(rng.choice(np.arange(1, n - 1), size=n_changepoints, replace=False))
    slopes = rng.uniform(-slope_scale, slope_scale, size=n_changepoints + 1)
    # Per-step slope array integrated into a continuous piecewise-linear
    # trend: exactly one slope change (kink) at each changepoint.
    step = np.empty(n - 1)
    prev = 0
    for seg, cp in enumerate(list(cps) + [n - 1]):
        step[prev:cp] = slopes[seg]
        prev = cp
    return np.concatenate([[0.0], np.cumsum(step)])


def paper_synthetic(
    *,
    n: int = 750,
    periods: tuple[int, int] = (25, 50),
    amplitudes: tuple[float, float] = (1.5, 0.5),
    n_changepoints: int = 5,
    noise_std: float = 0.3,
    slope_scale: float = 0.05,
    seed: int = 7,
) -> SyntheticSeries:
    """Generate the Table 4 benchmark series, deterministic in ``seed``."""
    rng = np.random.default_rng(seed)
    trend = _changepoint_trend(rng, n, n_changepoints, slope_scale)
    seasonal = [
        _periodic_pattern(rng, p, a, n) for p, a in zip(periods, amplitudes)
    ]
    noise = rng.normal(0.0, noise_std, size=n)
    values = trend + sum(seasonal) + noise
    return SyntheticSeries(
        values=values,
        trend=trend,
        seasonal=seasonal,
        noise=noise,
        periods=list(periods),
    )
