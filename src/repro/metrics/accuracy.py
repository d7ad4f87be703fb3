"""Decomposition-quality metrics (paper §7.3).

* MASE of residual — mean absolute residual scaled by the seasonal-naive
  error of the series (scale-invariant, comparable across datasets).
* MASE vs. true component — same scaling applied to the error between an
  estimated component and its known ground truth (Table 4).
* Trend smoothness — std of the first-order difference of the trend series
  ("lower values indicate a smoother series"); Table 3 reports it on a log
  scale, exposed here as :func:`log_trend_smoothness`.
"""
from __future__ import annotations

import numpy as np


def seasonal_naive_scale(values: np.ndarray, period: int) -> float:
    """Denominator of MASE: mean |X_t − X_{t−m}| over the series."""
    y = np.asarray(values, dtype=np.float64)
    if y.size <= period:
        raise ValueError(f"series length {y.size} <= period {period}")
    d = np.abs(y[period:] - y[:-period])
    s = float(d.mean())
    return s if s > 0 else 1.0


def mase_residual(values: np.ndarray, residual: np.ndarray, period: int) -> float:
    """MASE between the series and trend+seasonal fit, i.e. of the residual."""
    y = np.asarray(values, dtype=np.float64)
    r = np.asarray(residual, dtype=np.float64)
    mask = ~np.isnan(r)
    return float(np.abs(r[mask]).mean()) / seasonal_naive_scale(y, period)


def mase_vs_true(
    estimate: np.ndarray, truth: np.ndarray, values: np.ndarray, period: int
) -> float:
    """MASE of an estimated component against its ground truth (Table 4)."""
    e = np.asarray(estimate, dtype=np.float64)
    t = np.asarray(truth, dtype=np.float64)
    mask = ~np.isnan(e)
    return float(np.abs(e[mask] - t[mask]).mean()) / seasonal_naive_scale(
        values, period
    )


def trend_smoothness(trend: np.ndarray) -> float:
    """Std of the first difference of the trend (lower = smoother)."""
    t = np.asarray(trend, dtype=np.float64)
    t = t[~np.isnan(t)]
    if t.size < 2:
        return 0.0
    return float(np.std(np.diff(t)))


def log_trend_smoothness(trend: np.ndarray) -> float:
    """Table 3 reports smoothness on a log scale (values go negative)."""
    return float(np.log(trend_smoothness(trend) + 1e-12))


def mae(a: np.ndarray, b: np.ndarray) -> float:
    """Plain mean absolute error between two aligned series."""
    a = np.asarray(a, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    mask = ~(np.isnan(a) | np.isnan(b))
    return float(np.abs(a[mask] - b[mask]).mean())
