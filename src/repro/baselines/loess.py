"""Loess (locally weighted linear regression) — substrate for classical STL.

Cleveland's STL is built entirely out of loess smooths; no reference
implementation (R/Fortran `stl`, statsmodels) exists in this container, so
this is a from-scratch numpy implementation: tri-cube weights over the ``q``
nearest neighbours, degree-1 local fit, with evaluation at arbitrary
(possibly exterior) positions for STL's cyclic-subseries extension step.
"""
from __future__ import annotations

import numpy as np

from repro.core.kernels import tricube


def _fit_at(x: np.ndarray, y: np.ndarray, pos: float, q: int) -> float:
    """Weighted degree-1 fit around ``pos`` using the q nearest points of x."""
    d = np.abs(x - pos)
    if q < x.size:
        idx = np.argpartition(d, q - 1)[:q]
        xs, ys, ds = x[idx], y[idx], d[idx]
    else:
        xs, ys, ds = x, y, d
    dmax = ds.max()
    if dmax <= 0:
        return float(ys.mean())
    # Cleveland: for q > n, inflate the bandwidth by q/n.
    if q > x.size:
        dmax *= q / x.size
    w = np.asarray(tricube(ds / (dmax * 1.0000001)))
    sw = w.sum()
    if sw <= 0:
        return float(ys.mean())
    # Closed-form weighted linear regression (2x2 normal equations).
    xm = float((w * xs).sum() / sw)
    ym = float((w * ys).sum() / sw)
    xc = xs - xm
    sxx = float((w * xc * xc).sum())
    if sxx <= 1e-12:
        return ym
    beta = float((w * xc * ys).sum()) / sxx
    return ym + beta * (pos - xm)


def loess_smooth(y: np.ndarray, q: int) -> np.ndarray:
    """Smooth ``y`` (at integer positions 0..n-1) with span ``q`` points."""
    y = np.asarray(y, dtype=np.float64)
    n = y.size
    if n == 0:
        return y.copy()
    if n == 1 or q <= 1:
        return y.copy()
    x = np.arange(n, dtype=np.float64)
    return np.array([_fit_at(x, y, float(t), q) for t in range(n)])


def loess_at(y: np.ndarray, q: int, positions: np.ndarray) -> np.ndarray:
    """Evaluate the loess fit of ``y`` at arbitrary ``positions``.

    Used by STL to extend smoothed cyclic subseries one period beyond each
    end (positions -1 and n).
    """
    y = np.asarray(y, dtype=np.float64)
    n = y.size
    if n == 1:
        return np.full(len(positions), y[0])
    x = np.arange(n, dtype=np.float64)
    q = min(max(q, 2), max(n, 2)) if q <= n else q
    return np.array([_fit_at(x, y, float(p), q) for p in positions])


def moving_average(y: np.ndarray, w: int) -> np.ndarray:
    """Centered-ish moving average of window ``w``; output length n - w + 1."""
    y = np.asarray(y, dtype=np.float64)
    if w <= 1:
        return y.copy()
    c = np.cumsum(np.concatenate([[0.0], y]))
    return (c[w:] - c[:-w]) / w
