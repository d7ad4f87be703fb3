"""MSTL — multiple-seasonality decomposition by iterated STL.

Follows the MSTL construction the paper cites ([26], Hyndman et al.): run
STL once per period on the series deseasonalized by every *other* period's
current estimate, iterating a couple of rounds so the components settle.
The trend is taken from the final STL fit of the longest period.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.stl import stl_decompose
from repro.core.online_stl import Decomposition


def mstl(
    values: np.ndarray,
    periods: list[int],
    *,
    iterations: int = 2,
    **stl_kw,
) -> Decomposition:
    """Decompose ``values`` with one seasonal component per entry of ``periods``."""
    y = np.asarray(values, dtype=np.float64)
    order = sorted(range(len(periods)), key=lambda i: periods[i])
    seasonal = [np.zeros(y.size) for _ in periods]
    trend = np.zeros(y.size)
    for _ in range(max(1, iterations)):
        for i in order:
            others = sum(
                (seasonal[j] for j in range(len(periods)) if j != i),
                np.zeros(y.size),
            )
            fit = stl_decompose(y - others, periods[i], **stl_kw)
            seasonal[i] = fit.seasonal[0]
            trend = fit.trend
    residual = y - trend - sum(seasonal)
    return Decomposition(trend=trend, seasonal=seasonal, residual=residual)
