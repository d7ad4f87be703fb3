"""Accuracy metrics for decomposition quality (MASE, smoothness, MAE)."""
from repro.metrics.accuracy import (
    log_trend_smoothness,
    mae,
    mase_residual,
    mase_vs_true,
    seasonal_naive_scale,
    trend_smoothness,
)

__all__ = [
    "log_trend_smoothness",
    "mae",
    "mase_residual",
    "mase_vs_true",
    "seasonal_naive_scale",
    "trend_smoothness",
]
