"""Synthetic surrogates for the paper's five real datasets (§7.3.2, Table 3).

The container has no network access, so the UCI / tsdl / fpp2 downloads are
replaced by deterministic generators with the *same length and seasonal
periods* as the paper's table, and trend / seasonal-strength / noise
character chosen to match each dataset's published description. DESIGN.md
records this substitution; Table 3's claim — OnlineSTL's MASE and trend
smoothness rank in the top half across algorithms — is about relative
behaviour on series with known seasonal structure, which these surrogates
preserve.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.datasets.paper_synthetic import _periodic_pattern


@dataclass
class RealDataset:
    """A surrogate dataset: values, its seasonal periods, and table metadata."""

    name: str
    values: np.ndarray
    periods: list[int]


def bike_sharing(seed: int = 11) -> RealDataset:
    """730 daily rental totals, weekly seasonality 7; strong annual swing and
    growth year-over-year, count-scale noise (UCI bike sharing)."""
    rng = np.random.default_rng(seed)
    n, m = 730, 7
    t = np.arange(n)
    trend = 2500 + 3.2 * t + 1500 * np.sin(2 * np.pi * (t - 100) / 365.0)
    weekly = _periodic_pattern(rng, m, 600.0, n)
    noise = rng.normal(0, 450, n)
    return RealDataset("Bike sharing", trend + weekly + noise, [m])


def daily_female_births(seed: int = 12) -> RealDataset:
    """364 daily birth counts, weekly seasonality 7; nearly flat trend and
    noise that dominates the weak weekly signal (tsdl births, 1959)."""
    rng = np.random.default_rng(seed)
    n, m = 364, 7
    t = np.arange(n)
    trend = 42.0 + 0.004 * t + 1.5 * np.sin(2 * np.pi * t / 364.0)
    weekly = _periodic_pattern(rng, m, 1.2, n)
    noise = rng.normal(0, 5.5, n)
    return RealDataset("Daily female births", trend + weekly + noise, [m])


def elecequip(seed: int = 13) -> RealDataset:
    """190 monthly manufacturing indices, seasonality 12; business-cycle
    trend with a clear 2008-style dip and strong month-of-year pattern."""
    rng = np.random.default_rng(seed)
    n, m = 190, 12
    t = np.arange(n)
    trend = 95 + 10 * np.sin(2 * np.pi * t / 120.0) + 8 * np.tanh((t - 150) / -12.0)
    monthly = _periodic_pattern(rng, m, 9.0, n)
    noise = rng.normal(0, 2.5, n)
    return RealDataset("Elecequip", trend + monthly + noise, [m])


def min_temperature(seed: int = 14) -> RealDataset:
    """500 daily minimum temperatures, seasonalities 7 and 28 (as the paper
    configures it); slow annual drift and weather noise (tsdl Melbourne)."""
    rng = np.random.default_rng(seed)
    n = 500
    t = np.arange(n)
    trend = 11.0 + 4.5 * np.sin(2 * np.pi * (t + 60) / 365.0)
    weekly = _periodic_pattern(rng, 7, 0.8, n)
    monthly = _periodic_pattern(rng, 28, 1.4, n)
    noise = rng.normal(0, 2.2, n)
    return RealDataset(
        "Min temperature", trend + weekly + monthly + noise, [7, 28]
    )


def internet_traffic(seed: int = 15) -> RealDataset:
    """1231 hourly traffic aggregates, seasonalities 24 and 168; pronounced
    daily and weekly cycles over a rising base (tsdl EU backbone)."""
    rng = np.random.default_rng(seed)
    n = 1231
    t = np.arange(n)
    # Magnitudes in raw bits/hour (~1e8), matching the real dataset's scale
    # so the log-trend-smoothness column lands in the paper's numeric range
    # (MASE is scale-invariant either way).
    trend = 5.0e8 + 1.2e5 * t + 4.0e7 * np.sin(2 * np.pi * t / 1000.0)
    daily = _periodic_pattern(rng, 24, 1.8e8, n)
    weekly = _periodic_pattern(rng, 168, 7.0e7, n)
    noise = rng.normal(0, 2.5e7, n)
    return RealDataset(
        "Internet traffic", trend + daily + weekly + noise, [24, 168]
    )


def all_real_datasets() -> list[RealDataset]:
    """The five Table 3 datasets, in the table's row order."""
    return [
        bike_sharing(),
        daily_female_births(),
        elecequip(),
        min_temperature(),
        internet_traffic(),
    ]
