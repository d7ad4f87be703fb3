"""Table 1 / Figure 2 — single-core throughput per algorithm.

The paper reports order-of-magnitude throughput (points processed per
second per core) for each decomposition algorithm on minutely data with
daily seasonality (m = 1440), where every batch algorithm runs in its
online-counterpart form over a sliding window of 4m (§7.1-§7.2).

OnlineSTL's throughput is measured over thousands of true O(1) updates;
each batch algorithm is measured over however many window re-runs fit in a
time budget (slow algorithms get few — throughput = points / elapsed either
way, which is how the paper's "O(1) per second" tiers arise).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.baselines import mstl, online_update_times, robust_stl, ssa, stl, str_decompose, tbats
from repro.core import OnlineSTL

# Paper Table 1 rows: algorithm -> (throughput tier printed by the paper,
# batch decomposer or None for OnlineSTL itself).
PAPER_TIERS = {
    "STL": "O(100)",
    "MSTL": "O(100)",
    "TBATS": "O(1)",
    "STR": "O(1)",
    "SSA": "O(1)",
    "RobustSTL": "O(1)",
    "Fast-RobustSTL": "O(1)",
    "OnlineSTL": "O(10,000)",
}

_BATCH = {
    "STL": stl,
    "MSTL": mstl,
    "TBATS": tbats,
    "STR": str_decompose,
    "SSA": ssa,
    "RobustSTL": robust_stl,
    "Fast-RobustSTL": robust_stl,
}


@dataclass
class ThroughputRow:
    algorithm: str
    seasonality: int
    throughput_per_sec: float
    points_measured: int
    paper_tier: str


def _test_series(seasonality: int, n: int, seed: int = 0) -> np.ndarray:
    rng = np.random.default_rng(seed)
    t = np.arange(n, dtype=float)
    return (
        10.0
        + 0.001 * t
        + 2.0 * np.sin(2 * np.pi * t / seasonality)
        + rng.normal(0, 0.3, n)
    )


def measure_online_stl(
    seasonality: int, *, budget_seconds: float = 2.0, max_updates: int = 200_000
) -> ThroughputRow:
    """Throughput of OnlineSTL's O(1) update loop at one seasonality."""
    model = OnlineSTL([seasonality])
    y = _test_series(seasonality, model.window, seed=1)
    model.initialize(y)
    rng = np.random.default_rng(2)
    xs = 10.0 + rng.normal(0, 1.0, 10_000)
    count = 0
    t0 = time.perf_counter()
    while True:
        model.update(float(xs[count % 10_000]))
        count += 1
        if count >= max_updates or (
            count % 500 == 0 and time.perf_counter() - t0 > budget_seconds
        ):
            break
    elapsed = time.perf_counter() - t0
    return ThroughputRow(
        "OnlineSTL", seasonality, count / elapsed, count, PAPER_TIERS["OnlineSTL"]
    )


def measure_batch_algorithm(
    name: str,
    seasonality: int,
    *,
    budget_seconds: float = 10.0,
    max_updates: int = 50,
) -> ThroughputRow:
    """Throughput of a batch algorithm's online counterpart (sliding 4m
    window re-run per point). One timed probe sizes the remaining budget."""
    fn = _BATCH[name]
    window = 4 * seasonality
    y = _test_series(seasonality, window + max_updates + 1, seed=3)
    probe = online_update_times(fn, y, [seasonality], n_updates=1)
    per_point = probe[0]
    remaining = max(0.0, budget_seconds - per_point)
    extra = min(max_updates - 1, int(remaining / per_point)) if per_point > 0 else 0
    times = probe
    if extra > 0:
        times = probe + online_update_times(
            fn, y[1:], [seasonality], n_updates=extra
        )
    total = sum(times)
    return ThroughputRow(
        name, seasonality, len(times) / total, len(times), PAPER_TIERS[name]
    )


def run_table1(
    *,
    seasonality: int = 1440,
    budget_seconds: float = 10.0,
    algorithms: list[str] | None = None,
) -> list[ThroughputRow]:
    """All Table 1 rows at one seasonality (paper uses 1440)."""
    rows = []
    names = algorithms or list(PAPER_TIERS)
    for name in names:
        if name == "OnlineSTL":
            rows.append(measure_online_stl(seasonality))
        else:
            rows.append(
                measure_batch_algorithm(
                    name, seasonality, budget_seconds=budget_seconds
                )
            )
    return rows


def format_table1(rows: list[ThroughputRow]) -> str:
    """Render measured rows next to the paper's tiers."""
    lines = [
        f"{'Algorithm':<16} {'seasonality':>11} {'measured/s':>12} "
        f"{'points':>7}  {'paper tier':>10}",
    ]
    for r in rows:
        lines.append(
            f"{r.algorithm:<16} {r.seasonality:>11} {r.throughput_per_sec:>12.2f} "
            f"{r.points_measured:>7}  {r.paper_tier:>10}"
        )
    return "\n".join(lines)
