"""Table 4 — MASE against *true* components on the paper's synthetic series.

The synthetic series (750 points, periods 25 & 50, 5 trend changepoints,
Gaussian noise — §7.3.1 / Figure 4) has known ground truth, so every
algorithm is scored on MASE of each seasonal component, MASE of trend, and
trend smoothness, in offline and online-counterpart modes plus OnlineSTL.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.grid import BATCH_ALGOS, run_grid

SYNTH = "paper-synthetic"

# Paper Table 4 rows: algorithm -> (MASE s=25, MASE s=50, MASE trend, smoothness)
PAPER_TABLE4 = {
    ("OnlineSTL", "online"): (0.279, 0.236, 0.564, 0.018),
    ("stl", "offline"): (0.080, 0.078, 0.168, 0.020),
    ("SSA", "offline"): (0.971, 0.899, 0.193, 0.018),
    ("STR", "offline"): (0.063, 0.115, 0.211, 0.019),
    ("TBATS", "offline"): (0.062, 0.127, 0.220, 0.483),
    ("RobustSTL", "offline"): (1.095, 0.366, 0.074, 0.114),
    ("stl", "online"): (0.083, 0.091, 0.210, 0.046),
    ("SSA", "online"): (0.992, 0.956, 0.348, 0.035),
    ("STR", "online"): (0.134, 0.176, 0.259, 0.375),
    ("TBATS", "online"): (0.08, 0.136, 0.225, 0.482),
    ("RobustSTL", "online"): (1.088, 0.369, 0.193, 0.075),
}

_PAPER_NAME = {
    ("OnlineSTL", "online"): "OnlineSTL",
    ("stl", "offline"): "offline stl",
    ("SSA", "offline"): "SSA",
    ("STR", "offline"): "STR",
    ("TBATS", "offline"): "TBATS",
    ("RobustSTL", "offline"): "Fast RobustSTL",
    ("stl", "online"): "Online offline stl",
    ("SSA", "online"): "Online SSA",
    ("STR", "online"): "Online STR",
    ("TBATS", "online"): "Online TBATS",
    ("RobustSTL", "online"): "Online Fast RobustSTL",
}


def load_synthetic(name: str):
    """Grid loader with ground truth attached."""
    from repro.datasets import paper_synthetic

    if name != SYNTH:
        raise KeyError(name)
    ds = paper_synthetic()
    truth = {
        "trend": ds.trend,
        "seasonal_0": ds.seasonal[0],
        "seasonal_1": ds.seasonal[1],
    }
    return ds.values, ds.periods, truth


def table4_cells() -> list[dict]:
    cells = [{"dataset": SYNTH, "algorithm": "OnlineSTL", "mode": "online"}]
    for algo in BATCH_ALGOS:
        cells.append({"dataset": SYNTH, "algorithm": algo, "mode": "offline"})
        cells.append({"dataset": SYNTH, "algorithm": algo, "mode": "online"})
    return cells


def run_table4(
    spark: SparkSession | None,
    *,
    max_online_points: int | None = 150,
) -> pd.DataFrame:
    return run_grid(
        spark, table4_cells(), load_synthetic, max_online_points=max_online_points
    )


def format_table4(results: pd.DataFrame) -> str:
    lines = [
        f"{'Algorithm':<24} {'MASE s=25':>18} {'MASE s=50':>18} "
        f"{'MASE trend':>18} {'smoothness':>18}",
        f"{'':<24} {'meas | paper':>18} {'meas | paper':>18} "
        f"{'meas | paper':>18} {'meas | paper':>18}",
    ]
    for key, paper in PAPER_TABLE4.items():
        algo, mode = key
        sub = results[(results.algorithm == algo) & (results["mode"] == mode)]
        if len(sub) == 0:
            continue
        r = sub.iloc[0]
        lines.append(
            f"{_PAPER_NAME[key]:<24} "
            f"{r.mase_s0:>8.3f} | {paper[0]:<7.3f} "
            f"{r.mase_s1:>8.3f} | {paper[1]:<7.3f} "
            f"{r.mase_trend:>8.3f} | {paper[2]:<7.3f} "
            f"{r.smooth:>8.3f} | {paper[3]:<7.3f}"
        )
    return "\n".join(lines)
