"""Table 3 — MASE of residual + log trend smoothness on the 5 real datasets.

Every batch algorithm is evaluated offline (whole-series fit) and online
(sliding-window re-run — the paper's x/y column pairs); OnlineSTL has a
single column. Datasets are the deterministic surrogates of
``repro.datasets.real_surrogates`` (DESIGN.md substitution). The cell grid
runs distributed over Spark via :mod:`repro.experiments.grid`.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.grid import BATCH_ALGOS, run_grid

DATASETS = [
    "Bike sharing",
    "Daily female births",
    "Elecequip",
    "Min temperature",
    "Internet traffic",
]

# Paper Table 3, MASE of residual: dataset -> {algo: (offline, online)},
# OnlineSTL single value.
PAPER_MASE = {
    "Bike sharing": {
        "stl": (0.513, 0.475), "SSA": (0.303, 0.286), "STR": (0.654, 0.611),
        "TBATS": (0.672, 0.671), "RobustSTL": (0.596, 0.674),
        "OnlineSTL": 0.430,
    },
    "Daily female births": {
        "stl": (0.566, 0.504), "SSA": (0.405, 0.350), "STR": (0.630, 0.516),
        "TBATS": (0.744, 0.725), "RobustSTL": (0.322, 0.334),
        "OnlineSTL": 0.462,
    },
    "Elecequip": {
        "stl": (0.243, 0.271), "SSA": (0.419, 0.455), "STR": (0.209, 0.252),
        "TBATS": (0.304, 0.313), "RobustSTL": (0.383, 0.419),
        "OnlineSTL": 0.292,
    },
    "Min temperature": {
        "stl": (0.561, 0.574), "SSA": (0.359, 0.405), "STR": (0.608, 0.574),
        "TBATS": (0.629, 0.625), "RobustSTL": (0.149, 0.158),
        "OnlineSTL": 0.396,
    },
    "Internet traffic": {
        "stl": (0.857, 1.074), "SSA": (0.765, 0.622), "STR": (0.313, 0.236),
        "TBATS": (0.369, 0.405), "RobustSTL": (0.845, 0.821),
        "OnlineSTL": 0.618,
    },
}

# Paper Table 3, trend smoothness (log scale).
PAPER_SMOOTH = {
    "Bike sharing": {
        "stl": (4.831, 6.000), "SSA": (5.677, 6.292), "STR": (3.598, 4.935),
        "TBATS": (6.982, 6.988), "RobustSTL": (5.002, 5.445),
        "OnlineSTL": 5.378,
    },
    "Daily female births": {
        "stl": (-0.334, 1.035), "SSA": (0.837, 1.579), "STR": (-1.256, 0.730),
        "TBATS": (2.186, 2.162), "RobustSTL": (-0.0177, 0.709),
        "OnlineSTL": 0.353,
    },
    "Elecequip": {
        "stl": (-0.132, 0.415), "SSA": (0.217, 1.020), "STR": (0.168, 0.789),
        "TBATS": (1.272, 1.410), "RobustSTL": (0.429, 0.535),
        "OnlineSTL": -0.175,
    },
    "Min temperature": {
        "stl": (-2.550, -1.079), "SSA": (-2.708, -1.918), "STR": (-2.793, -0.902),
        "TBATS": (1.031, 1.032), "RobustSTL": (-1.561, -1.879),
        "OnlineSTL": -2.18,
    },
    "Internet traffic": {
        "stl": (16.305, 19.659), "SSA": (16.669, 18.872), "STR": (14.860, 20.745),
        "TBATS": (22.682, 23.580), "RobustSTL": (18.807, 20.756),
        "OnlineSTL": 18.245,
    },
}


def load_real_dataset(name: str):
    """Grid loader: dataset name -> (values, periods, no ground truth)."""
    from repro.datasets import all_real_datasets

    for ds in all_real_datasets():
        if ds.name == name:
            return ds.values, ds.periods, None
    raise KeyError(name)


def table3_cells(datasets: list[str] | None = None) -> list[dict]:
    cells = []
    for ds in datasets or DATASETS:
        for algo in BATCH_ALGOS:
            cells.append({"dataset": ds, "algorithm": algo, "mode": "offline"})
            cells.append({"dataset": ds, "algorithm": algo, "mode": "online"})
        cells.append({"dataset": ds, "algorithm": "OnlineSTL", "mode": "online"})
    return cells


def run_table3(
    spark: SparkSession | None,
    *,
    datasets: list[str] | None = None,
    max_online_points: int | None = 120,
) -> pd.DataFrame:
    """Run the Table 3 grid; returns one row per (dataset, algo, mode)."""
    return run_grid(
        spark,
        table3_cells(datasets),
        load_real_dataset,
        max_online_points=max_online_points,
    )


def format_table3(results: pd.DataFrame) -> str:
    """Render measured vs paper rows for both metrics."""
    lines = []
    for metric, col, paper in (
        ("MASE of residual", "mase_res", PAPER_MASE),
        ("Trend smoothness (log scale)", "log_smooth", PAPER_SMOOTH),
    ):
        lines.append(f"== {metric} ==")
        header = f"{'dataset':<22}" + "".join(
            f"{a:>20}" for a in [*list(PAPER_MASE['Elecequip'])[:-1], "OnlineSTL"]
        )
        lines.append(header + "   (measured offline/online | paper offline/online)")
        for ds in results["dataset"].unique():
            sub = results[results.dataset == ds]
            parts = [f"{ds:<22}"]
            for algo in [*list(paper[ds])[:-1]]:
                off = sub[(sub.algorithm == algo) & (sub["mode"] == "offline")][col]
                on = sub[(sub.algorithm == algo) & (sub["mode"] == "online")][col]
                po, pn = paper[ds][algo]
                o = f"{off.iloc[0]:.3f}" if len(off) else "-"
                n = f"{on.iloc[0]:.3f}" if len(on) else "-"
                parts.append(f"{o}/{n}|{po:.2f}/{pn:.2f}".rjust(20))
            ostl = sub[sub.algorithm == "OnlineSTL"][col]
            pv = paper[ds]["OnlineSTL"]
            v = f"{ostl.iloc[0]:.3f}" if len(ostl) else "-"
            parts.append(f"{v}|{pv:.2f}".rjust(20))
            lines.append("".join(parts))
        lines.append("")
    return "\n".join(lines)
