"""Table 1 benchmark — single-core throughput per algorithm.

Default bench seasonality is 288 (daily seasonality at 5-minute
resolution) so a full sweep completes in minutes; ``jobs/run_table1.py``
runs the paper's 1440. Throughput (points/s) is attached to each
benchmark's ``extra_info`` and the table is printed at the end.
"""
import pytest

from repro.experiments.table1 import (
    PAPER_TIERS,
    format_table1,
    measure_batch_algorithm,
    measure_online_stl,
)

SEASONALITY = 288
_ROWS = []

BATCH_NAMES = [n for n in PAPER_TIERS if n != "OnlineSTL"]


@pytest.mark.benchmark(group="table1")
def test_bench_online_stl_throughput(benchmark):
    """OnlineSTL: thousands of O(1) updates; benchmark times one update."""
    row = measure_online_stl(SEASONALITY, budget_seconds=1.0)
    _ROWS.append(row)
    from repro.core import OnlineSTL

    import numpy as np

    model = OnlineSTL([SEASONALITY])
    model.initialize(
        np.sin(np.arange(model.window) * 2 * np.pi / SEASONALITY) + 10.0
    )
    benchmark(model.update, 10.0)
    benchmark.extra_info["throughput_per_sec"] = row.throughput_per_sec
    benchmark.extra_info["paper_tier"] = row.paper_tier


@pytest.mark.benchmark(group="table1")
@pytest.mark.parametrize("name", BATCH_NAMES)
def test_bench_batch_online_counterpart(benchmark, name):
    """Each batch algorithm: one sliding-window re-run (= one online point)."""
    row = measure_batch_algorithm(name, SEASONALITY, budget_seconds=3.0)
    _ROWS.append(row)

    import numpy as np

    from repro.baselines import online_update_times
    from repro.experiments.table1 import _BATCH, _test_series

    y = _test_series(SEASONALITY, 4 * SEASONALITY + 3)

    def one_update():
        online_update_times(_BATCH[name], y, [SEASONALITY], n_updates=1)

    benchmark.pedantic(one_update, rounds=1, iterations=1)
    benchmark.extra_info["throughput_per_sec"] = row.throughput_per_sec
    benchmark.extra_info["paper_tier"] = row.paper_tier


def teardown_module(_mod):
    if _ROWS:
        text = format_table1(sorted(_ROWS, key=lambda r: -r.throughput_per_sec))
        header = f"=== Table 1 (seasonality {SEASONALITY}) ==="
        print("\n" + header + "\n" + text)
        _write_result("table1.txt", header + "\n" + text)


def _write_result(name, text):
    import pathlib

    out = pathlib.Path(__file__).resolve().parent.parent / "bench_results"
    out.mkdir(exist_ok=True)
    (out / name).write_text(text + "\n")
