"""Table 3 benchmark — accuracy grid on the real-dataset surrogates.

Runs the full (dataset x algorithm x offline/online) grid distributed over
Spark with a reduced online-re-run cap, printing measured vs paper values.
``jobs/run_table3.py`` runs the longer-cap version.
"""
import pytest

from repro.experiments.table3 import format_table3, run_table3

_RESULTS = []


@pytest.mark.spark
@pytest.mark.slow
@pytest.mark.benchmark(group="table3")
def test_bench_table3_grid(benchmark, spark):
    def run():
        res = run_table3(spark, max_online_points=40)
        _RESULTS.append(res)
        return res

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(res) == 5 * 11  # 5 datasets x (5 algos x 2 modes + OnlineSTL)
    assert res["mase_res"].notna().all()


def teardown_module(_mod):
    if _RESULTS:
        from benchmarks.bench_table1_throughput import _write_result

        header = "=== Table 3 (online re-runs capped at 40 points) ==="
        text = format_table3(_RESULTS[-1])
        print("\n" + header + "\n" + text)
        _write_result("table3.txt", header + "\n" + text)
