"""Table 4 benchmark — accuracy vs ground truth on the paper's synthetic
series, all algorithms offline + online, distributed over Spark."""
import pytest

from repro.experiments.table4 import format_table4, run_table4

_RESULTS = []


@pytest.mark.spark
@pytest.mark.slow
@pytest.mark.benchmark(group="table4")
def test_bench_table4_grid(benchmark, spark):
    def run():
        res = run_table4(spark, max_online_points=60)
        _RESULTS.append(res)
        return res

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(res) == 11
    assert res["mase_s0"].notna().all()
    assert res["mase_trend"].notna().all()


def teardown_module(_mod):
    if _RESULTS:
        from benchmarks.bench_table1_throughput import _write_result

        header = "=== Table 4 (online re-runs capped at 60 points) ==="
        text = format_table4(_RESULTS[-1])
        print("\n" + header + "\n" + text)
        _write_result("table4.txt", header + "\n" + text)
