#!/usr/bin/env python
"""Reproduce Table 3: accuracy on the 5 real-dataset surrogates.

Usage: spark-submit jobs/run_table3.py [max_online_points]

The (dataset x algorithm x offline/online) grid is distributed over Spark;
``max_online_points`` caps the per-point re-runs of each batch algorithm's
online counterpart (0 or negative = uncapped, slow).
"""
import sys

from _session import get_session

from repro.experiments import format_table3, run_table3


def main() -> None:
    cap = int(sys.argv[1]) if len(sys.argv) > 1 else 120
    spark = get_session("table3-accuracy")
    try:
        res = run_table3(spark, max_online_points=cap if cap > 0 else None)
        print(format_table3(res))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
