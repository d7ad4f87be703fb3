#!/usr/bin/env python
"""Reproduce Table 4: accuracy vs ground truth on the paper's synthetic.

Usage: spark-submit jobs/run_table4.py [max_online_points]
"""
import sys

from _session import get_session

from repro.experiments import format_table4, run_table4


def main() -> None:
    cap = int(sys.argv[1]) if len(sys.argv) > 1 else 150
    spark = get_session("table4-synthetic-accuracy")
    try:
        res = run_table4(spark, max_online_points=cap if cap > 0 else None)
        print(format_table4(res))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
