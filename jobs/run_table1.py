#!/usr/bin/env python
"""Reproduce Table 1: single-core throughput per algorithm.

Usage: spark-submit jobs/run_table1.py [seasonality] [budget_seconds]

Table 1 is a single-core measurement — Spark is not involved; the job
exists so every table has a uniform entrypoint. Default seasonality is the
paper's 1440 (daily seasonality, minutely data); pass a smaller value
(e.g. 100) for a quick run.
"""
import sys

from repro.experiments import format_table1, run_table1


def main() -> None:
    seasonality = int(sys.argv[1]) if len(sys.argv) > 1 else 1440
    budget = float(sys.argv[2]) if len(sys.argv) > 2 else 10.0
    rows = run_table1(seasonality=seasonality, budget_seconds=budget)
    print(format_table1(rows))


if __name__ == "__main__":
    main()
