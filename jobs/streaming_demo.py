#!/usr/bin/env python
"""End-to-end streaming demo: generate a keyed metric stream, decompose it
with the stateful OnlineSTL operator, print per-key residual statistics.

Usage: spark-submit jobs/streaming_demo.py [n_keys] [seconds]

This is the deployment shape of the paper's §6 (real-time DevOps metrics
monitoring): residual magnitude per key is what an anomaly detector would
alert on once trend and seasonality are subtracted out.
"""
import sys
import time

from _session import get_session
from pyspark.sql import functions as F

from repro.streaming import rate_events, streaming_decompose


def main() -> None:
    n_keys = int(sys.argv[1]) if len(sys.argv) > 1 else 16
    seconds = float(sys.argv[2]) if len(sys.argv) > 2 else 15.0
    period = 20
    spark = get_session("onlinestl-streaming-demo")
    try:
        events = rate_events(
            spark, n_keys=n_keys, rows_per_second=200_000, period=period
        )
        decomposed = streaming_decompose(events, [period])
        stats = decomposed.groupBy("series_id").agg(
            F.count("*").alias("points"),
            F.round(F.avg(F.abs("residual")), 4).alias("mean_abs_residual"),
            F.round(F.max(F.abs("residual")), 4).alias("max_abs_residual"),
        )
        query = (
            stats.writeStream.outputMode("complete")
            .format("console")
            .option("numRows", 10)
            .option("truncate", False)
            .trigger(processingTime="5 seconds")
            .start()
        )
        time.sleep(seconds)
        query.stop()
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
