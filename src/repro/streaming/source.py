"""Event sources for the streaming experiments.

* :func:`rate_events` — unbounded generator built on Spark's ``rate``
  source for throughput benchmarks (Table 2). The paper's Flink event
  generator is configured to outrun the operator so the *operator* is the
  measured bottleneck; ``rows_per_second`` here is likewise set far above
  the operator's capacity and Spark's back-pressure does the rest.
* :func:`replay_files` — deterministic bounded replay through the file
  source for exactness tests (stream output must equal batch output).
"""
from __future__ import annotations

import os
import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

EVENT_SCHEMA = StructType(
    [
        StructField("series_id", LongType()),
        StructField("ts", LongType()),
        StructField("value", DoubleType()),
    ]
)


def rate_events(
    spark: SparkSession,
    *,
    n_keys: int,
    period: int,
    rows_per_second: int | None = None,
    rows_per_batch: int | None = None,
) -> DataFrame:
    """Unbounded keyed metric stream: round-robin keys over a rate source.

    Row ``value`` v maps to ``series_id = v mod n_keys`` and per-key
    timestamp ``ts = v div n_keys`` (monotone per key, as the deployment
    assumes). The metric itself is a seasonal wave of the configured period
    plus deterministic jitter — cheap enough (Catalyst expressions, no
    Python) that generation never bottlenecks the stateful operator.

    With ``rows_per_batch`` the ``rate-micro-batch`` source is used: every
    micro-batch carries exactly that many rows no matter how long the
    previous batch took. This is how "the source outruns the operator"
    (paper §6) is made safe on Spark — the wall-clock ``rate`` source has
    no back-pressure, so a slow operator would face unboundedly growing
    batches instead of a steady measurable load.
    """
    if (rows_per_second is None) == (rows_per_batch is None):
        raise ValueError("pass exactly one of rows_per_second / rows_per_batch")
    if rows_per_batch is not None:
        raw = (
            spark.readStream.format("rate-micro-batch")
            .option("rowsPerBatch", rows_per_batch)
            .load()
        )
    else:
        raw = (
            spark.readStream.format("rate")
            .option("rowsPerSecond", rows_per_second)
            .load()
        )
    ts = (F.col("value") / n_keys).cast("long")
    return raw.select(
        (F.col("value") % n_keys).cast("long").alias("series_id"),
        ts.alias("ts"),
        (
            F.sin(ts.cast("double") * (2.0 * 3.141592653589793 / period))
            + F.sin(F.col("value").cast("double") * 12.9898) * 0.3
        ).alias("value"),
    )


def replay_files(
    spark: SparkSession,
    events: pd.DataFrame,
    directory: str,
    *,
    n_chunks: int = 3,
    sort: bool = True,
) -> DataFrame:
    """Split a bounded event frame into time-ordered parquet chunks and
    return a streaming DataFrame replaying them.

    ``maxFilesPerTrigger=1`` makes each chunk its own micro-batch, so the
    stateful operator is exercised across micro-batch boundaries (state
    round-trips through the codec between chunks) deterministically.
    ``sort=False`` preserves the caller's row order (used to test the
    operator's tolerance of intra-batch disorder); the caller is then
    responsible for chunk boundaries that respect per-key time order.
    """
    os.makedirs(directory, exist_ok=True)
    if sort:
        events = events.sort_values("ts", kind="stable").reset_index(drop=True)
    else:
        events = events.reset_index(drop=True)
    bounds = [(len(events) * i) // n_chunks for i in range(n_chunks + 1)]
    for i in range(n_chunks):
        chunk = events.iloc[bounds[i] : bounds[i + 1]]
        chunk.to_parquet(
            os.path.join(directory, f"chunk-{i:03d}.parquet"), index=False
        )
        # FileStreamSource orders unseen files by modification time; spacing
        # the writes keeps chunk order deterministic on coarse-mtime
        # filesystems so per-key points never arrive out of order.
        time.sleep(0.05)
    return (
        spark.readStream.schema(EVENT_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .parquet(directory)
    )
