"""Distributed keyed OnlineSTL decomposition — the Flink deployment's
Spark Structured Streaming equivalent (paper §6, DESIGN.md substitutions).

Two paths share the same per-key kernel:

* :func:`streaming_decompose` — unbounded: ``groupBy(key)`` +
  ``applyInPandasWithState``; state is the warm-up buffer or the live
  OnlineSTL model (pickled via :mod:`repro.streaming.state_codec`). This is
  the paper's "stateful keyed map function".
* :func:`batch_decompose` — bounded: ``groupBy(key).applyInPandas`` running
  init + sequential updates per key, parallel across keys. Used by
  correctness tests (its output is oracle-checked and must equal the
  streaming path and the single-threaded core exactly).

Rows are sorted by timestamp inside each (key, micro-batch) group, so
intra-batch disorder is tolerated — the Flink deployment makes the same
event-time assumption. Cross-batch late data would need watermarked
re-ordering, which neither the paper's operator nor this one attempts.
"""
from __future__ import annotations

from typing import Iterable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout
from pyspark.sql.types import (
    BinaryType,
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from repro.core.online_stl import OnlineSTL, decompose_series
from repro.streaming.state_codec import KeyState, decode, encode


def output_schema(n_periods: int) -> StructType:
    """Decomposition row schema: one scalar seasonal column per period
    (scalar so the DuckDB oracle can sort/compare rows)."""
    fields = [
        StructField("series_id", LongType()),
        StructField("ts", LongType()),
        StructField("value", DoubleType()),
        StructField("trend", DoubleType()),
    ]
    fields += [
        StructField(f"seasonal_{j}", DoubleType()) for j in range(n_periods)
    ]
    fields.append(StructField("residual", DoubleType()))
    return StructType(fields)


STATE_SCHEMA = StructType([StructField("blob", BinaryType())])


def _rows_from_arrays(
    series_id: int,
    ts: np.ndarray,
    values: np.ndarray,
    trend: np.ndarray,
    seasonal: list[np.ndarray],
    residual: np.ndarray,
) -> pd.DataFrame:
    cols: dict[str, np.ndarray] = {
        "series_id": np.full(len(ts), series_id, dtype=np.int64),
        "ts": np.asarray(ts, dtype=np.int64),
        "value": values,
        "trend": trend,
    }
    for j, s in enumerate(seasonal):
        cols[f"seasonal_{j}"] = s
    cols["residual"] = residual
    return pd.DataFrame(cols)


def _advance(
    state: KeyState, ts: np.ndarray, vals: np.ndarray, series_id: int
) -> pd.DataFrame:
    """Feed ordered points through a KeyState; return emitted decomposition
    rows. Shared by the streaming and (conceptually) batch paths — the
    warm-up buffer fills until 4m points, init emits the warm-up batch,
    then each point is one O(1) online update."""
    out: list[pd.DataFrame] = []
    window = 4 * max(state.periods)
    i = 0
    n = len(vals)
    if state.model is None:
        take = min(n, window - len(state.buffer_vals))
        state.buffer_ts.extend(int(t) for t in ts[:take])
        state.buffer_vals.extend(float(v) for v in vals[:take])
        i = take
        if len(state.buffer_vals) == window:
            model = OnlineSTL(state.periods, gamma=state.gamma)
            head = model.initialize(np.asarray(state.buffer_vals))
            out.append(
                _rows_from_arrays(
                    series_id,
                    np.asarray(state.buffer_ts),
                    np.asarray(state.buffer_vals),
                    head.trend,
                    head.seasonal,
                    head.residual,
                )
            )
            state.model = model
            state.buffer_ts = []
            state.buffer_vals = []
    if state.model is not None and i < n:
        k = len(state.periods)
        cnt = n - i
        trend = np.empty(cnt)
        seasonal = [np.empty(cnt) for _ in range(k)]
        residual = np.empty(cnt)
        for j in range(cnt):
            pt = state.model.update(vals[i + j])
            trend[j] = pt.trend
            for q in range(k):
                seasonal[q][j] = pt.seasonal[q]
            residual[j] = pt.residual
        out.append(
            _rows_from_arrays(
                series_id, ts[i:], vals[i:], trend, seasonal, residual
            )
        )
    if not out:
        return pd.DataFrame()
    return pd.concat(out, ignore_index=True)


def streaming_decompose(
    events: DataFrame,
    periods: list[int],
    gamma: float = 0.7,
) -> DataFrame:
    """Stateful keyed decomposition of an unbounded (series_id, ts, value)
    stream. Returns the streaming DataFrame of decomposition rows."""
    schema = output_schema(len(periods))

    def fn(
        key: tuple, pdfs: Iterable[pd.DataFrame], state: GroupState
    ) -> Iterator[pd.DataFrame]:
        (series_id,) = key
        if state.exists:
            (blob,) = state.get
            ks = decode(bytes(blob))
        else:
            ks = KeyState(periods=list(periods), gamma=gamma)
        chunks = [p for p in pdfs if len(p)]
        if chunks:
            pdf = pd.concat(chunks, ignore_index=True).sort_values("ts")
            out = _advance(
                ks,
                pdf["ts"].to_numpy(np.int64),
                pdf["value"].to_numpy(np.float64),
                int(series_id),
            )
            state.update((encode(ks),))
            if len(out):
                yield out

    return (
        events.groupBy("series_id")
        .applyInPandasWithState(
            fn,
            outputStructType=schema,
            stateStructType=STATE_SCHEMA,
            outputMode="append",
            timeoutConf=GroupStateTimeout.NoTimeout,
        )
    )


def batch_decompose(
    events: DataFrame,
    periods: list[int],
    gamma: float = 0.7,
) -> DataFrame:
    """Bounded keyed decomposition: one ``decompose_series`` per key via
    ``applyInPandas`` (keys run in parallel across cores). Keys with fewer
    than 4m points cannot be initialized and emit no rows."""
    schema = output_schema(len(periods))
    window = 4 * max(periods)

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("ts")
        vals = pdf["value"].to_numpy(np.float64)
        if vals.size < window:
            return pd.DataFrame(
                {f.name: pd.Series(dtype="float64") for f in schema.fields}
            )
        d = decompose_series(vals, periods, gamma=gamma)
        return _rows_from_arrays(
            int(pdf["series_id"].iloc[0]),
            pdf["ts"].to_numpy(np.int64),
            vals,
            d.trend,
            d.seasonal,
            d.residual,
        )

    return events.groupBy("series_id").applyInPandas(fn, schema=schema)
