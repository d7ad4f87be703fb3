"""Tests for the bounded keyed decomposition path (applyInPandas), including
DuckDB-oracle checks over its output aggregates."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import decompose_series
from repro.oracle import assert_equivalent
from repro.streaming import batch_decompose, output_schema
from repro.synth_data import metric_events_pdf

PERIODS = [12]
WINDOW = 4 * 12


@pytest.fixture(scope="module")
def events_pdf():
    return metric_events_pdf(
        n_keys=4, points_per_key=WINDOW + 40, periods=PERIODS, seed=3
    )


@pytest.fixture(scope="module")
def decomposed(spark, events_pdf):
    out = batch_decompose(spark.createDataFrame(events_pdf), PERIODS)
    return out.toPandas().sort_values(["series_id", "ts"]).reset_index(drop=True)


@pytest.mark.spark
class TestBatchDecompose:
    def test_row_count(self, decomposed, events_pdf):
        assert len(decomposed) == len(events_pdf)

    def test_schema(self, decomposed):
        expected = [f.name for f in output_schema(len(PERIODS)).fields]
        assert list(decomposed.columns) == expected

    def test_matches_single_threaded_core(self, decomposed, events_pdf):
        """Distribution must not change the math: every key's output equals
        the sequential core exactly."""
        for k, grp in events_pdf.groupby("series_id"):
            grp = grp.sort_values("ts")
            d = decompose_series(grp["value"].to_numpy(), PERIODS)
            got = decomposed[decomposed.series_id == k]
            np.testing.assert_allclose(got["trend"].to_numpy(), d.trend, atol=1e-9)
            np.testing.assert_allclose(
                got["seasonal_0"].to_numpy(), d.seasonal[0], atol=1e-9
            )
            np.testing.assert_allclose(
                got["residual"].to_numpy(), d.residual, atol=1e-9
            )

    def test_additive_identity_all_rows(self, decomposed):
        lhs = decomposed["value"].to_numpy()
        rhs = (
            decomposed["trend"] + decomposed["seasonal_0"] + decomposed["residual"]
        ).to_numpy()
        np.testing.assert_allclose(lhs, rhs, atol=1e-9)

    def test_identity_oracle(self, spark, events_pdf):
        """Oracle check: per-key aggregate of |X - T - S - R| is zero, and
        row counts match, computed by DuckDB over the Spark output."""
        out = batch_decompose(spark.createDataFrame(events_pdf), PERIODS)
        got = out.groupBy("series_id").agg(
            F.count("*").alias("n"),
            F.round(
                F.max(
                    F.abs(
                        F.col("value")
                        - F.col("trend")
                        - F.col("seasonal_0")
                        - F.col("residual")
                    )
                ),
                6,
            ).alias("max_err"),
        )
        assert_equivalent(
            got,
            "SELECT series_id, count(*) AS n, "
            "round(max(abs(value - trend - seasonal_0 - residual)), 6) AS max_err "
            "FROM dec GROUP BY series_id",
            dec=out,
        )

    def test_short_keys_emit_nothing(self, spark):
        pdf = pd.DataFrame(
            {
                "series_id": [1] * 10,
                "ts": range(10),
                "value": np.random.default_rng(0).normal(size=10),
            }
        )
        out = batch_decompose(spark.createDataFrame(pdf), PERIODS)
        assert out.count() == 0

    def test_mixed_length_keys(self, spark, events_pdf):
        short = pd.DataFrame(
            {"series_id": [99] * 5, "ts": range(5), "value": [1.0] * 5}
        )
        both = pd.concat([events_pdf, short], ignore_index=True)
        out = batch_decompose(spark.createDataFrame(both), PERIODS)
        got = out.toPandas()
        assert set(got["series_id"].unique()) == set(
            events_pdf["series_id"].unique()
        )

    def test_unsorted_input_handled(self, spark, events_pdf):
        shuffled = events_pdf.sample(frac=1.0, random_state=1)
        a = (
            batch_decompose(spark.createDataFrame(shuffled), PERIODS)
            .toPandas()
            .sort_values(["series_id", "ts"])
            .reset_index(drop=True)
        )
        b = (
            batch_decompose(spark.createDataFrame(events_pdf), PERIODS)
            .toPandas()
            .sort_values(["series_id", "ts"])
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(a, b, check_dtype=False)

    def test_multi_period_output_columns(self, spark):
        periods = [6, 12]
        pdf = metric_events_pdf(
            n_keys=2, points_per_key=4 * 12 + 10, periods=periods, seed=8
        )
        out = batch_decompose(spark.createDataFrame(pdf), periods)
        cols = out.columns
        assert "seasonal_0" in cols and "seasonal_1" in cols
        got = out.toPandas()
        lhs = got["value"].to_numpy()
        rhs = (
            got["trend"] + got["seasonal_0"] + got["seasonal_1"] + got["residual"]
        ).to_numpy()
        np.testing.assert_allclose(lhs, rhs, atol=1e-9)

    def test_residual_windowed_aggregation_oracle(self, spark, events_pdf):
        """A windowed aggregation downstream of the decomposition (the
        monitoring query the paper motivates: residual stats per window)."""
        out = batch_decompose(spark.createDataFrame(events_pdf), PERIODS)
        got = (
            out.withColumn("bucket", F.floor(F.col("ts") / 24).cast("long"))
            .groupBy("series_id", "bucket")
            .agg(F.round(F.avg(F.abs("residual")), 6).alias("mar"))
        )
        assert_equivalent(
            got,
            "SELECT series_id, CAST(floor(ts / 24.0) AS BIGINT) AS bucket, "
            "round(avg(abs(residual)), 6) AS mar "
            "FROM dec GROUP BY 1, 2",
            dec=out,
        )
