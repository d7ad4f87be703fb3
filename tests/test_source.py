"""Tests for the streaming event sources."""
import numpy as np
import pytest

from repro.streaming import EVENT_SCHEMA, rate_events, replay_files
from repro.synth_data import metric_events_pdf


class TestRateEventsValidation:
    @pytest.mark.spark
    def test_requires_exactly_one_rate(self, spark):
        with pytest.raises(ValueError):
            rate_events(spark, n_keys=4, period=10)
        with pytest.raises(ValueError):
            rate_events(
                spark, n_keys=4, period=10, rows_per_second=10, rows_per_batch=10
            )

    @pytest.mark.spark
    def test_streaming_plan_builds(self, spark):
        df = rate_events(spark, n_keys=4, period=10, rows_per_batch=100)
        assert df.isStreaming
        assert [f.name for f in df.schema.fields] == ["series_id", "ts", "value"]


@pytest.mark.spark
class TestReplayFiles:
    def test_chunk_files_written(self, spark, tmp_path):
        events = metric_events_pdf(n_keys=2, points_per_key=30, periods=[5])
        replay_files(spark, events, str(tmp_path / "in"), n_chunks=3)
        files = sorted((tmp_path / "in").glob("chunk-*.parquet"))
        assert len(files) == 3

    def test_chunks_partition_all_rows(self, spark, tmp_path):
        import pandas as pd

        events = metric_events_pdf(n_keys=2, points_per_key=25, periods=[5])
        replay_files(spark, events, str(tmp_path / "in"), n_chunks=4)
        back = pd.concat(
            [pd.read_parquet(p) for p in sorted((tmp_path / "in").glob("*.parquet"))]
        )
        assert len(back) == len(events)
        assert sorted(back["ts"].tolist()) == sorted(events["ts"].tolist())

    def test_chunks_time_ordered_when_sorted(self, spark, tmp_path):
        import pandas as pd

        events = metric_events_pdf(n_keys=2, points_per_key=40, periods=[5])
        replay_files(spark, events, str(tmp_path / "in"), n_chunks=3, sort=True)
        paths = sorted((tmp_path / "in").glob("*.parquet"))
        maxes = [pd.read_parquet(p)["ts"].max() for p in paths]
        mins = [pd.read_parquet(p)["ts"].min() for p in paths]
        for i in range(len(paths) - 1):
            assert maxes[i] <= mins[i + 1] + 1  # boundaries respect time

    def test_schema_matches_event_schema(self, spark, tmp_path):
        events = metric_events_pdf(n_keys=1, points_per_key=20, periods=[5])
        stream = replay_files(spark, events, str(tmp_path / "in"))
        assert stream.schema == EVENT_SCHEMA
