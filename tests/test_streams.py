"""Tests for the micro-batch stream substrate."""
import numpy as np
import pandas as pd
import pytest

from repro.streams.microbatch import TAU, StreamSet, timestamped


@pytest.fixture(scope="module")
def small_df(spark):
    return spark.createDataFrame(pd.DataFrame({"k": np.arange(50), "v": np.arange(50) * 0.5}))


class TestTimestamped:
    def test_adds_tau_column(self, spark, small_df):
        out = timestamped(small_df, duration=10.0)
        assert TAU in out.columns
        assert set(out.columns) == {"k", "v", TAU}

    def test_taus_within_range(self, spark, small_df):
        taus = timestamped(small_df, duration=10.0, t0=2.0).toPandas()[TAU]
        assert (taus >= 2.0).all() and (taus < 12.0 + 1e-6).all()

    def test_taus_unique(self, spark, small_df):
        taus = timestamped(small_df, duration=10.0).toPandas()[TAU]
        assert taus.nunique() == len(taus)

    def test_unique_across_streams(self, spark, small_df):
        t1 = timestamped(small_df, duration=10.0, stream_id=0).toPandas()[TAU]
        t2 = timestamped(small_df, duration=10.0, stream_id=1).toPandas()[TAU]
        assert not set(t1) & set(t2)

    def test_deterministic_in_seed(self, spark, small_df):
        a = timestamped(small_df, duration=5.0, seed=3).toPandas()[TAU]
        b = timestamped(small_df, duration=5.0, seed=3).toPandas()[TAU]
        assert sorted(a) == sorted(b)

    def test_row_count_preserved(self, spark, small_df):
        assert timestamped(small_df, duration=5.0).count() == 50


class TestStreamSet:
    def test_of_builds_all_relations(self, spark, small_df):
        ss = StreamSet.of({"A": small_df, "B": small_df}, duration=8.0)
        assert set(ss.relations) == {"A", "B"}
        assert ss.t_end == 8.0

    def test_slices_cover_stream(self, spark, small_df):
        ss = StreamSet.of({"A": small_df}, duration=8.0)
        total = 0
        starts = []
        for t, batch in ss.slices(2.0):
            starts.append(t)
            total += batch["A"].count()
        assert starts == [0.0, 2.0, 4.0, 6.0]
        assert total == 50

    def test_slices_disjoint(self, spark, small_df):
        ss = StreamSet.of({"A": small_df}, duration=6.0)
        seen = set()
        for _t, batch in ss.slices(1.5):
            taus = batch["A"].toPandas()[TAU]
            assert not set(taus) & seen
            seen.update(taus)

    def test_batch_tau_within_slice(self, spark, small_df):
        ss = StreamSet.of({"A": small_df}, duration=6.0)
        for t, batch in ss.slices(2.0):
            taus = batch["A"].toPandas()[TAU]
            if len(taus):
                assert (taus >= t).all() and (taus < t + 2.0).all()
