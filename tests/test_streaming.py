"""Tests for the stream protocol and the Structured Streaming stateful
profile-maintenance operator (core/streaming.py)."""
import json

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.profiles import split_short_window
from repro.core.streaming import (
    N_PARTITIONS,
    UserProfileState,
    apply_interactions,
    partition_stream,
    profile_update_stream,
    stream_batches,
)
from repro.oracle import assert_equivalent


class TestPartitionStream:
    def test_six_roughly_equal_partitions(self, ytube, ytube_spark):
        parts = partition_stream(ytube_spark["interactions"]).groupBy("partition").count()
        pdf = parts.toPandas().sort_values("partition")
        assert list(pdf["partition"]) == list(range(1, N_PARTITIONS + 1))
        assert pdf["count"].max() - pdf["count"].min() <= 1

    def test_partitions_are_temporal(self, ytube_spark):
        p = partition_stream(ytube_spark["interactions"])
        bounds = p.groupBy("partition").agg(
            F.min("ts").alias("lo"), F.max("ts").alias("hi")
        ).toPandas().sort_values("partition")
        for a, b in zip(bounds.itertuples(), bounds.iloc[1:].itertuples()):
            assert a.hi <= b.lo or a.hi == b.lo  # boundaries may share one ts

    def test_vs_oracle(self, ytube, ytube_spark):
        got = partition_stream(ytube_spark["interactions"]).select(
            "consumer", "item_id", "ts", "partition"
        )
        assert_equivalent(
            got,
            """
            SELECT consumer, item_id, ts,
                   ntile(6) OVER (ORDER BY ts, consumer, item_id) AS partition
            FROM interactions
            """,
            interactions=ytube.interactions,
        )

    def test_invalid_n_raises(self, ytube_spark):
        with pytest.raises(ValueError):
            partition_stream(ytube_spark["interactions"], 0)


class TestStreamBatches:
    def test_batches_cover_everything_in_order(self, ytube):
        batches = list(stream_batches(ytube.interactions, 500))
        total = sum(len(b) for b in batches)
        assert total == len(ytube.interactions)
        last_ts = -1
        for b in batches:
            assert b["ts"].is_monotonic_increasing or len(b) == 1
            assert b["ts"].iloc[0] >= last_ts
            last_ts = b["ts"].iloc[-1]

    def test_invalid_batch_size(self, ytube):
        with pytest.raises(ValueError):
            next(stream_batches(ytube.interactions, 0))


class TestUserProfileState:
    def _ev(self, n, start=0):
        return [(start + i, i % 3, f"p{i % 2}") for i in range(n)]

    def test_window_never_overflows(self):
        st = UserProfileState(window=5)
        st.apply(self._ev(12))
        assert len(st.short) == 5
        assert st.n_long == 7

    def test_flush_goes_oldest_first(self):
        st = UserProfileState(window=2)
        st.apply([(1, 0, "a"), (2, 1, "b"), (3, 2, "c")])
        assert st.short == [(2, 1, "b"), (3, 2, "c")]
        assert st.long_cat == {0: 1}
        assert st.long_prod == {"a": 1}

    def test_incremental_equals_batch(self):
        ev = self._ev(20)
        st1 = UserProfileState(window=4)
        st1.apply(ev)
        st2 = UserProfileState(window=4)
        for i in range(0, 20, 3):
            st2.apply(ev[i : i + 3])
        assert st1.short == st2.short
        assert st1.long_cat == st2.long_cat
        assert st1.long_prod == st2.long_prod

    def test_json_roundtrip(self):
        st = UserProfileState(window=3)
        st.apply(self._ev(7))
        s, c, p = st.to_json()
        back = UserProfileState.from_json(3, s, c, p)
        assert back.short == st.short
        assert back.long_cat == st.long_cat
        assert back.long_prod == st.long_prod
        assert back.n_long == st.n_long

    def test_apply_interactions_frame(self):
        st = UserProfileState(window=2)
        batch = pd.DataFrame(
            {"ts": [5, 1, 3], "category": [2, 0, 1], "producer": ["c", "a", "b"]}
        )
        apply_interactions(st, batch)
        # events applied in ts order; window keeps the two most recent
        assert st.short == [(3, 1, "b"), (5, 2, "c")]
        assert st.long_cat == {0: 1}


class TestStructuredStreamingOperator:
    """End-to-end: file-sourced Structured Streaming with
    applyInPandasWithState equals the batch profile computation."""

    @pytest.fixture(scope="class")
    def streamed(self, spark, ytube, tmp_path_factory):
        root = tmp_path_factory.mktemp("stream")
        inp = root / "in"
        inp.mkdir()
        inter = ytube.interactions.sort_values(["ts", "consumer", "item_id"])
        # take a modest prefix so the test stays fast, split into 3 files
        prefix = inter.head(1500)
        chunks = [prefix.iloc[0:500], prefix.iloc[500:1000], prefix.iloc[1000:1500]]
        for i, ch in enumerate(chunks):
            with open(inp / f"batch_{i}.json", "w") as f:
                for r in ch.itertuples(index=False):
                    f.write(
                        json.dumps(
                            {
                                "consumer": r.consumer,
                                "item_id": int(r.item_id),
                                "ts": int(r.ts),
                                "category": int(r.category),
                                "producer": r.producer,
                            }
                        )
                        + "\n"
                    )
        out = profile_update_stream(
            spark, str(inp), window=5, checkpoint=str(root / "ckpt")
        )
        q = (
            out.writeStream.format("memory")
            .queryName("profiles_stream")
            .outputMode("update")
            .option("checkpointLocation", str(root / "ckpt"))
            .start()
        )
        q.processAllAvailable()
        rows = spark.sql(
            "SELECT * FROM profiles_stream"
        ).toPandas()
        q.stop()
        return prefix, rows

    def test_final_counts_match_batch(self, streamed):
        prefix, rows = streamed
        # last emitted row per consumer reflects the final state
        final = rows.groupby("consumer").last()
        truth = prefix.groupby("consumer").size()
        for u, n in truth.items():
            assert int(final.loc[u, "n_seen"]) == int(n)
            assert int(final.loc[u, "n_window"]) == min(5, int(n))
            assert int(final.loc[u, "n_long"]) == max(0, int(n) - 5)

    def test_streaming_window_equals_batch_split(self, spark, ytube, streamed):
        """The streaming operator's long/short split equals
        profiles.split_short_window on the same data."""
        prefix, rows = streamed
        sdf = spark.createDataFrame(prefix)
        tagged = split_short_window(sdf, 5)
        batch_long = (
            tagged.filter(~F.col("in_window")).groupBy("consumer").count().toPandas()
        ).set_index("consumer")["count"]
        final = rows.groupby("consumer").last()
        for u in batch_long.index:
            assert int(final.loc[u, "n_long"]) == int(batch_long[u])
