"""Tests for user profile statistics (core/profiles.py) — Spark SQL counts
are verified against the DuckDB oracle, smoothing math against hand
calculations."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.profiles import (
    ProfileStats,
    background_entity,
    background_producer,
    build_profile_stats,
    entity_counts,
    producer_counts,
    split_short_window,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def stats(ytube_spark):
    return build_profile_stats(
        ytube_spark["interactions"], ytube_spark["item_entities"], window=5
    )


class TestSplitShortWindow:
    def test_window_size_respected(self, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 5)
        per_user = (
            tagged.filter("in_window").groupBy("consumer").count().toPandas()
        )
        assert (per_user["count"] <= 5).all()

    def test_window_holds_most_recent(self, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 3)
        pdf = tagged.filter(F.col("consumer") == "u0").toPandas()
        in_w = pdf[pdf["in_window"]]["ts"]
        out_w = pdf[~pdf["in_window"]]["ts"]
        if len(in_w) and len(out_w):
            assert in_w.min() >= out_w.max()

    def test_zero_window_keeps_everything_long_term(self, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 0)
        assert tagged.filter("in_window").count() == 0

    def test_negative_window_raises(self, ytube_spark):
        with pytest.raises(ValueError):
            split_short_window(ytube_spark["interactions"], -1)

    def test_total_rows_preserved(self, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 5)
        assert tagged.count() == ytube_spark["interactions"].count()

    def test_recency_vs_oracle(self, ytube, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 5).select(
            "consumer", "item_id", "ts", "recency"
        )
        assert_equivalent(
            tagged,
            """
            SELECT consumer, item_id, ts,
                   row_number() OVER (PARTITION BY consumer
                                      ORDER BY ts DESC, item_id DESC) AS recency
            FROM interactions
            """,
            interactions=ytube.interactions,
        )


class TestCounts:
    def test_producer_counts_vs_oracle(self, ytube, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 5)
        long_term = tagged.filter(~F.col("in_window"))
        got = producer_counts(long_term)
        assert_equivalent(
            got,
            """
            WITH tagged AS (
              SELECT *, row_number() OVER (PARTITION BY consumer
                         ORDER BY ts DESC, item_id DESC) AS recency
              FROM interactions)
            SELECT consumer, producer, count(*) AS n
            FROM tagged WHERE recency > 5
            GROUP BY consumer, producer
            """,
            interactions=ytube.interactions,
        )

    def test_entity_counts_vs_oracle(self, ytube, ytube_spark):
        tagged = split_short_window(ytube_spark["interactions"], 5)
        long_term = tagged.filter(~F.col("in_window"))
        got = entity_counts(long_term, ytube_spark["item_entities"])
        assert_equivalent(
            got,
            """
            WITH tagged AS (
              SELECT *, row_number() OVER (PARTITION BY consumer
                         ORDER BY ts DESC, item_id DESC) AS recency
              FROM interactions)
            SELECT t.consumer, ie.entity, count(*) AS n
            FROM tagged t JOIN item_entities ie ON t.item_id = ie.item_id
            WHERE t.recency > 5
            GROUP BY t.consumer, ie.entity
            """,
            interactions=ytube.interactions,
            item_entities=ytube.item_entities,
        )

    def test_background_producer_vs_oracle(self, ytube, ytube_spark):
        assert_equivalent(
            background_producer(ytube_spark["interactions"]),
            "SELECT producer, count(*) AS n FROM interactions GROUP BY producer",
            interactions=ytube.interactions,
        )

    def test_background_entity_vs_oracle(self, ytube, ytube_spark):
        assert_equivalent(
            background_entity(
                ytube_spark["interactions"], ytube_spark["item_entities"]
            ),
            """
            SELECT ie.entity, count(*) AS n
            FROM interactions i JOIN item_entities ie ON i.item_id = ie.item_id
            GROUP BY ie.entity
            """,
            interactions=ytube.interactions,
            item_entities=ytube.item_entities,
        )


class TestProfileStats:
    def test_shapes(self, stats):
        U, P, E = len(stats.users), len(stats.producers), len(stats.entities)
        assert stats.n_up.shape == (U, P)
        assert stats.n_ue.shape == (U, E)
        assert stats.bg_p.shape == (P,)
        assert stats.bg_e.shape == (E,)

    def test_backgrounds_are_distributions(self, stats):
        assert np.isclose(stats.bg_p.sum(), 1.0)
        assert np.isclose(stats.bg_e.sum(), 1.0)
        assert (stats.bg_p > 0).all() and (stats.bg_e > 0).all()

    def test_smoothed_rows_sum_to_one(self, stats):
        # sum_p p̂(p|u) = (n_u + mu * 1) / (n_u + mu) = 1
        assert np.allclose(stats.p_up.sum(axis=1), 1.0)
        assert np.allclose(stats.p_ue.sum(axis=1), 1.0)

    def test_smoothed_probs_strictly_positive(self, stats):
        assert (stats.p_up > 0).all()
        assert (stats.p_ue > 0).all()

    def test_totals_match_counts(self, stats):
        assert np.allclose(stats.n_p_total, stats.n_up.sum(axis=1))
        assert np.allclose(stats.n_e_total, stats.n_ue.sum(axis=1))

    def test_window_excluded_from_long_term(self, ytube, ytube_spark):
        # a user's long-term producer total == history length - window size
        s = build_profile_stats(
            ytube_spark["interactions"], ytube_spark["item_entities"], window=5
        )
        hist = ytube.interactions.groupby("consumer").size()
        for u in list(s.users)[:10]:
            expect = max(0, hist.get(u, 0) - 5)
            assert s.n_p_total[s.user_idx[u]] == expect

    def test_smoothing_hand_example(self, spark):
        import pandas as pd

        inter = spark.createDataFrame(
            pd.DataFrame(
                {
                    "consumer": ["a", "a", "a", "b"],
                    "item_id": [1, 2, 3, 1],
                    "ts": [1, 2, 3, 1],
                    "category": [0, 0, 1, 0],
                    "producer": ["p1", "p1", "p2", "p1"],
                }
            )
        )
        ie = spark.createDataFrame(
            pd.DataFrame(
                {"item_id": [1, 2, 3], "entity": ["x", "y", "x"], "pos": [0, 0, 0]}
            )
        )
        s = build_profile_stats(inter, ie, window=1, mu_p=1.0, mu_e=1.0)
        # user a long-term = items 1,2 (3 is in window): p1 twice
        ia, ip1 = s.user_idx["a"], s.prod_idx["p1"]
        # bg_p: laplace-floored counts p1: 3+1, p2: 1+1 => 4/6, 2/6
        assert np.isclose(s.bg_p[ip1], 4 / 6)
        assert np.isclose(s.p_up[ia, ip1], (2 + 1.0 * 4 / 6) / (2 + 1.0))

    def test_fixed_vocabulary(self, ytube_spark):
        s = build_profile_stats(
            ytube_spark["interactions"],
            ytube_spark["item_entities"],
            window=5,
            all_users=["u0", "u1", "zzz_unseen"],
            all_producers=["p0", "zzz_p"],
            all_entities=["e0_t0_0", "zzz_e"],
        )
        assert "zzz_unseen" in s.user_idx
        assert s.n_p_total[s.user_idx["zzz_unseen"]] == 0
        # unseen user's smoothed dist is exactly the background
        assert np.allclose(s.p_up[s.user_idx["zzz_unseen"]], s.bg_p)

    def test_floors_match_definition(self, stats):
        u = 0
        assert np.isclose(
            stats.producer_floor(u), stats.mu_p / (stats.n_p_total[u] + stats.mu_p)
        )
        assert np.isclose(
            stats.entity_floor(u), stats.mu_e / (stats.n_e_total[u] + stats.mu_e)
        )
