"""Tests for the Spark interest pipeline (core/interest.py)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.interest import (
    MIN_HISTORY,
    bihmm_vs_hmm_accuracy,
    decode_producers,
    interest_probabilities,
    with_producer_state,
)


@pytest.fixture(scope="module")
def decoded(ytube, ytube_spark):
    df = decode_producers(
        ytube_spark["items"], n_z=2, n_categories=ytube.config.n_categories, seed=0
    )
    df.cache().count()
    return df


@pytest.fixture(scope="module")
def inter_z(ytube_spark, decoded):
    df = with_producer_state(ytube_spark["interactions"], decoded)
    df.cache().count()
    return df


class TestDecodeProducers:
    def test_every_item_decoded_once(self, ytube, decoded):
        assert decoded.count() == len(ytube.items)
        assert decoded.select("item_id").distinct().count() == len(ytube.items)

    def test_states_in_range(self, decoded):
        mm = decoded.agg(F.min("z"), F.max("z")).first()
        assert mm[0] >= 0 and mm[1] <= 1

    def test_deterministic_across_runs(self, ytube, ytube_spark, decoded):
        again = decode_producers(
            ytube_spark["items"], n_z=2, n_categories=ytube.config.n_categories, seed=0
        ).toPandas().sort_values("item_id").reset_index(drop=True)
        first = decoded.toPandas().sort_values("item_id").reset_index(drop=True)
        assert first.equals(again)

    def test_producers_use_multiple_states(self, decoded):
        # the planted producer chains switch states, so decoding should not
        # collapse to a single state overall
        assert decoded.select("z").distinct().count() == 2


class TestWithProducerState:
    def test_row_count_preserved(self, ytube, inter_z):
        assert inter_z.count() == len(ytube.interactions)

    def test_no_null_states(self, inter_z):
        assert inter_z.filter(F.col("z").isNull()).count() == 0


class TestAccuracy:
    @pytest.fixture(scope="class")
    def acc(self, ytube, inter_z):
        df = bihmm_vs_hmm_accuracy(
            inter_z,
            n_categories=ytube.config.n_categories,
            n_z=2,
            max_states=4,
            seed=0,
            n_iter=12,
        )
        return df.toPandas()

    def test_one_row_per_consumer(self, ytube, acc):
        assert len(acc) == ytube.interactions["consumer"].nunique()

    def test_accuracies_in_range(self, acc):
        ok = acc.dropna()
        assert ((ok["acc_hmm"] >= 0) & (ok["acc_hmm"] <= 1)).all()
        assert ((ok["acc_bihmm"] >= 0) & (ok["acc_bihmm"] <= 1)).all()

    def test_opt_states_in_range(self, acc):
        assert ((acc["opt_states"] >= 1) & (acc["opt_states"] <= 4)).all()

    def test_bihmm_wins_on_average(self, acc):
        """The Fig. 5 claim at test scale: mean BiHMM accuracy exceeds mean
        HMM accuracy on producer-dependent data."""
        ok = acc.dropna()
        assert ok["acc_bihmm"].mean() > ok["acc_hmm"].mean()


class TestInterestProbabilities:
    @pytest.fixture(scope="class")
    def probs(self, ytube, inter_z):
        df = interest_probabilities(
            inter_z,
            n_categories=ytube.config.n_categories,
            n_z=2,
            n_states=3,
            window_sizes=(1, 5),
            seed=0,
            n_iter=10,
        )
        df.cache().count()
        return df

    def test_one_row_per_user_category(self, ytube, probs):
        n_u = ytube.interactions["consumer"].nunique()
        assert probs.count() == n_u * ytube.config.n_categories

    def test_rows_sum_to_one_per_user(self, probs):
        sums = probs.groupBy("consumer").agg(
            F.sum("p_l").alias("sl"), F.sum("p_s_1").alias("s1"), F.sum("p_s_5").alias("s5")
        ).toPandas()
        assert np.allclose(sums["sl"], 1.0)
        assert np.allclose(sums["s1"], 1.0)
        assert np.allclose(sums["s5"], 1.0)

    def test_probabilities_strictly_positive(self, probs):
        mins = probs.agg(
            F.min("p_l"), F.min("p_s_1"), F.min("p_s_5")
        ).first()
        assert all(v > 0 for v in mins)

    def test_short_history_user_gets_uniform(self, spark, ytube):
        import pandas as pd

        tiny = spark.createDataFrame(
            pd.DataFrame(
                {
                    "consumer": ["solo"] * (MIN_HISTORY - 1),
                    "item_id": range(MIN_HISTORY - 1),
                    "ts": range(MIN_HISTORY - 1),
                    "category": [0] * (MIN_HISTORY - 1),
                    "producer": ["p0"] * (MIN_HISTORY - 1),
                    "z": [0] * (MIN_HISTORY - 1),
                }
            )
        )
        out = interest_probabilities(
            tiny, n_categories=4, n_z=2, window_sizes=(5,)
        ).toPandas()
        assert np.allclose(out["p_l"], 0.25)
