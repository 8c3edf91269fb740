"""Tests for the item–user relevance function (core/matching.py): hand
calculations, numpy-vs-Spark equality, and oracle checks."""
import numpy as np
import pandas as pd
import pytest

from repro.core.entities import entity_expansion, expansion_map
from repro.core.interest import (
    decode_producers,
    interest_probabilities,
    with_producer_state,
)
from repro.core.matching import (
    ItemQuery,
    encode_item,
    score_items_spark,
    score_users,
    top_k_users,
)
from repro.core.profiles import ProfileStats, build_profile_stats


@pytest.fixture(scope="module")
def stats(ytube_spark):
    return build_profile_stats(
        ytube_spark["interactions"], ytube_spark["item_entities"], window=5
    )


@pytest.fixture(scope="module")
def interest(spark, ytube, ytube_spark):
    C = ytube.config.n_categories
    decoded = decode_producers(
        ytube_spark["items"], n_z=2, n_categories=C, seed=0
    )
    inter_z = with_producer_state(ytube_spark["interactions"], decoded)
    df = interest_probabilities(
        inter_z, n_categories=C, n_z=2, n_states=3, window_sizes=(5,), seed=0
    )
    df.cache().count()
    return df


@pytest.fixture(scope="module")
def interest_np(interest, stats, ytube):
    """(U, C) matrices aligned with stats.users."""
    C = ytube.config.n_categories
    pdf = interest.toPandas()
    U = len(stats.users)
    p_l = np.full((U, C), 1.0 / C)
    p_s = np.full((U, C), 1.0 / C)
    for r in pdf.itertuples(index=False):
        if r.consumer in stats.user_idx:
            p_l[stats.user_idx[r.consumer], r.category] = r.p_l
            p_s[stats.user_idx[r.consumer], r.category] = r.p_s_5
    return p_l, p_s


class TestItemQuery:
    def test_mismatched_lengths_raise(self):
        with pytest.raises(ValueError):
            ItemQuery(0, 1, "p", ("a", "b"), (1.0,))

    def test_encode_without_expansion(self):
        q = encode_item(7, 2, "p1", ["a", "b", "b"], expand=False)
        assert q.entities == ("a", "b", "b")
        assert q.weights == (1.0, 1.0, 1.0)

    def test_encode_with_expansion_per_occurrence(self):
        exp = {(2, "b"): [("c", 0.7)]}
        q = encode_item(7, 2, "p1", ["a", "b", "b"], exp)
        # paper Example 1: each occurrence is followed by its expansion
        assert q.entities == ("a", "b", "c", "b", "c")
        assert q.weights == (1.0, 1.0, 0.7, 1.0, 0.7)

    def test_top_n_limits_expansions(self):
        exp = {(0, "a"): [("x", 0.9), ("y", 0.8), ("z", 0.7)]}
        q = encode_item(1, 0, "p", ["a"], exp, top_n=2)
        assert q.entities == ("a", "x", "y")


def _tiny_stats():
    """Two users, two producers, two entities — everything hand-checkable."""
    return ProfileStats(
        users=["a", "b"],
        producers=["p1", "p2"],
        entities=["x", "y"],
        user_idx={"a": 0, "b": 1},
        prod_idx={"p1": 0, "p2": 1},
        ent_idx={"x": 0, "y": 1},
        n_up=np.array([[3.0, 1.0], [0.0, 2.0]]),
        n_ue=np.array([[2.0, 0.0], [1.0, 1.0]]),
        n_p_total=np.array([4.0, 2.0]),
        n_e_total=np.array([2.0, 2.0]),
        bg_p=np.array([0.5, 0.5]),
        bg_e=np.array([0.25, 0.75]),
        mu_p=1.0,
        mu_e=2.0,
    )


class TestScoreUsers:
    def test_hand_computed_score(self):
        s = _tiny_stats()
        C = 2
        p_l = np.array([[0.8, 0.2], [0.4, 0.6]])
        p_s = np.array([[0.5, 0.5], [0.9, 0.1]])
        q = ItemQuery(0, 0, "p1", ("x",), (1.0,))
        lam = 0.3
        got = score_users(s, p_l, p_s, q, lam)
        # user a: p̂(p1|a) = (3 + 1*0.5)/(4+1) = 0.7
        #         p̂(x|a)  = (2 + 2*0.25)/(2+2) = 0.625
        exp_a = 0.7 * (np.log(0.8) + np.log(0.7) + np.log(0.625)) + 0.3 * np.log(0.5)
        assert np.isclose(got[0], exp_a)
        # user b: p̂(p1|b) = (0 + 0.5)/(3) ; p̂(x|b) = (1+0.5)/(4)
        exp_b = 0.7 * (np.log(0.4) + np.log(0.5 / 3) + np.log(1.5 / 4)) + 0.3 * np.log(0.9)
        assert np.isclose(got[1], exp_b)

    def test_lambda_zero_is_long_term_only(self):
        s = _tiny_stats()
        p_l = np.array([[0.8, 0.2], [0.4, 0.6]])
        p_s1 = np.array([[0.5, 0.5], [0.9, 0.1]])
        p_s2 = np.array([[0.1, 0.9], [0.2, 0.8]])
        q = ItemQuery(0, 0, "p1", ("x",), (1.0,))
        assert np.allclose(
            score_users(s, p_l, p_s1, q, 0.0), score_users(s, p_l, p_s2, q, 0.0)
        )

    def test_lambda_one_is_short_term_only(self):
        s = _tiny_stats()
        p_l = np.array([[0.8, 0.2], [0.4, 0.6]])
        p_s = np.array([[0.5, 0.5], [0.9, 0.1]])
        q = ItemQuery(0, 1, "p2", ("y",), (1.0,))
        got = score_users(s, p_l, p_s, q, 1.0)
        assert np.allclose(got, np.log(p_s[:, 1]))

    def test_oov_producer_uses_floor(self):
        s = _tiny_stats()
        p_l = np.full((2, 2), 0.5)
        p_s = np.full((2, 2), 0.5)
        q = ItemQuery(0, 0, "never_seen", ("x",), (1.0,))
        got = score_users(s, p_l, p_s, q, 0.0)
        assert np.isfinite(got).all()

    def test_oov_entity_uses_floor(self):
        s = _tiny_stats()
        p_l = np.full((2, 2), 0.5)
        p_s = np.full((2, 2), 0.5)
        q = ItemQuery(0, 0, "p1", ("never_seen",), (1.0,))
        assert np.isfinite(score_users(s, p_l, p_s, q, 0.0)).all()

    def test_matching_entity_beats_nonmatching(self):
        s = _tiny_stats()
        p_l = np.full((2, 2), 0.5)
        p_s = np.full((2, 2), 0.5)
        # user a consumed entity x twice, never y
        qx = ItemQuery(0, 0, "p1", ("x",), (1.0,))
        qy = ItemQuery(0, 0, "p1", ("y",), (1.0,))
        sx = score_users(s, p_l, p_s, qx, 0.0)
        sy = score_users(s, p_l, p_s, qy, 0.0)
        assert sx[0] > sy[0]

    def test_more_weighted_entities_increase_score(self):
        s = _tiny_stats()
        p_l = np.full((2, 2), 0.5)
        p_s = np.full((2, 2), 0.5)
        q1 = ItemQuery(0, 0, "p1", ("x",), (1.0,))
        q2 = ItemQuery(0, 0, "p1", ("x", "y"), (1.0, 0.5))
        assert (score_users(s, p_l, p_s, q2, 0.0) > score_users(s, p_l, p_s, q1, 0.0)).all()


class TestTopK:
    def test_orders_by_score(self):
        scores = np.array([0.1, 0.9, 0.5])
        top = top_k_users(scores, ["a", "b", "c"], 2)
        assert [u for u, _ in top] == ["b", "c"]

    def test_ties_broken_by_name(self):
        scores = np.array([0.5, 0.5, 0.1])
        top = top_k_users(scores, ["z", "a", "m"], 2)
        assert [u for u, _ in top] == ["a", "z"]

    def test_k_larger_than_population(self):
        top = top_k_users(np.array([1.0]), ["a"], 5)
        assert len(top) == 1


class TestSparkScorerAgreesWithNumpy:
    def test_agreement_on_real_items(
        self, spark, ytube, ytube_spark, stats, interest, interest_np
    ):
        p_l, p_s = interest_np
        expmap = expansion_map(
            entity_expansion(ytube_spark["items"], ytube_spark["item_entities"])
        )
        ents = ytube.entities_of()
        items = ytube.items.head(4)
        queries = [
            encode_item(
                int(r.item_id), int(r.category), r.producer, ents[int(r.item_id)], expmap
            )
            for r in items.itertuples(index=False)
        ]
        lam = 0.4
        got = (
            score_items_spark(spark, queries, stats, interest, lam=lam)
            .toPandas()
            .set_index(["item_id", "consumer"])["score"]
        )
        for q in queries:
            ref = score_users(stats, p_l, p_s, q, lam)
            for ui, u in enumerate(stats.users):
                assert np.isclose(
                    got.loc[(q.item_id, u)], ref[ui], rtol=1e-9, atol=1e-9
                ), (q.item_id, u)
