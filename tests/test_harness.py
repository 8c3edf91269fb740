"""Integration tests for the stream-evaluation harness (eval/harness.py).

These exercise the full pipeline at tiny scale: prepare → snapshot →
evaluate, for the ranker, the index path and the baselines, plus the
Table II / Fig. 10 / Fig. 11 runners.
"""
import numpy as np
import pytest

from repro.core.streaming import N_PARTITIONS, N_TRAIN
from repro.eval.harness import (
    Prepared,
    build_index,
    item_query,
    prepare,
    run_efficiency,
    run_stream_eval,
    run_table2,
    run_update_cost,
    snapshot,
    ssrec_topk_fn,
    test_items as harness_test_items,
)

SF = 0.02


@pytest.fixture(scope="module")
def prep(spark):
    return prepare(spark, "ytube", SF)


@pytest.fixture(scope="module")
def snap2(spark, prep):
    return snapshot(spark, prep, N_TRAIN)


class TestPrepare:
    def test_partitions_assigned(self, prep):
        assert set(prep.inter_pd["partition"]) == set(range(1, N_PARTITIONS + 1))

    def test_row_count_matches(self, prep):
        assert len(prep.inter_pd) == len(prep.data.interactions)


class TestSnapshot:
    def test_only_training_data_visible(self, snap2, prep):
        boundary = prep.inter_pd[prep.inter_pd["partition"] <= N_TRAIN]["ts"].max()
        assert snap2.boundary_ts == boundary
        assert (snap2.train_pd["partition"] <= N_TRAIN).all()

    def test_probability_matrices_aligned(self, snap2, prep):
        C = prep.n_categories
        assert snap2.p_l.shape == (len(snap2.users), C)
        assert np.allclose(snap2.p_l.sum(axis=1), 1.0, atol=1e-6)
        for w in (1, 5, 10):
            assert np.allclose(snap2.p_s[w].sum(axis=1), 1.0, atol=1e-6)

    def test_stats_per_window(self, snap2):
        # larger window => fewer long-term tokens
        t1 = snap2.stats[1].n_p_total.sum()
        t10 = snap2.stats[10].n_p_total.sum()
        assert t10 < t1

    def test_cached(self, spark, prep):
        assert snapshot(spark, prep, N_TRAIN) is snapshot(spark, prep, N_TRAIN)

    def test_invalid_upto(self, spark, prep):
        with pytest.raises(ValueError):
            snapshot(spark, prep, 0)
        with pytest.raises(ValueError):
            snapshot(spark, prep, N_PARTITIONS)


class TestTestItems:
    def test_truth_sets_nonempty(self, prep):
        items = harness_test_items(prep, 3)
        assert len(items) > 0
        assert all(len(truth) >= 1 for _, truth in items)

    def test_items_belong_to_partition(self, prep):
        items = {i for i, _ in harness_test_items(prep, 3)}
        part3 = set(prep.inter_pd[prep.inter_pd["partition"] == 3]["item_id"])
        assert items == part3


class TestItemQuery:
    def test_expansion_adds_tokens(self, prep, snap2):
        iid = harness_test_items(prep, 3)[0][0]
        q_ne = item_query(prep, iid, None, expand=False)
        q_ex = item_query(prep, iid, snap2.expmap, expand=True)
        assert len(q_ex.entities) >= len(q_ne.entities)
        assert all(w == 1.0 for w in q_ne.weights)


class TestStreamEval:
    def test_all_methods_produce_valid_precision(self, spark, prep):
        for method in ("ssrec", "ssrec-ne", "ctt", "ucd"):
            res = run_stream_eval(
                spark, prep, method=method, k_list=(5, 10), lam=0.4, w=5
            )
            for v in res.values():
                assert 0.0 <= v <= 1.0

    def test_ssrec_beats_random_floor(self, spark, prep):
        res = run_stream_eval(spark, prep, method="ssrec", k_list=(10,), lam=0.4, w=5)
        # ~200 users; random top-10 would hit ~|truth|/U ≈ a few percent
        assert res[10] > 0.05

    def test_updates_help(self, spark, prep):
        up = run_stream_eval(spark, prep, method="ssrec", k_list=(10,), lam=0.4, w=5)
        nu = run_stream_eval(
            spark, prep, method="ssrec", k_list=(10,), lam=0.4, w=5, update=False
        )
        assert up[10] > nu[10]

    def test_unknown_method_raises(self, spark, prep):
        with pytest.raises(ValueError):
            run_stream_eval(spark, prep, method="mystery")

    def test_index_path_matches_naive_exhaustive(self, spark, prep, snap2):
        """ssrec-index in exhaustive mode returns exactly the naive ranking
        on real pipeline data — the end-to-end Lemma 1-2 guarantee."""
        lam, w = 0.4, 5
        index = build_index(snap2, lam=lam, w=w)
        fn = ssrec_topk_fn(snap2, lam, w)
        for iid, _ in harness_test_items(prep, 3)[:10]:
            q = item_query(prep, iid, snap2.expmap, expand=True)
            got = [u for u, _ in index.query(q, 10, mode="exhaustive")[0]]
            ref = [u for u, _ in fn(q, 10)]
            assert got == ref


class TestRunners:
    def test_table2_rows(self, spark, prep):
        rows = run_table2(spark, prep, block_nums=(1, 5, 10))
        assert [r["target_blocks"] for r in rows] == [1, 5, 10]
        assert rows[-1]["max_entity_num"] <= rows[0]["max_entity_num"]

    def test_efficiency_rows(self, spark, prep):
        rows = run_efficiency(
            spark, prep, k=10, max_items=5, n_parts_list=(2, 3)
        )
        assert len(rows) == 2
        for r in rows:
            assert r["ssrec_cppse_ms"] > 0
            assert r["ctt_ms"] > 0
            assert r["ucd_ms"] > 0
        assert rows[1]["n_interactions"] > rows[0]["n_interactions"]

    def test_update_cost_rows(self, spark, prep):
        rows = run_update_cost(spark, prep, sizes=(20, 80))
        assert rows[0]["update_size"] == 20
        assert rows[1]["update_size"] == 80
        assert all(r["total_s"] >= 0 for r in rows)
