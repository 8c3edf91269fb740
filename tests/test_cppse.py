"""Tests for the full CPPse-index: exact top-k vs the naive scorer,
pruning, hash candidate filtering, and Algorithm-2 maintenance."""
import numpy as np
import pytest

from repro.core.matching import ItemQuery, score_users, top_k_users
from repro.index.cppse import CPPseIndex
from tests.test_sigtree import make_probs, make_stats


def make_index(n_users=40, n_cat=5, seed=0, lam=0.4, n_blocks=4, **kw):
    stats = make_stats(n_users=n_users, n_prod=6, n_ent=12, seed=seed)
    p_l, p_s = make_probs(stats, n_cat=n_cat, seed=seed + 1)
    # category-entity pairs: pretend each user consumed his nonzero entities
    # under his argmax p_l category
    pairs = []
    for u, name in enumerate(stats.users):
        c = int(p_l[u].argmax())
        for j in np.nonzero(stats.n_ue[u])[0]:
            pairs.append((name, c, stats.entities[j]))
    idx = CPPseIndex.build(
        stats, p_l, p_s, pairs, lam=lam, n_blocks=n_blocks, **kw
    )
    return stats, p_l, p_s, idx


def rand_query(stats, n_cat, g, item_id=0):
    ents = [
        stats.entities[int(g.integers(0, len(stats.entities)))]
        for _ in range(int(g.integers(1, 5)))
    ]
    ws = [1.0] + [round(float(g.random()), 2) + 0.01 for _ in ents[1:]]
    return ItemQuery(
        item_id,
        int(g.integers(0, n_cat)),
        stats.producers[int(g.integers(0, len(stats.producers)))],
        tuple(ents),
        tuple(ws),
    )


class TestBuild:
    def test_blocks_partition_users(self):
        stats, _, _, idx = make_index()
        flat = sorted(u for b in idx.blocks for u in b)
        assert flat == list(range(len(stats.users)))

    def test_tree_per_block_category(self):
        stats, p_l, _, idx = make_index(n_cat=5)
        assert len(idx.trees) == len(idx.blocks) * 5

    def test_all_trees_hold_their_block(self):
        stats, _, _, idx = make_index()
        for (b, c), tree in idx.trees.items():
            assert set(tree.user_leaf) == set(idx.blocks[b])

    def test_invariants_hold_everywhere(self):
        _, _, _, idx = make_index()
        assert all(t.check_invariants() for t in idx.trees.values())

    def test_hash_table_populated(self):
        _, _, _, idx = make_index()
        assert len(idx.table) > 0


class TestQueryExactness:
    """mode='exhaustive' must return EXACTLY the naive top-k."""

    @pytest.mark.parametrize("seed", range(6))
    def test_topk_equals_naive(self, seed):
        stats, p_l, p_s, idx = make_index(seed=seed)
        g = np.random.default_rng(seed + 100)
        for t in range(4):
            q = rand_query(stats, 5, g, item_id=t)
            got, _ = idx.query(q, k=5, mode="exhaustive")
            ref = top_k_users(score_users(stats, p_l, p_s, q, 0.4), stats.users, 5)
            assert [u for u, _ in got] == [u for u, _ in ref]
            assert np.allclose([s for _, s in got], [s for _, s in ref])

    def test_k_larger_than_population(self):
        stats, p_l, p_s, idx = make_index(n_users=6, n_blocks=2)
        g = np.random.default_rng(0)
        q = rand_query(stats, 5, g)
        got, _ = idx.query(q, k=50, mode="exhaustive")
        assert len(got) == 6

    def test_oov_producer_and_entity(self):
        stats, p_l, p_s, idx = make_index()
        q = ItemQuery(0, 1, "never_seen_producer", ("never_seen_entity",), (1.0,))
        got, _ = idx.query(q, k=3, mode="exhaustive")
        ref = top_k_users(score_users(stats, p_l, p_s, q, 0.4), stats.users, 3)
        assert [u for u, _ in got] == [u for u, _ in ref]

    def test_invalid_k(self):
        _, _, _, idx = make_index()
        with pytest.raises(ValueError):
            idx.query(ItemQuery(0, 0, "p0", ("e0",), (1.0,)), k=0)

    def test_invalid_mode(self):
        _, _, _, idx = make_index()
        with pytest.raises(ValueError):
            idx.locate_trees(ItemQuery(0, 0, "p0", ("e0",), (1.0,)), mode="bogus")


class TestPruning:
    def test_prunes_compared_to_full_scan(self):
        """Branch-and-bound should score fewer leaf entries than the naive
        full scan at small k (the Fig. 10 mechanism)."""
        stats, _, _, idx = make_index(n_users=120, seed=3, n_blocks=8)
        g = np.random.default_rng(5)
        total_leaves = 0
        for t in range(5):
            q = rand_query(stats, 5, g, item_id=t)
            _, qs = idx.query(q, k=3, mode="exhaustive")
            total_leaves += qs.n_leaves_scored
        assert total_leaves < 5 * len(stats.users)

    def test_hash_mode_searches_fewer_or_equal_trees(self):
        stats, _, _, idx = make_index(n_users=60, n_blocks=6)
        g = np.random.default_rng(7)
        q = rand_query(stats, 5, g)
        _, qs_hash = idx.query(q, k=3, mode="hash")
        _, qs_full = idx.query(q, k=3, mode="exhaustive")
        assert qs_hash.n_trees <= qs_full.n_trees

    def test_hash_mode_high_overlap_with_naive(self):
        stats, p_l, p_s, idx = make_index(n_users=80, seed=2, n_blocks=6)
        g = np.random.default_rng(9)
        overlaps = []
        for t in range(8):
            q = rand_query(stats, 5, g, item_id=t)
            got, _ = idx.query(q, k=10, mode="hash")
            ref = top_k_users(score_users(stats, p_l, p_s, q, 0.4), stats.users, 10)
            overlaps.append(
                len({u for u, _ in got} & {u for u, _ in ref}) / 10
            )
        assert np.mean(overlaps) > 0.5

    def test_unseen_entities_fall_back_to_category_trees(self):
        _, _, _, idx = make_index()
        q = ItemQuery(0, 2, "p0", ("totally_new",), (1.0,))
        trees = idx.locate_trees(q, mode="hash")
        assert len(trees) == len(
            [1 for (b, c) in idx.trees if c == 2]
        )


class TestMaintenance:
    def test_update_matches_rebuilt_naive(self):
        """Algorithm 2's incremental update must give the same ranking as
        recomputing the naive scores over the updated counts."""
        stats, p_l, p_s, idx = make_index(seed=4)
        u_name = stats.users[5]
        events = [(1, "p2", ["e3", "e4"]), (1, "p2", ["e3"])]
        idx.update_user_profile(u_name, events)
        # mirror the update in the dense stats
        stats.n_up[5, stats.prod_idx["p2"]] += 2
        stats.n_ue[5, stats.ent_idx["e3"]] += 2
        stats.n_ue[5, stats.ent_idx["e4"]] += 1
        stats.n_p_total[5] += 2
        stats.n_e_total[5] += 3
        stats.refresh()
        g = np.random.default_rng(11)
        for t in range(3):
            q = rand_query(stats, 5, g, item_id=t)
            got, _ = idx.query(q, k=5, mode="exhaustive")
            ref = top_k_users(score_users(stats, p_l, p_s, q, 0.4), stats.users, 5)
            assert [u for u, _ in got] == [u for u, _ in ref]

    def test_update_with_new_entity_registers_pair(self):
        stats, _, _, idx = make_index()
        u_name = stats.users[0]
        before = len(idx.table)
        idx.update_user_profile(u_name, [(0, "p0", ["brand_new_ent"])])
        assert "brand_new_ent" in idx.ctx.ent_idx
        assert len(idx.table) > before
        q = ItemQuery(0, 0, "p0", ("brand_new_ent",), (1.0,))
        got, _ = idx.query(q, k=3, mode="hash")
        assert len(got) == 3

    def test_update_new_probabilities(self):
        stats, p_l, p_s, idx = make_index()
        new_pl = np.zeros(5)
        new_pl[2] = 1.0
        idx.update_user_profile(stats.users[3], [], p_l_row=new_pl, p_s_row=new_pl)
        b = idx.user_block[3]
        assert idx.trees[(b, 2)].user_leaf[3].sig.p_l == 1.0

    def test_insert_new_user_found_by_query(self):
        stats, _, _, idx = make_index()
        idx.update_user_profile(
            "newcomer", [(0, "p0", ["e0", "e1"]), (0, "p0", ["e0"])]
        )
        assert "newcomer" in idx.users
        got, _ = idx.query(
            ItemQuery(0, 0, "p0", ("e0",), (1.0,)), k=len(idx.users), mode="exhaustive"
        )
        assert "newcomer" in {u for u, _ in got}
        assert all(t.check_invariants() for t in idx.trees.values())

    def test_invariants_after_many_updates(self):
        stats, _, _, idx = make_index()
        g = np.random.default_rng(13)
        for i in range(20):
            u = stats.users[int(g.integers(0, len(stats.users)))]
            ev = [(int(g.integers(0, 5)), "p1", [f"e{int(g.integers(0, 12))}"])]
            idx.update_user_profile(u, ev)
        assert all(t.check_invariants() for t in idx.trees.values())


class TestBlockVocab:
    def test_vocab_sizes_shape(self):
        _, _, _, idx = make_index()
        sizes = idx.block_vocab_sizes()
        assert len(sizes) == len(idx.blocks)
        for n_users, n_ents, n_prods in sizes:
            assert n_users >= 1
            assert 0 <= n_ents <= 12
            assert 0 <= n_prods <= 6

    def test_more_blocks_smaller_max_vocab(self):
        """The Table II effect: more blocks => smaller per-block vocab."""
        stats1, _, _, idx1 = make_index(n_users=100, seed=6, n_blocks=1)
        _, _, _, idx2 = make_index(n_users=100, seed=6, n_blocks=10)
        max1 = max(e for _, e, _ in idx1.block_vocab_sizes())
        max2 = max(e for _, e, _ in idx2.block_vocab_sizes())
        assert max2 <= max1
