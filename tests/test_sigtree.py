"""Tests for the extended signature tree: leaf-score exactness, IEntry
upper bounds (Lemmas 1-2), build/maintenance invariants."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.matching import ItemQuery, score_users
from repro.core.profiles import ProfileStats
from repro.index.sigtree import (
    LeafEntry,
    Node,
    ScoringContext,
    SigTree,
    encode_query,
    entry_score,
    leaf_signature,
    merge_signatures,
)


def make_stats(n_users=12, n_prod=5, n_ent=9, seed=0, mu_p=2.0, mu_e=4.0):
    """Random-but-valid ProfileStats for driver-only tests."""
    g = np.random.default_rng(seed)
    n_up = g.integers(0, 6, (n_users, n_prod)).astype(float)
    n_ue = g.integers(0, 8, (n_users, n_ent)).astype(float)
    bg_p = g.random(n_prod) + 0.1
    bg_p /= bg_p.sum()
    bg_e = g.random(n_ent) + 0.1
    bg_e /= bg_e.sum()
    users = [f"u{i}" for i in range(n_users)]
    producers = [f"p{i}" for i in range(n_prod)]
    entities = [f"e{i}" for i in range(n_ent)]
    return ProfileStats(
        users=users,
        producers=producers,
        entities=entities,
        user_idx={u: i for i, u in enumerate(users)},
        prod_idx={p: i for i, p in enumerate(producers)},
        ent_idx={e: i for i, e in enumerate(entities)},
        n_up=n_up,
        n_ue=n_ue,
        n_p_total=n_up.sum(axis=1),
        n_e_total=n_ue.sum(axis=1),
        bg_p=bg_p,
        bg_e=bg_e,
        mu_p=mu_p,
        mu_e=mu_e,
    )


def make_probs(stats, n_cat=4, seed=1):
    g = np.random.default_rng(seed)
    p_l = g.dirichlet(np.ones(n_cat), size=len(stats.users))
    p_s = g.dirichlet(np.ones(n_cat), size=len(stats.users))
    return p_l, p_s


def leaf_for(stats, ctx, p_l, p_s, u, c):
    cp = {int(j): float(stats.n_up[u, j]) for j in np.nonzero(stats.n_up[u])[0]}
    ce = {int(j): float(stats.n_ue[u, j]) for j in np.nonzero(stats.n_ue[u])[0]}
    return LeafEntry(
        user=u,
        user_id=stats.users[u],
        sig=leaf_signature(cp, ce, float(p_l[u, c]), float(p_s[u, c]), ctx),
        counts_p=cp,
        counts_e=ce,
    )


@pytest.fixture
def setup():
    stats = make_stats()
    p_l, p_s = make_probs(stats)
    ctx = ScoringContext.from_stats(stats, lam=0.4)
    return stats, p_l, p_s, ctx


class TestLeafScoreExactness:
    """A leaf's Definition-2 score must equal the naive Eq.(3) scorer."""

    @pytest.mark.parametrize("qspec", [
        (0, "p0", ["e0"], [1.0]),
        (1, "p3", ["e1", "e2", "e2"], [1.0, 1.0, 0.7]),
        (2, "unknown_producer", ["e5"], [1.0]),
        (3, "p1", ["unknown_entity", "e8"], [1.0, 0.9]),
        (0, "p2", ["e0", "e1", "e2", "e3", "e4"], [1.0, 0.9, 0.8, 0.7, 0.6]),
    ])
    def test_exact_match(self, setup, qspec):
        stats, p_l, p_s, ctx = setup
        c, prod, ents, ws = qspec
        q = ItemQuery(0, c, prod, tuple(ents), tuple(ws))
        ref = score_users(stats, p_l, p_s, q, ctx.lam)
        eq = encode_query(q, ctx)
        for u in range(len(stats.users)):
            leaf = leaf_for(stats, ctx, p_l, p_s, u, c)
            assert np.isclose(entry_score(leaf.sig, eq, ctx), ref[u], rtol=1e-12)


class TestMergeUpperBound:
    def test_merge_dominates_children_componentwise(self, setup):
        stats, p_l, p_s, ctx = setup
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, 0) for u in range(6)]
        m = merge_signatures([l.sig for l in leaves], ctx)
        for l in leaves:
            assert m.p_l >= l.sig.p_l and m.p_s >= l.sig.p_s
            assert m.n_p_total <= l.sig.n_p_total
            assert m.n_e_total <= l.sig.n_e_total

    def test_merge_empty_raises(self, setup):
        _, _, _, ctx = setup
        with pytest.raises(ValueError):
            merge_signatures([], ctx)

    @settings(max_examples=30, deadline=None)
    @given(seed=st.integers(0, 500), cat=st.integers(0, 3))
    def test_lemma2_ientry_bounds_every_leaf(self, seed, cat):
        """Lemma 2 as a property: IEntry score >= every covered user's
        score, for random stats and random queries."""
        g = np.random.default_rng(seed)
        stats = make_stats(n_users=8, seed=seed)
        p_l, p_s = make_probs(stats, seed=seed + 1)
        ctx = ScoringContext.from_stats(stats, lam=float(g.random()))
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, cat) for u in range(8)]
        m = merge_signatures([l.sig for l in leaves], ctx)
        ents = [f"e{int(g.integers(0, 9))}" for _ in range(int(g.integers(1, 5)))]
        ents += ["zz_unseen"] * int(g.integers(0, 2))
        ws = [float(g.random()) + 0.01 for _ in ents]
        q = ItemQuery(0, cat, f"p{int(g.integers(0, 5))}", tuple(ents), tuple(ws))
        eq = encode_query(q, ctx)
        bound = entry_score(m, eq, ctx)
        for l in leaves:
            assert bound >= entry_score(l.sig, eq, ctx) - 1e-9

    def test_lemma1_nested_merges_monotone(self, setup):
        stats, p_l, p_s, ctx = setup
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, 1) for u in range(8)]
        inner1 = merge_signatures([l.sig for l in leaves[:4]], ctx)
        inner2 = merge_signatures([l.sig for l in leaves[4:]], ctx)
        outer = merge_signatures([inner1, inner2], ctx)
        q = ItemQuery(0, 1, "p1", ("e1", "e4"), (1.0, 0.8))
        eq = encode_query(q, ctx)
        assert entry_score(outer, eq, ctx) >= entry_score(inner1, eq, ctx) - 1e-12
        assert entry_score(outer, eq, ctx) >= entry_score(inner2, eq, ctx) - 1e-12


class TestBuild:
    def test_all_users_present(self, setup):
        stats, p_l, p_s, ctx = setup
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, 0) for u in range(12)]
        t = SigTree.build(0, 0, leaves, ctx, fanout=4)
        assert set(t.user_leaf) == set(range(12))
        assert t.check_invariants()

    def test_empty_tree(self, setup):
        _, _, _, ctx = setup
        t = SigTree.build(0, 0, [], ctx)
        assert t.root is None
        assert t.check_invariants()

    def test_single_user(self, setup):
        stats, p_l, p_s, ctx = setup
        t = SigTree.build(0, 0, [leaf_for(stats, ctx, p_l, p_s, 0, 0)], ctx)
        assert isinstance(t.root, Node)
        assert t.root.is_leaf_node

    def test_fill_factor_respected(self, setup):
        stats, p_l, p_s, ctx = setup
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, 0) for u in range(12)]
        t = SigTree.build(0, 0, leaves, ctx, fanout=8)
        # leaf nodes built at 80% of fanout = 6 users each
        stack = [t.root]
        while stack:
            n = stack.pop()
            if n.is_leaf_node:
                assert len(n.children) <= 6
            else:
                stack.extend(c for c in n.children if isinstance(c, Node))

    def test_invalid_fanout(self, setup):
        _, _, _, ctx = setup
        with pytest.raises(ValueError):
            SigTree(0, 0, ctx, fanout=1)


class TestMaintenance:
    def test_update_user_propagates(self, setup):
        stats, p_l, p_s, ctx = setup
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, 0) for u in range(12)]
        t = SigTree.build(0, 0, leaves, ctx, fanout=4)
        new_sig = leaf_signature({0: 50.0}, {0: 50.0}, 0.99, 0.99, ctx)
        t.update_user(3, new_sig)
        assert t.user_leaf[3].sig.p_l == 0.99
        assert t.check_invariants()
        assert t.root.sig.p_l >= 0.99

    def test_insert_into_reserved_space(self, setup):
        stats, p_l, p_s, ctx = setup
        leaves = [leaf_for(stats, ctx, p_l, p_s, u, 0) for u in range(6)]
        t = SigTree.build(0, 0, leaves, ctx, fanout=8)
        extra = leaf_for(stats, ctx, p_l, p_s, 7, 0)
        t.insert(extra)
        assert 7 in t.user_leaf
        assert t.check_invariants()

    def test_insert_into_empty_tree(self, setup):
        stats, p_l, p_s, ctx = setup
        t = SigTree(0, 0, ctx)
        t.insert(leaf_for(stats, ctx, p_l, p_s, 0, 0))
        assert 0 in t.user_leaf
        assert t.check_invariants()

    def test_many_inserts_keep_invariants(self, setup):
        stats, p_l, p_s, ctx = setup
        t = SigTree(0, 0, ctx, fanout=4)
        for u in range(12):
            t.insert(leaf_for(stats, ctx, p_l, p_s, u, 0))
        assert len(t.user_leaf) == 12
        assert t.check_invariants()
        assert len(t.leaves()) == 12


class TestContextVocab:
    def test_add_entity_extends(self, setup):
        _, _, _, ctx = setup
        n = len(ctx.bg_e)
        j = ctx.add_entity("brand_new")
        assert j == n
        assert ctx.ent_idx["brand_new"] == n
        assert len(ctx.bg_e) == n + 1
