"""The CPPse-index (§V): chained hash table + extended signature trees,
branch-and-bound KNN (Algorithm 1) and dynamic maintenance (Algorithm 2).

Construction pipeline (all inputs come from Spark aggregations):

1. users are blocked by one-pass clustering over their long-term
   categorical interest vectors (the BiHMM ``p_l`` rows, cosine
   similarity);
2. per (block, category) an extended signature tree stores the block's
   user signatures — sparse smoothed impact lists plus the BiHMM
   probabilities for that category;
3. every (category, entity) pair occurring in a block's long-term lists is
   hashed into the chained table, pointing at that block's tree for the
   category.

Queries run Algorithm 1: the located trees' roots seed a priority queue
ordered by the Definition-2 upper bound; IEntries expand, LEntries fall
into the size-k max-heap; the heap's minimum is the pruning bound ``LB``.
Because leaf scores equal the naive scorer *exactly* and IEntry bounds
dominate (Lemmas 1–2), ``mode="exhaustive"`` returns exactly the naive
top-k; ``mode="hash"`` adds the paper's hash-table candidate filtering
(only trees sharing a category–entity pair with the query are searched).
"""
from __future__ import annotations

import heapq
import itertools
from dataclasses import dataclass, field

import numpy as np

from repro.core.matching import ItemQuery
from repro.core.profiles import ProfileStats
from repro.index.blocks import threshold_for_blocks
from repro.index.hashing import ChainedHashTable
from repro.index.sigtree import (
    EncodedQuery,
    LeafEntry,
    Node,
    ScoringContext,
    SigTree,
    encode_query,
    entry_score,
    leaf_signature,
    merge_signatures,
)


@dataclass
class QueryStats:
    """Work counters for one KNN query — the efficiency story of Fig. 10."""

    n_trees: int = 0
    n_entries_scored: int = 0
    n_leaves_scored: int = 0


@dataclass
class CPPseIndex:
    ctx: ScoringContext
    n_categories: int
    blocks: list[list[int]]
    user_block: dict[int, int]
    users: list[str]
    trees: dict[tuple[int, int], SigTree] = field(default_factory=dict)
    table: ChainedHashTable = field(default_factory=ChainedHashTable)
    threshold: float = 0.0

    # ------------------------------------------------------------- build

    @classmethod
    def build(
        cls,
        stats: ProfileStats,
        p_l: np.ndarray,
        p_s: np.ndarray,
        pairs: list[tuple[str, int, str]],
        *,
        lam: float,
        n_blocks: int = 10,
        fanout: int = 8,
        n_buckets: int = 1024,
    ) -> "CPPseIndex":
        """Build from a profile snapshot.

        ``p_l`` / ``p_s`` are the (U, C) BiHMM probability matrices aligned
        with ``stats.users``; ``pairs`` the distinct (consumer, category,
        entity) triples from :func:`repro.core.profiles.category_entity_pairs`.
        """
        ctx = ScoringContext.from_stats(stats, lam)
        n_categories = p_l.shape[1]
        threshold, blocks = threshold_for_blocks(p_l, n_blocks)
        user_block = {u: b for b, idxs in enumerate(blocks) for u in idxs}
        idx = cls(
            ctx=ctx,
            n_categories=n_categories,
            blocks=blocks,
            user_block=user_block,
            users=list(stats.users),
            table=ChainedHashTable(n_buckets),
            threshold=threshold,
        )
        # per-user sparse count dicts (shared across that user's trees)
        counts_p = [
            {int(j): float(row[j]) for j in np.nonzero(row)[0]} for row in stats.n_up
        ]
        counts_e = [
            {int(j): float(row[j]) for j in np.nonzero(row)[0]} for row in stats.n_ue
        ]
        for b, idxs in enumerate(blocks):
            for c in range(n_categories):
                entries = []
                for u in idxs:
                    cp = counts_p[u]
                    ce = counts_e[u]
                    entries.append(
                        LeafEntry(
                            user=u,
                            user_id=stats.users[u],
                            sig=leaf_signature(
                                cp, ce, float(p_l[u, c]), float(p_s[u, c]), ctx
                            ),
                            counts_p=cp,
                            counts_e=ce,
                        )
                    )
                idx.trees[(b, c)] = SigTree.build(b, c, entries, ctx, fanout)
        for consumer, category, entity in pairs:
            u = stats.user_idx.get(consumer)
            if u is None:
                continue
            b = user_block[u]
            tree = idx.trees.get((b, int(category)))
            if tree is not None:
                idx.table.insert(int(category), entity, tree)
        return idx

    # ------------------------------------------------------------- query

    def locate_trees(self, q: ItemQuery, mode: str = "hash") -> list[SigTree]:
        """Step 1 of Algorithm 1: hash the query's category–entity pairs to
        candidate trees. Falls back to every tree of the category when no
        pair matches (all-new entities)."""
        cat_trees = [
            self.trees[(b, q.category)]
            for b in range(len(self.blocks))
            if (b, q.category) in self.trees
        ]
        if mode == "exhaustive":
            return cat_trees
        if mode != "hash":
            raise ValueError("mode must be 'hash' or 'exhaustive'")
        found: list[SigTree] = []
        seen: set[int] = set()
        for e in q.entities:
            for tree in self.table.lookup(q.category, e):
                if id(tree) not in seen:
                    seen.add(id(tree))
                    found.append(tree)
        return found or cat_trees

    def query(
        self, q: ItemQuery, k: int, *, mode: str = "hash"
    ) -> tuple[list[tuple[str, float]], QueryStats]:
        """Algorithm 1: top-k users for the incoming item."""
        if k < 1:
            raise ValueError("k must be >= 1")
        qs = QueryStats()
        trees = self.locate_trees(q, mode)
        qs.n_trees = len(trees)
        eq = encode_query(q, self.ctx)
        tie = itertools.count()
        curr_p: list[tuple[float, int, object]] = []  # min-heap on -score
        for tree in trees:
            if tree.root is None:
                continue
            s = entry_score(tree.root.sig, eq, self.ctx)
            qs.n_entries_scored += 1
            heapq.heappush(curr_p, (-s, next(tie), tree.root))
        u_k: list[tuple[float, str]] = []  # min-heap of (score, user)
        lb = -np.inf
        while curr_p:
            neg, _, entry = heapq.heappop(curr_p)
            score = -neg
            if len(u_k) == k and score <= lb:
                break  # every remaining entry is bounded below LB
            if isinstance(entry, LeafEntry):
                if len(u_k) < k:
                    heapq.heappush(u_k, (score, entry.user_id))
                else:
                    heapq.heappushpop(u_k, (score, entry.user_id))
                if len(u_k) == k:
                    lb = u_k[0][0]
            else:
                assert isinstance(entry, Node)
                for child in entry.children:
                    s = entry_score(child.sig, eq, self.ctx)
                    qs.n_entries_scored += 1
                    if isinstance(child, LeafEntry):
                        qs.n_leaves_scored += 1
                    if len(u_k) < k or s > lb:
                        heapq.heappush(curr_p, (-s, next(tie), child))
        ranked = sorted(u_k, key=lambda t: (-t[0], t[1]))
        return [(u, s) for s, u in ranked], qs

    # ------------------------------------------------------ maintenance

    def update_user_profile(
        self,
        user_id: str,
        new_events: list[tuple[int, str, list[str]]],
        p_l_row: np.ndarray | None = None,
        p_s_row: np.ndarray | None = None,
    ) -> None:
        """Algorithm 2 for one user: fold freshly flushed window events
        (``(category, producer, entities)`` triples) into the long-term
        counts, re-derive the signatures and rebuild ancestor bounds.

        Unseen entities are added to the context vocabulary and their
        category–entity pairs inserted into the hash table (lines 6–9).
        New users are routed to :meth:`insert_user`.
        """
        try:
            u = self.users.index(user_id)
        except ValueError:
            self.insert_user(user_id, new_events, p_l_row, p_s_row)
            return
        b = self.user_block[u]
        sample_tree = self.trees[(b, 0)]
        leaf = sample_tree.user_leaf[u]
        for category, producer, entities in new_events:
            p = self.ctx.prod_idx.get(producer)
            if p is not None:
                leaf.counts_p[p] = leaf.counts_p.get(p, 0.0) + 1.0
            for e in entities:
                j = self.ctx.ent_idx.get(e)
                if j is None:
                    j = self.ctx.add_entity(e)
                leaf.counts_e[j] = leaf.counts_e.get(j, 0.0) + 1.0
                self.table.insert(int(category), e, self.trees[(b, int(category))])
        for c in range(self.n_categories):
            tree = self.trees[(b, c)]
            lf = tree.user_leaf[u]
            pl = float(p_l_row[c]) if p_l_row is not None else lf.sig.p_l
            ps = float(p_s_row[c]) if p_s_row is not None else lf.sig.p_s
            tree.update_user(
                u, leaf_signature(leaf.counts_p, leaf.counts_e, pl, ps, self.ctx)
            )

    def insert_user(
        self,
        user_id: str,
        events: list[tuple[int, str, list[str]]],
        p_l_row: np.ndarray | None = None,
        p_s_row: np.ndarray | None = None,
    ) -> None:
        """Algorithm 2's new-user path: block by categorical interest, then
        insert a leaf into each of the block's trees."""
        u = len(self.users)
        self.users.append(user_id)
        counts_p: dict[int, float] = {}
        counts_e: dict[int, float] = {}
        cat_counts = np.zeros(self.n_categories)
        pair_set: set[tuple[int, str]] = set()
        for category, producer, entities in events:
            cat_counts[int(category)] += 1
            p = self.ctx.prod_idx.get(producer)
            if p is not None:
                counts_p[p] = counts_p.get(p, 0.0) + 1.0
            for e in entities:
                j = self.ctx.ent_idx.get(e)
                if j is None:
                    j = self.ctx.add_entity(e)
                counts_e[j] = counts_e.get(j, 0.0) + 1.0
                pair_set.add((int(category), e))
        vec = (
            np.asarray(p_l_row, dtype=np.float64)
            if p_l_row is not None
            else (cat_counts + 1e-9)
        )
        sims = []
        for bidx in self.blocks:
            # compare against the block centroid in p_l space
            centroid = np.zeros(self.n_categories)
            for v in bidx:
                for c in range(self.n_categories):
                    centroid[c] += self.trees[(self.user_block[v], c)].user_leaf[v].sig.p_l
            centroid /= max(len(bidx), 1)
            denom = np.linalg.norm(centroid) * np.linalg.norm(vec)
            sims.append(float(centroid @ vec / denom) if denom > 0 else 0.0)
        b = int(np.argmax(sims)) if sims else 0
        if not self.blocks:
            self.blocks.append([])
        self.blocks[b].append(u)
        self.user_block[u] = b
        for c in range(self.n_categories):
            pl = float(p_l_row[c]) if p_l_row is not None else 1.0 / self.n_categories
            ps = float(p_s_row[c]) if p_s_row is not None else 1.0 / self.n_categories
            entry = LeafEntry(
                user=u,
                user_id=user_id,
                sig=leaf_signature(counts_p, counts_e, pl, ps, self.ctx),
                counts_p=counts_p,
                counts_e=counts_e,
            )
            if (b, c) not in self.trees:
                self.trees[(b, c)] = SigTree(b, c, self.ctx)
            self.trees[(b, c)].insert(entry)
        for category, e in pair_set:
            self.table.insert(category, e, self.trees[(b, category)])

    # ------------------------------------------------------- inspection

    def block_vocab_sizes(self) -> list[tuple[int, int, int]]:
        """Table II inputs: per block, (n_users, n_entities, n_producers)
        where vocab = union over the block's users' consumed sets."""
        out = []
        for b, idxs in enumerate(self.blocks):
            ents: set[int] = set()
            prods: set[int] = set()
            for u in idxs:
                leaf = self.trees[(b, 0)].user_leaf[u]
                ents.update(leaf.counts_e)
                prods.update(leaf.counts_p)
            out.append((len(idxs), len(ents), len(prods)))
        return out
