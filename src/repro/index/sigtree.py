"""Extended signature trees (§V-A) — entries, encodings and upper bounds.

Each tree stores the user profiles of one (user block, category) pair.
Two entry kinds exist:

* **LEntry** (leaf) — one user's signature: the BiHMM probabilities
  ``p_l(c), p_s(c)``, the *impact lists* ``P_{U^p}`` and ``P_E`` (sparse
  dicts of Dirichlet-smoothed probabilities for producers/entities the user
  actually consumed) and the token totals ``|U^p|, |E|`` that reconstruct
  the smoothing floor of anything absent from the dicts. Raw counts are
  kept alongside so Algorithm 2 can update the signature incrementally.
* **IEntry** (internal) — a virtual "user" covering its children: the
  componentwise ``max`` of the probabilities and the ``min`` of the totals
  (floors decrease in the totals, so ``min`` maximises them). By
  construction every IEntry value dominates every descendant's effective
  value — Lemmas 1–2 — so the branch-and-bound never falsely prunes, and a
  leaf's score is *exactly* Eq. (3) as computed by the naive scorer.

Following the paper's dynamic-maintenance rule, nodes are built at 80 %
fanout, reserving 20 % slack for insertions.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np

from repro.core.matching import ItemQuery
from repro.core.profiles import ProfileStats

_TINY = 1e-300


@dataclass
class ScoringContext:
    """Shared smoothing/backgrounds for every entry score in one index."""

    bg_p: np.ndarray
    bg_e: np.ndarray
    mu_p: float
    mu_e: float
    lam: float
    prod_idx: dict[str, int]
    ent_idx: dict[str, int]

    @property
    def oov_bg_p(self) -> float:
        return 1.0 / (len(self.bg_p) + 1)

    @property
    def oov_bg_e(self) -> float:
        return 1.0 / (len(self.bg_e) + 1)

    @classmethod
    def from_stats(cls, stats: ProfileStats, lam: float) -> "ScoringContext":
        return cls(
            bg_p=stats.bg_p.copy(),
            bg_e=stats.bg_e.copy(),
            mu_p=stats.mu_p,
            mu_e=stats.mu_e,
            lam=lam,
            prod_idx=dict(stats.prod_idx),
            ent_idx=dict(stats.ent_idx),
        )

    def add_entity(self, entity: str) -> int:
        """Register a previously unseen entity (Algorithm 2's "new incoming
        entity" path). It gets the out-of-vocabulary background mass; exact
        backgrounds are restored at the next periodic re-index."""
        j = len(self.bg_e)
        self.ent_idx[entity] = j
        self.bg_e = np.append(self.bg_e, self.oov_bg_e)
        return j


@dataclass
class Signature:
    """The statistics Definition 2 scores an entry from."""

    p_l: float
    p_s: float
    p_up: dict[int, float]
    p_e: dict[int, float]
    n_p_total: float
    n_e_total: float


@dataclass(frozen=True)
class EncodedQuery:
    """An :class:`~repro.core.matching.ItemQuery` resolved against the
    context vocabularies: ``producer`` / token entity ids are ``None`` when
    out-of-vocabulary (they then score at the smoothing floor)."""

    category: int
    producer: int | None
    tokens: tuple[tuple[int | None, float], ...]


def encode_query(q: ItemQuery, ctx: ScoringContext) -> EncodedQuery:
    return EncodedQuery(
        category=q.category,
        producer=ctx.prod_idx.get(q.producer),
        tokens=tuple((ctx.ent_idx.get(e), w) for e, w in zip(q.entities, q.weights)),
    )


def leaf_signature(
    counts_p: dict[int, float],
    counts_e: dict[int, float],
    p_l: float,
    p_s: float,
    ctx: ScoringContext,
) -> Signature:
    """Build a leaf signature from raw long-term counts. Smoothed values are
    stored only for consumed producers/entities; everything else falls back
    to the floor, reproducing the dense ``ProfileStats`` rows exactly."""
    n_p = float(sum(counts_p.values()))
    n_e = float(sum(counts_e.values()))
    p_up = {
        p: (n + ctx.mu_p * ctx.bg_p[p]) / (n_p + ctx.mu_p) for p, n in counts_p.items()
    }
    p_e = {
        e: (n + ctx.mu_e * ctx.bg_e[e]) / (n_e + ctx.mu_e) for e, n in counts_e.items()
    }
    return Signature(p_l=p_l, p_s=p_s, p_up=p_up, p_e=p_e, n_p_total=n_p, n_e_total=n_e)


def merge_signatures(children: list[Signature], ctx: ScoringContext) -> Signature:
    """The IEntry upper-bound signature (componentwise max / min-totals).

    For a producer/entity present in only some children, the merged value
    also dominates the *floors* of the children missing it, which is what
    makes Lemma 2 hold for smoothed scores.
    """
    if not children:
        raise ValueError("cannot merge zero signatures")
    n_p = min(c.n_p_total for c in children)
    n_e = min(c.n_e_total for c in children)
    p_up: dict[int, float] = {}
    for c in children:
        for p, v in c.p_up.items():
            p_up[p] = max(p_up.get(p, 0.0), v)
    for p in p_up:
        p_up[p] = max(p_up[p], ctx.mu_p * ctx.bg_p[p] / (n_p + ctx.mu_p))
    p_e: dict[int, float] = {}
    for c in children:
        for e, v in c.p_e.items():
            p_e[e] = max(p_e.get(e, 0.0), v)
    for e in p_e:
        p_e[e] = max(p_e[e], ctx.mu_e * ctx.bg_e[e] / (n_e + ctx.mu_e))
    return Signature(
        p_l=max(c.p_l for c in children),
        p_s=max(c.p_s for c in children),
        p_up=p_up,
        p_e=p_e,
        n_p_total=n_p,
        n_e_total=n_e,
    )


def entry_score(sig: Signature, q: EncodedQuery, ctx: ScoringContext) -> float:
    """Definition 2 / Eq. (3): the relevance of an item query to an entry.

    For a leaf this equals ``matching.score_users`` exactly; for an IEntry
    it is the Recommendation Upper Bound of its subtree.
    """
    if q.producer is None:
        pp = ctx.mu_p * ctx.oov_bg_p / (sig.n_p_total + ctx.mu_p)
    else:
        v = sig.p_up.get(q.producer)
        pp = (
            v
            if v is not None
            else ctx.mu_p * ctx.bg_p[q.producer] / (sig.n_p_total + ctx.mu_p)
        )
    es = 0.0
    denom = sig.n_e_total + ctx.mu_e
    for j, w in q.tokens:
        if j is None:
            es += w * ctx.mu_e * ctx.oov_bg_e / denom
        else:
            v = sig.p_e.get(j)
            es += w * (v if v is not None else ctx.mu_e * ctx.bg_e[j] / denom)
    return (1.0 - ctx.lam) * (
        math.log(max(sig.p_l, _TINY)) + math.log(max(pp, _TINY)) + math.log(max(es, _TINY))
    ) + ctx.lam * math.log(max(sig.p_s, _TINY))


# --------------------------------------------------------------- the tree


@dataclass
class LeafEntry:
    """LEntry: one user's profile record in a tree."""

    user: int
    user_id: str
    sig: Signature
    counts_p: dict[int, float]
    counts_e: dict[int, float]
    parent: "Node | None" = None


@dataclass
class Node:
    """IEntry with its child subtree (children are Nodes or LeafEntries)."""

    sig: Signature
    children: list = field(default_factory=list)
    parent: "Node | None" = None

    @property
    def is_leaf_node(self) -> bool:
        return bool(self.children) and isinstance(self.children[0], LeafEntry)


class SigTree:
    """One extended signature tree: the users of one block under one
    category, with bulk build, KNN traversal hooks, and Algorithm 2
    maintenance (update in place + insert with 20 % reserved slack)."""

    RESERVE = 0.8  # build fill factor; the remaining 20 % absorbs inserts

    def __init__(self, block_id: int, category: int, ctx: ScoringContext, fanout: int = 8):
        if fanout < 2:
            raise ValueError("fanout must be >= 2")
        self.block_id = block_id
        self.category = category
        self.ctx = ctx
        self.fanout = fanout
        self.root: Node | None = None
        self.user_leaf: dict[int, LeafEntry] = {}

    # ------------------------------------------------------------- build

    @classmethod
    def build(
        cls,
        block_id: int,
        category: int,
        entries: list[LeafEntry],
        ctx: ScoringContext,
        fanout: int = 8,
    ) -> "SigTree":
        t = cls(block_id, category, ctx, fanout)
        if not entries:
            return t
        fill = max(2, int(fanout * cls.RESERVE))
        level: list = []
        for lo in range(0, len(entries), fill):
            grp = entries[lo : lo + fill]
            node = Node(sig=merge_signatures([e.sig for e in grp], ctx), children=list(grp))
            for e in grp:
                e.parent = node
            level.append(node)
        while len(level) > 1:
            nxt: list[Node] = []
            for lo in range(0, len(level), fill):
                grp = level[lo : lo + fill]
                node = Node(
                    sig=merge_signatures([n.sig for n in grp], ctx), children=list(grp)
                )
                for n in grp:
                    n.parent = node
                nxt.append(node)
            level = nxt
        t.root = level[0]
        for e in entries:
            t.user_leaf[e.user] = e
        return t

    # ------------------------------------------------------- maintenance

    def _recompute_path(self, node: Node | None) -> None:
        while node is not None:
            node.sig = merge_signatures(
                [c.sig for c in node.children], self.ctx
            )
            node = node.parent

    def update_user(self, entry_user: int, sig: Signature) -> None:
        """Replace a user's signature and rebuild its ancestors' bounds."""
        leaf = self.user_leaf[entry_user]
        leaf.sig = sig
        self._recompute_path(leaf.parent)

    def insert(self, entry: LeafEntry) -> None:
        """Insert a new user (Algorithm 2 line 13).

        Fills the reserved slack of an existing leaf node when available,
        else splits by chaining a fresh leaf node under the root.
        """
        if self.root is None:
            self.root = Node(sig=entry.sig, children=[entry])
            entry.parent = self.root
            self.user_leaf[entry.user] = entry
            return
        target: Node | None = None
        stack = [self.root]
        while stack:
            n = stack.pop()
            if n.is_leaf_node:
                if len(n.children) < self.fanout:
                    target = n
                    break
            else:
                stack.extend(c for c in n.children if isinstance(c, Node))
        if target is None:
            target = Node(sig=entry.sig, children=[])
            # chain under the root (splitting amortised by periodic rebuild)
            root = self.root
            if root.is_leaf_node:
                new_root = Node(sig=root.sig, children=[root, target])
                root.parent = new_root
                target.parent = new_root
                self.root = new_root
            else:
                root.children.append(target)
                target.parent = root
        target.children.append(entry)
        entry.parent = target
        self.user_leaf[entry.user] = entry
        self._recompute_path(target)

    # -------------------------------------------------------- inspection

    def leaves(self) -> list[LeafEntry]:
        return list(self.user_leaf.values())

    def check_invariants(self) -> bool:
        """Every IEntry dominates its children (test hook for Lemma 1)."""
        if self.root is None:
            return True
        stack = [self.root]
        while stack:
            n = stack.pop()
            for c in n.children:
                s = c.sig
                if s.p_l > n.sig.p_l + 1e-12 or s.p_s > n.sig.p_s + 1e-12:
                    return False
                if s.n_p_total < n.sig.n_p_total - 1e-12:
                    return False
                if s.n_e_total < n.sig.n_e_total - 1e-12:
                    return False
                if isinstance(c, Node):
                    stack.append(c)
        return True
