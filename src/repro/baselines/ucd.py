"""UCD baseline — Zanitti, Kosta & Sørensen, "A user-centric diversity by
design recommender system" (WWW 2018 companion), as characterised by the
paper (§VI-B): "UCD is a diversity-based method, where user profiles are
expanded with their neighbours", but "it neglects the significance of
short-term interest".

Reversed to the paper's task (top-k users for an incoming item):

* each user's profile (entity / producer / category count vectors) is
  expanded with the profiles of his ``n_neighbours`` most cosine-similar
  users (weight ``NEIGHBOUR_WEIGHT``) — the "diversity by design" step
  that widens what a user can be matched to;
* the match score is the expanded-profile affinity to the item's entities,
  producer and category;
* a diversity factor ``1 − γ·maxsim(v, recent items of u)`` demotes items
  near-duplicate to something the user just saw.

Like CTT it matches every user sequentially; the neighbour expansion and
the per-user recent-item diversity check make it the slowest method, as in
Fig. 10. No temporal model, no short-term window.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.matching import ItemQuery

N_NEIGHBOURS = 5
NEIGHBOUR_WEIGHT = 0.5
GAMMA_DIVERSITY = 0.2
RECENT_ITEMS = 5
W_ENTITY = 1.0
W_PRODUCER = 0.6
W_CATEGORY = 0.4


@dataclass
class UCDModel:
    users: list[str]
    user_idx: dict[str, int]
    ent_idx: dict[str, int]
    prod_idx: dict[str, int]
    exp_ue: np.ndarray  # (U, E) neighbour-expanded entity counts
    exp_up: np.ndarray  # (U, P) neighbour-expanded producer counts
    exp_uc: np.ndarray  # (U, C) neighbour-expanded category counts
    recent_ents: list[list[set]]  # per user, entity sets of recent items
    n_users: int

    def score_item(self, q: ItemQuery) -> np.ndarray:
        e_idx = [self.ent_idx[e] for e in set(q.entities) if e in self.ent_idx]
        ent_term = self.exp_ue[:, e_idx].sum(axis=1) if e_idx else np.zeros(self.n_users)
        p = self.prod_idx.get(q.producer)
        prod_term = self.exp_up[:, p] if p is not None else np.zeros(self.n_users)
        cat_term = self.exp_uc[:, q.category]
        base = W_ENTITY * ent_term + W_PRODUCER * prod_term + W_CATEGORY * cat_term
        # diversity: sequential per-user pass over recent items (the extra
        # cost that makes UCD slower than CTT in Fig. 10)
        qset = set(q.entities)
        div = np.empty(self.n_users)
        for u in range(self.n_users):
            maxsim = 0.0
            for es in self.recent_ents[u]:
                denom = len(qset | es)
                if denom:
                    maxsim = max(maxsim, len(qset & es) / denom)
            div[u] = 1.0 - GAMMA_DIVERSITY * maxsim
        return base * div

    def top_k(self, q: ItemQuery, k: int) -> list[tuple[str, float]]:
        s = self.score_item(q)
        order = np.lexsort((np.array(self.users, dtype=object), -s))
        return [(self.users[i], float(s[i])) for i in order[:k]]

    def top_k_seq(self, q: ItemQuery, k: int) -> list[tuple[str, float]]:
        """Per-item matching as the stream system performs it: every user
        scored sequentially — profile affinity plus the per-user diversity
        pass over recent items. The extra diversity work is why UCD is the
        slowest method in Fig. 10. Same ranking as :meth:`top_k`."""
        e_idx = [self.ent_idx[e] for e in set(q.entities) if e in self.ent_idx]
        p = self.prod_idx.get(q.producer)
        qset = set(q.entities)
        scores = []
        for u in range(self.n_users):
            ent = 0.0
            for j in e_idx:
                ent += self.exp_ue[u, j]
            base = (
                W_ENTITY * ent
                + (W_PRODUCER * self.exp_up[u, p] if p is not None else 0.0)
                + W_CATEGORY * self.exp_uc[u, q.category]
            )
            maxsim = 0.0
            for es in self.recent_ents[u]:
                denom = len(qset | es)
                if denom:
                    maxsim = max(maxsim, len(qset & es) / denom)
            scores.append(base * (1.0 - GAMMA_DIVERSITY * maxsim))
        order = sorted(range(len(scores)), key=lambda i: (-scores[i], self.users[i]))
        return [(self.users[i], float(scores[i])) for i in order[:k]]


def build_ucd(
    interactions: pd.DataFrame,
    entities_of: dict[int, list[str]],
    n_categories: int,
    *,
    n_neighbours: int = N_NEIGHBOURS,
) -> UCDModel:
    """Build the UCD model: count profiles, kNN neighbour expansion, and
    per-user recent-item memory."""
    if interactions.empty:
        raise ValueError("cannot build UCD from an empty snapshot")
    inter = interactions.reset_index(drop=True)
    users = sorted(inter["consumer"].unique())
    user_idx = {u: i for i, u in enumerate(users)}
    ents = sorted({e for es in entities_of.values() for e in es})
    ent_idx = {e: i for i, e in enumerate(ents)}
    prods = sorted(inter["producer"].unique())
    prod_idx = {p: i for i, p in enumerate(prods)}
    U, E, P = len(users), len(ents), len(prods)

    n_ue = np.zeros((U, E))
    n_up = np.zeros((U, P))
    n_uc = np.zeros((U, n_categories))
    for r in inter.itertuples(index=False):
        u = user_idx[r.consumer]
        n_up[u, prod_idx[r.producer]] += 1
        n_uc[u, int(r.category)] += 1
        for e in set(entities_of.get(int(r.item_id), ())):
            n_ue[u, ent_idx[e]] += 1

    # neighbour expansion on category-profile cosine
    norms = np.linalg.norm(n_uc, axis=1)
    norms[norms == 0] = 1.0
    sim = (n_uc @ n_uc.T) / np.outer(norms, norms)
    np.fill_diagonal(sim, -np.inf)
    k = min(n_neighbours, max(U - 1, 1))
    nbrs = np.argsort(-sim, axis=1)[:, :k]
    exp_ue = n_ue + NEIGHBOUR_WEIGHT * n_ue[nbrs].sum(axis=1)
    exp_up = n_up + NEIGHBOUR_WEIGHT * n_up[nbrs].sum(axis=1)
    exp_uc = n_uc + NEIGHBOUR_WEIGHT * n_uc[nbrs].sum(axis=1)
    # normalise to probabilities so magnitudes are comparable across users
    exp_ue /= np.maximum(exp_ue.sum(axis=1, keepdims=True), 1e-12)
    exp_up /= np.maximum(exp_up.sum(axis=1, keepdims=True), 1e-12)
    exp_uc /= np.maximum(exp_uc.sum(axis=1, keepdims=True), 1e-12)

    recent: list[list[set]] = [[] for _ in range(U)]
    for r in inter.sort_values(["ts", "item_id"]).itertuples(index=False):
        u = user_idx[r.consumer]
        recent[u].append(set(entities_of.get(int(r.item_id), ())))
        if len(recent[u]) > RECENT_ITEMS:
            recent[u].pop(0)

    return UCDModel(
        users=users,
        user_idx=user_idx,
        ent_idx=ent_idx,
        prod_idx=prod_idx,
        exp_ue=exp_ue,
        exp_up=exp_up,
        exp_uc=exp_uc,
        recent_ents=recent,
        n_users=U,
    )
