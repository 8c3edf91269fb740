"""CTT baseline — Huang et al., "Real-time video recommendation
exploration" (SIGMOD 2016), as characterised by the paper (§VI-B):
"CTT fuses collaborative filtering, type and temporal factor together to
generate recommendation over streams", and per §VI-C.4 "performs worst
because it ignores the user's short-term interest and the diversity of
item-user interaction".

Faithfulness note (DESIGN.md §3). CTT is an implicit-feedback CF system
over the user–item interaction matrix, fused with the item *type*
(category) and a temporal decay factor. It has no entity/content model.
In the stream protocol every evaluated item is **fresh** — it has no
co-visitation history when it must be recommended — so the CF term can
only act through the user–user neighbourhood: a user's affinity for the
fresh item's *type*, smoothed with his co-consumption neighbours'
affinities, decayed in time. That cold-start collapse (type + temporal +
neighbourhood only) is precisely why CTT trails the content-aware methods
in Fig. 8, which is the behaviour this implementation reproduces:

    ctt(u, v) = d_type(u, c_v) + NB_WEIGHT · mean_{n ∈ topN(u)} d_type(n, c_v)

where ``d_type(u, c)`` is the temporally-decayed count of ``u``'s
interactions with category ``c`` and ``topN(u)`` are ``u``'s most similar
users by co-consumption (Jaccard over consumed item sets). Every user is
scored sequentially per item (no index), Θ(U·C) per item plus the
neighbourhood sums — the cost that grows with data size in Fig. 10.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.matching import ItemQuery

N_NEIGHBOURS = 5
NB_WEIGHT = 0.5
TAU = 20_000.0  # temporal decay scale, in stream clock units


@dataclass
class CTTModel:
    """Driver-side CTT state built from one training snapshot."""

    users: list[str]
    user_idx: dict[str, int]
    d_type: np.ndarray  # (U, C) temporally-decayed category counts
    nbrs: np.ndarray  # (U, N) top co-consumption neighbours
    n_history: int

    def score_item(self, q: ItemQuery) -> np.ndarray:
        """CTT scores of every user for the fresh item ``q`` (shape (U,))."""
        own = self.d_type[:, q.category]
        nb = self.d_type[self.nbrs, q.category].mean(axis=1)
        return own + NB_WEIGHT * nb

    def top_k(self, q: ItemQuery, k: int) -> list[tuple[str, float]]:
        s = self.score_item(q)
        order = np.lexsort((np.array(self.users, dtype=object), -s))
        return [(self.users[i], float(s[i])) for i in order[:k]]

    def top_k_seq(self, q: ItemQuery, k: int) -> list[tuple[str, float]]:
        """The per-item matching as CTT actually performs it on a stream:
        every candidate user is scored *sequentially* (no index, no
        pruning) — the cost profile Fig. 10 charges the baselines with.
        Returns the same ranking as :meth:`top_k`."""
        scores = []
        for u in range(len(self.users)):
            own = self.d_type[u, q.category]
            nb = 0.0
            for n in self.nbrs[u]:
                nb += self.d_type[n, q.category]
            scores.append(own + NB_WEIGHT * nb / max(len(self.nbrs[u]), 1))
        order = sorted(range(len(scores)), key=lambda i: (-scores[i], self.users[i]))
        return [(self.users[i], float(scores[i])) for i in order[:k]]


def build_ctt(
    interactions: pd.DataFrame,
    entities_of: dict[int, list[str]],
    n_categories: int,
    *,
    now_ts: int | None = None,
    n_neighbours: int = N_NEIGHBOURS,
) -> CTTModel:
    """Build the CTT model from a pandas snapshot of past interactions.

    ``entities_of`` is accepted for interface parity with UCD but unused:
    CTT has no content model. The co-consumption neighbourhood is computed
    from the binary user–item matrix; the decay uses the snapshot's latest
    timestamp as "now".
    """
    if interactions.empty:
        raise ValueError("cannot build CTT from an empty snapshot")
    inter = interactions.reset_index(drop=True)
    users = sorted(inter["consumer"].unique())
    user_idx = {u: i for i, u in enumerate(users)}
    U = len(users)
    now = int(inter["ts"].max()) if now_ts is None else now_ts

    rows = inter["consumer"].map(user_idx).to_numpy(dtype=np.int64)
    cats = inter["category"].to_numpy(dtype=np.int64)
    decay = np.exp(-(now - inter["ts"].to_numpy(dtype=float)) / TAU)
    d_type = np.zeros((U, n_categories))
    np.add.at(d_type, (rows, cats), decay)

    # user-user co-consumption similarity (Jaccard over item sets) — the
    # CF neighbourhood the type affinity is smoothed with
    items = sorted(inter["item_id"].unique())
    item_idx = {it: i for i, it in enumerate(items)}
    icols = inter["item_id"].map(item_idx).to_numpy(dtype=np.int64)
    B = np.zeros((U, len(items)), dtype=bool)
    B[rows, icols] = True
    inter_count = (B.astype(np.int32) @ B.astype(np.int32).T).astype(float)
    sizes = B.sum(axis=1).astype(float)
    union = sizes[:, None] + sizes[None, :] - inter_count
    with np.errstate(invalid="ignore", divide="ignore"):
        sim = np.where(union > 0, inter_count / union, 0.0)
    np.fill_diagonal(sim, -np.inf)
    k = min(n_neighbours, max(U - 1, 1))
    nbrs = np.argsort(-sim, axis=1)[:, :k]

    return CTTModel(
        users=users,
        user_idx=user_idx,
        d_type=d_type,
        nbrs=nbrs,
        n_history=len(inter),
    )
