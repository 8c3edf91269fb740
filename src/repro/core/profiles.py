"""User profiles: long-term list, short-term window, smoothed MLE statistics.

Section IV-B: each user profile is a pair of category–producer sequences
(CPPse) — a *long-term interest list* ``L`` holding all but the most recent
interactions and a fixed-size *short-term window* ``W`` holding the last
|W|. The MLE terms of Eq. (2), ``p̂(uᵖ|uᶜ)`` and ``p̂(e|uᶜ)``, are counted
over ``L`` only and Dirichlet-smoothed against the corpus background so an
unseen producer/entity never yields a zero probability (the paper's
serendipity argument).

The counting is Spark SQL (oracle-checkable); :class:`ProfileStats`
materialises the small per-user matrices on the driver for the vectorised
scorer, the parameter sweeps, and the CPPse-index build.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

DEFAULT_MU_P = 2.0  # Dirichlet pseudo-count mass for producers
DEFAULT_MU_E = 4.0  # ... and for entities


def split_short_window(interactions: DataFrame, w: int) -> DataFrame:
    """Tag each interaction long-term vs short-term.

    Adds ``recency`` (1 = most recent) and ``in_window`` (recency <= w) per
    consumer. The window is the last ``w`` interactions by (ts, item_id) —
    the paper's fixed-size recent-interaction window, not a time window.
    """
    if w < 0:
        raise ValueError("window size must be >= 0")
    win = Window.partitionBy("consumer").orderBy(
        F.col("ts").desc(), F.col("item_id").desc()
    )
    return interactions.withColumn("recency", F.row_number().over(win)).withColumn(
        "in_window", F.col("recency") <= F.lit(w)
    )


def producer_counts(long_term: DataFrame) -> DataFrame:
    """``n(u, p)`` — producer occurrences in each user's long-term list."""
    return long_term.groupBy("consumer", "producer").agg(F.count("*").alias("n"))


def entity_counts(long_term: DataFrame, item_entities: DataFrame) -> DataFrame:
    """``n(u, e)`` — entity occurrences (with multiplicity over items) in
    each user's long-term list."""
    return (
        long_term.join(item_entities, "item_id")
        .groupBy("consumer", "entity")
        .agg(F.count("*").alias("n"))
    )


def category_entity_pairs(long_term: DataFrame, item_entities: DataFrame) -> DataFrame:
    """Distinct (consumer, category, entity) triples in users' long-term
    lists — the pairs the CPPse-index hash table is keyed on (§V-A)."""
    return (
        long_term.join(item_entities, "item_id")
        .select("consumer", "category", "entity")
        .distinct()
    )


def background_producer(interactions: DataFrame) -> DataFrame:
    """Corpus producer distribution (Laplace-floored) for smoothing."""
    return interactions.groupBy("producer").agg(F.count("*").alias("n"))


def background_entity(interactions: DataFrame, item_entities: DataFrame) -> DataFrame:
    """Corpus entity-consumption distribution for smoothing."""
    return (
        interactions.join(item_entities, "item_id")
        .groupBy("entity")
        .agg(F.count("*").alias("n"))
    )


@dataclass
class ProfileStats:
    """Driver-side smoothed profile matrices for one training snapshot.

    ``p_up[u, p]`` and ``p_ue[u, e]`` are the Dirichlet-smoothed MLE
    probabilities of Eq. (2); ``n_p_total`` / ``n_e_total`` are the per-user
    token totals needed to reconstruct the smoothing *floor* for a producer/
    entity outside the matrix columns (the CPPse-index needs those floors
    for its upper bounds — see index/sigtree.py).
    """

    users: list[str]
    producers: list[str]
    entities: list[str]
    user_idx: dict[str, int]
    prod_idx: dict[str, int]
    ent_idx: dict[str, int]
    n_up: np.ndarray  # (U, P) raw counts
    n_ue: np.ndarray  # (U, E) raw counts
    n_p_total: np.ndarray  # (U,)
    n_e_total: np.ndarray  # (U,)
    bg_p: np.ndarray  # (P,) strictly positive, sums to 1
    bg_e: np.ndarray  # (E,)
    mu_p: float
    mu_e: float

    _p_up_cache: np.ndarray | None = None
    _p_ue_cache: np.ndarray | None = None

    @property
    def p_up(self) -> np.ndarray:
        """Smoothed ``p̂(uᵖ|u)`` matrix, rows sum to 1 over known producers.

        Cached — snapshots are immutable during scoring; call
        :meth:`refresh` after mutating the raw counts (tests do).
        """
        if self._p_up_cache is None:
            self._p_up_cache = (self.n_up + self.mu_p * self.bg_p[None, :]) / (
                self.n_p_total[:, None] + self.mu_p
            )
        return self._p_up_cache

    @property
    def p_ue(self) -> np.ndarray:
        """Smoothed ``p̂(e|u)`` matrix (cached, see :attr:`p_up`)."""
        if self._p_ue_cache is None:
            self._p_ue_cache = (self.n_ue + self.mu_e * self.bg_e[None, :]) / (
                self.n_e_total[:, None] + self.mu_e
            )
        return self._p_ue_cache

    def refresh(self) -> None:
        """Drop cached smoothed matrices after mutating the raw counts."""
        self._p_up_cache = None
        self._p_ue_cache = None

    def producer_floor(self, u: int) -> float:
        """Smoothed probability of a producer never seen anywhere, up to its
        background mass: ``mu_p * bg / (n + mu_p)`` with bg left symbolic."""
        return self.mu_p / (self.n_p_total[u] + self.mu_p)

    def entity_floor(self, u: int) -> float:
        return self.mu_e / (self.n_e_total[u] + self.mu_e)


def build_profile_stats(
    interactions: DataFrame,
    item_entities: DataFrame,
    *,
    window: int,
    all_users: list[str] | None = None,
    all_producers: list[str] | None = None,
    all_entities: list[str] | None = None,
    mu_p: float = DEFAULT_MU_P,
    mu_e: float = DEFAULT_MU_E,
) -> ProfileStats:
    """Aggregate the long-term MLE statistics with Spark SQL and pivot them
    into driver matrices.

    ``all_*`` fix the vocabulary (users / producers / entities) so snapshots
    built from different stream prefixes stay index-compatible; defaults are
    the values observed in ``interactions``.
    """
    tagged = split_short_window(interactions, window)
    long_term = tagged.filter(~F.col("in_window"))

    pc = producer_counts(long_term).toPandas()
    ec = entity_counts(long_term, item_entities).toPandas()
    bp = background_producer(interactions).toPandas()
    be = background_entity(interactions, item_entities).toPandas()
    seen_users = [
        r["consumer"]
        for r in interactions.select("consumer").distinct().collect()
    ]

    users = sorted(set(all_users) if all_users is not None else set(seen_users))
    producers = sorted(
        set(all_producers) if all_producers is not None else set(bp["producer"])
    )
    entities = sorted(
        set(all_entities) if all_entities is not None else set(be["entity"])
    )
    user_idx = {u: i for i, u in enumerate(users)}
    prod_idx = {p: i for i, p in enumerate(producers)}
    ent_idx = {e: i for i, e in enumerate(entities)}

    n_up = np.zeros((len(users), len(producers)))
    for u, p, n in pc.itertuples(index=False):
        if u in user_idx and p in prod_idx:
            n_up[user_idx[u], prod_idx[p]] = n
    n_ue = np.zeros((len(users), len(entities)))
    for u, e, n in ec.itertuples(index=False):
        if u in user_idx and e in ent_idx:
            n_ue[user_idx[u], ent_idx[e]] = n

    bg_p = np.ones(len(producers))
    for p, n in bp.itertuples(index=False):
        if p in prod_idx:
            bg_p[prod_idx[p]] += n
    bg_p /= bg_p.sum()
    bg_e = np.ones(len(entities)) if entities else np.ones(0)
    for e, n in be.itertuples(index=False):
        if e in ent_idx:
            bg_e[ent_idx[e]] += n
    if len(bg_e):
        bg_e /= bg_e.sum()

    return ProfileStats(
        users=users,
        producers=producers,
        entities=entities,
        user_idx=user_idx,
        prod_idx=prod_idx,
        ent_idx=ent_idx,
        n_up=n_up,
        n_ue=n_ue,
        n_p_total=n_up.sum(axis=1),
        n_e_total=n_ue.sum(axis=1),
        bg_p=bg_p,
        bg_e=bg_e,
        mu_p=mu_p,
        mu_e=mu_e,
    )
