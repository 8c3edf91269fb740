"""Entity-based item–user matching — Eq. (1)–(4) of Section IV-C.

An incoming item ``v = ⟨c, uᵖ, E⟩`` is first *encoded* into an
:class:`ItemQuery`: its entity multiset is expanded per occurrence with the
proximity expansions (weight ``w_e``; originals weigh 1.0 — exactly the
paper's Example 1). The relevance of ``v`` to a user is then

    R_ℓ(v,u) = log p(c|u) + log p̂(uᵖ|u) + log Σ_{e∈E∪E'} w_e · p̂(e|u)
    R_s(v,u) = log p_s(c|u)
    R(v,u)   = (1 − λₛ)·R_ℓ + λₛ·R_s

with ``p(c|u)`` / ``p_s(c|u)`` the BiHMM long-/short-term next-category
probabilities and the MLE terms Dirichlet-smoothed (core/profiles.py).

Two scorers implement the same definition:

* :func:`score_users` — vectorised numpy over all users at once; the
  reference the CPPse-index must match *exactly* and the engine for the
  parameter sweeps.
* :func:`score_items_spark` — the distributed naive matcher as a Spark SQL
  join/aggregation (the "sequential matching" the paper's index replaces),
  oracle-checkable and equal to the numpy scorer.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.profiles import ProfileStats

#: background probability assigned to an entity/producer absent from the
#: global vocabulary (possible mid-stream before re-indexing).
def _oov_bg(n_vocab: int) -> float:
    return 1.0 / (n_vocab + 1)


@dataclass(frozen=True)
class ItemQuery:
    """An encoded stream item: entity multiset ``entities`` with per-token
    ``weights`` (1.0 for originals, the expansion weight for expansions)."""

    item_id: int
    category: int
    producer: str
    entities: tuple[str, ...]
    weights: tuple[float, ...]

    def __post_init__(self) -> None:
        if len(self.entities) != len(self.weights):
            raise ValueError("entities and weights must align")


def encode_item(
    item_id: int,
    category: int,
    producer: str,
    entities: list[str],
    expansions: dict[tuple[int, str], list[tuple[str, float]]] | None = None,
    *,
    expand: bool = True,
    top_n: int = 1,
) -> ItemQuery:
    """Build the pseudo-query for an item, optionally entity-expanded.

    Per occurrence of each entity, up to ``top_n`` expansion partners are
    appended with their proximity weights (ssRec); ``expand=False`` gives
    the ssRec-ne ablation.
    """
    ents: list[str] = []
    ws: list[float] = []
    for e in entities:
        ents.append(e)
        ws.append(1.0)
        if expand and expansions:
            for exp_e, w in expansions.get((category, e), [])[:top_n]:
                ents.append(exp_e)
                ws.append(float(w))
    return ItemQuery(item_id, category, producer, tuple(ents), tuple(ws))


def score_users(
    stats: ProfileStats,
    p_cat_l: np.ndarray,
    p_cat_s: np.ndarray,
    q: ItemQuery,
    lam: float,
) -> np.ndarray:
    """``R(v, u)`` for every user (vectorised; shape ``(U,)``).

    ``p_cat_l`` / ``p_cat_s`` are the (U, C) BiHMM probability matrices.
    Out-of-vocabulary producers/entities receive their exact Dirichlet
    smoothing floor so the score is defined for genuinely new stream
    content.
    """
    U = len(stats.users)
    p_up = stats.p_up
    p_ue = stats.p_ue
    if q.producer in stats.prod_idx:
        prod_term = p_up[:, stats.prod_idx[q.producer]]
    else:
        prod_term = (
            stats.mu_p * _oov_bg(len(stats.producers)) / (stats.n_p_total + stats.mu_p)
        )
    ent_sum = np.zeros(U)
    oov_floor = (
        stats.mu_e * _oov_bg(len(stats.entities)) / (stats.n_e_total + stats.mu_e)
    )
    for e, w in zip(q.entities, q.weights):
        j = stats.ent_idx.get(e)
        ent_sum += w * (p_ue[:, j] if j is not None else oov_floor)
    r_l = (
        np.log(p_cat_l[:, q.category])
        + np.log(prod_term)
        + np.log(np.maximum(ent_sum, 1e-300))
    )
    r_s = np.log(p_cat_s[:, q.category])
    return (1.0 - lam) * r_l + lam * r_s


def top_k_users(scores: np.ndarray, users: list[str], k: int) -> list[tuple[str, float]]:
    """The k best-scoring users, ties broken by user id for determinism."""
    order = np.lexsort((np.array(users, dtype=object), -scores))
    return [(users[i], float(scores[i])) for i in order[:k]]


def score_items_spark(
    spark: SparkSession,
    queries: list[ItemQuery],
    stats: ProfileStats,
    interest: DataFrame,
    *,
    lam: float,
    p_s_col: str = "p_s_5",
) -> DataFrame:
    """The naive distributed matcher: every query against every user, as one
    Spark SQL plan (this is the O(n·|V|) scan the CPPse-index avoids).

    ``interest`` is the output of
    :func:`repro.core.interest.interest_probabilities` — (consumer,
    category, p_l, p_s_*). Returns (item_id, consumer, score).
    """
    mu_p, mu_e = stats.mu_p, stats.mu_e
    q_rows = [(q.item_id, q.category, q.producer) for q in queries]
    q_df = spark.createDataFrame(q_rows, "item_id long, category int, producer string")
    qe_rows = [
        (q.item_id, e, float(w)) for q in queries for e, w in zip(q.entities, q.weights)
    ]
    qe_df = spark.createDataFrame(qe_rows, "item_id long, entity string, w double")

    users_df = spark.createDataFrame(
        [
            (u, float(stats.n_p_total[i]), float(stats.n_e_total[i]))
            for i, u in enumerate(stats.users)
        ],
        "consumer string, n_p_total double, n_e_total double",
    )
    pc_df = spark.createDataFrame(
        [
            (u, p, float(stats.n_up[stats.user_idx[u], stats.prod_idx[p]]))
            for u in stats.users
            for p in stats.producers
            if stats.n_up[stats.user_idx[u], stats.prod_idx[p]] > 0
        ]
        or [("__none__", "__none__", 0.0)],
        "consumer string, producer string, n double",
    )
    ec_df = spark.createDataFrame(
        [
            (u, e, float(stats.n_ue[stats.user_idx[u], stats.ent_idx[e]]))
            for u in stats.users
            for e in stats.entities
            if stats.n_ue[stats.user_idx[u], stats.ent_idx[e]] > 0
        ]
        or [("__none__", "__none__", 0.0)],
        "consumer string, entity string, n double",
    )
    bgp_df = spark.createDataFrame(
        [(p, float(stats.bg_p[i])) for i, p in enumerate(stats.producers)],
        "producer string, bg double",
    )
    bge_df = spark.createDataFrame(
        [(e, float(stats.bg_e[i])) for i, e in enumerate(stats.entities)],
        "entity string, bg double",
    )
    oov_p = _oov_bg(len(stats.producers))
    oov_e = _oov_bg(len(stats.entities))

    # producer term per (item, consumer)
    uq = users_df.crossJoin(q_df)
    prod = (
        uq.join(bgp_df, "producer", "left")
        .join(pc_df, ["consumer", "producer"], "left")
        .select(
            "item_id",
            "consumer",
            "category",
            (
                (F.coalesce(F.col("n"), F.lit(0.0)) + mu_p * F.coalesce(F.col("bg"), F.lit(oov_p)))
                / (F.col("n_p_total") + mu_p)
            ).alias("p_prod"),
        )
    )
    # entity term per (item, consumer): sum_e w * smoothed
    ue = users_df.select("consumer", "n_e_total").crossJoin(qe_df)
    ent = (
        ue.join(bge_df, "entity", "left")
        .join(ec_df, ["consumer", "entity"], "left")
        .withColumn(
            "contrib",
            F.col("w")
            * (F.coalesce(F.col("n"), F.lit(0.0)) + mu_e * F.coalesce(F.col("bg"), F.lit(oov_e)))
            / (F.col("n_e_total") + mu_e),
        )
        .groupBy("item_id", "consumer")
        .agg(F.sum("contrib").alias("ent_sum"))
    )
    cat = interest.select(
        "consumer", "category", F.col("p_l"), F.col(p_s_col).alias("p_s")
    )
    return (
        prod.join(ent, ["item_id", "consumer"])
        .join(cat, ["consumer", "category"])
        .select(
            "item_id",
            "consumer",
            (
                (1.0 - lam)
                * (F.log("p_l") + F.log("p_prod") + F.log(F.greatest(F.col("ent_sum"), F.lit(1e-300))))
                + lam * F.log("p_s")
            ).alias("score"),
        )
    )
