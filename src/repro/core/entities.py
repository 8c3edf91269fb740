"""Entity model: extraction shim and proximity-based expansion.

Section IV-B/IV-C: the paper runs TagMe over item descriptions to get entity
sets ``E`` and expands each entity with strongly related ones, where
relatedness is the proximity heuristic of Tao & Zhai — "if two entities often
co-occurred closely in the same category, we believe they are strongly
related", with the expansion weight computed from their proximity.

Here the synthetic generator emits entity sets directly (it *is* the ground
truth TagMe would approximate — DESIGN.md §2), so extraction is a shim that
tokenises a synthetic description back into entities. Expansion is computed
with Spark SQL: a self-join of ``item_entities`` on ``item_id`` counts
within-item co-occurrences per category (our unit of "close proximity" is
co-membership in one item description), and each (category, entity) keeps its
``top_n`` co-occurring partners with weight

    w(e → e') = 0.95 · cooc(e, e') / max_{e''} cooc(e, e'')  ∈ (0, 0.95]

so expansion entities always weigh less than the exact-match weight 1.0, as
in the paper's Example 1 (weights like 0.9, 0.7).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

MAX_EXPANSION_WEIGHT = 0.95


def extract_entities(description: str) -> list[str]:
    """TagMe stand-in: entities in our synthetic descriptions are
    '|'-delimited tokens (see ``make_description``)."""
    return [t for t in description.split("|") if t]


def make_description(entities: list[str]) -> str:
    """Inverse of :func:`extract_entities` — builds the synthetic
    description an item would carry."""
    return "|".join(entities)


def cooccurrence(items: DataFrame, item_entities: DataFrame) -> DataFrame:
    """Per-category within-item entity co-occurrence counts.

    Returns (category, entity, other, cooc) for ordered pairs with
    ``entity != other``.
    """
    a = item_entities.select("item_id", F.col("entity"))
    b = item_entities.select(
        F.col("item_id").alias("item_id_b"), F.col("entity").alias("other")
    )
    pairs = (
        a.join(b, (a["item_id"] == b["item_id_b"]) & (a["entity"] != b["other"]))
        .join(items.select("item_id", "category"), "item_id")
        .groupBy("category", "entity", "other")
        .agg(F.count("*").alias("cooc"))
    )
    return pairs


def entity_expansion(
    items: DataFrame, item_entities: DataFrame, *, top_n: int = 1
) -> DataFrame:
    """The expansion table: (category, entity, exp_entity, weight).

    For each (category, entity), the ``top_n`` most co-occurring partner
    entities, weights normalised against the partner with the highest
    co-occurrence (ties broken by entity name for determinism).
    """
    if top_n < 1:
        raise ValueError("top_n must be >= 1")
    co = cooccurrence(items, item_entities)
    win = Window.partitionBy("category", "entity").orderBy(
        F.col("cooc").desc(), F.col("other").asc()
    )
    ranked = co.withColumn("rank", F.row_number().over(win)).withColumn(
        "max_cooc", F.max("cooc").over(Window.partitionBy("category", "entity"))
    )
    return (
        ranked.filter(F.col("rank") <= top_n)
        .select(
            "category",
            "entity",
            F.col("other").alias("exp_entity"),
            (F.lit(MAX_EXPANSION_WEIGHT) * F.col("cooc") / F.col("max_cooc")).alias(
                "weight"
            ),
        )
    )


def expansion_map(expansion: DataFrame) -> dict[tuple[int, str], list[tuple[str, float]]]:
    """Collect the expansion table into a driver dict keyed by
    (category, entity) for the per-item query encoder."""
    out: dict[tuple[int, str], list[tuple[str, float]]] = {}
    for row in expansion.collect():
        out.setdefault((int(row["category"]), row["entity"]), []).append(
            (row["exp_entity"], float(row["weight"]))
        )
    for v in out.values():
        v.sort(key=lambda t: (-t[1], t[0]))
    return out
