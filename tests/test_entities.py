"""Tests for entity extraction/expansion (core/entities.py)."""
import pytest
from pyspark.sql import functions as F

from repro.core.entities import (
    MAX_EXPANSION_WEIGHT,
    cooccurrence,
    entity_expansion,
    expansion_map,
    extract_entities,
    make_description,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def expansion(ytube_spark):
    df = entity_expansion(ytube_spark["items"], ytube_spark["item_entities"], top_n=2)
    df.cache().count()
    return df


class TestExtraction:
    def test_roundtrip(self):
        ents = ["Roger Federer", "Rafael Nadal", "Australian Open"]
        assert extract_entities(make_description(ents)) == ents

    def test_empty(self):
        assert extract_entities("") == []
        assert make_description([]) == ""

    def test_skips_empty_tokens(self):
        assert extract_entities("a||b") == ["a", "b"]


class TestCooccurrence:
    def test_vs_oracle(self, ytube, ytube_spark):
        got = cooccurrence(ytube_spark["items"], ytube_spark["item_entities"])
        assert_equivalent(
            got,
            """
            SELECT i.category, a.entity AS entity, b.entity AS other,
                   count(*) AS cooc
            FROM item_entities a
            JOIN item_entities b ON a.item_id = b.item_id AND a.entity <> b.entity
            JOIN items i ON i.item_id = a.item_id
            GROUP BY i.category, a.entity, b.entity
            """,
            items=ytube.items,
            item_entities=ytube.item_entities,
        )

    def test_symmetric_counts(self, ytube_spark):
        co = cooccurrence(ytube_spark["items"], ytube_spark["item_entities"])
        a = co.filter(
            (F.col("entity") < F.col("other"))
        ).selectExpr("category", "entity e1", "other e2", "cooc")
        b = co.filter(
            (F.col("entity") > F.col("other"))
        ).selectExpr("category", "other e1", "entity e2", "cooc c2")
        joined = a.join(b, ["category", "e1", "e2"])
        assert joined.filter("cooc <> c2").count() == 0

    def test_no_self_pairs(self, ytube_spark):
        co = cooccurrence(ytube_spark["items"], ytube_spark["item_entities"])
        assert co.filter("entity = other").count() == 0


class TestExpansion:
    def test_weights_in_range(self, expansion):
        pdf = expansion.toPandas()
        assert (pdf["weight"] > 0).all()
        assert (pdf["weight"] <= MAX_EXPANSION_WEIGHT + 1e-9).all()

    def test_top_n_respected(self, expansion):
        per_key = expansion.groupBy("category", "entity").count().toPandas()
        assert (per_key["count"] <= 2).all()

    def test_best_partner_gets_max_weight(self, expansion):
        best = (
            expansion.groupBy("category", "entity")
            .agg(F.max("weight").alias("w"))
            .toPandas()
        )
        assert (abs(best["w"] - MAX_EXPANSION_WEIGHT) < 1e-9).all()

    def test_expansion_stays_in_category_vocab(self, expansion, ytube):
        # entities of category c co-occur only within items of c, so the
        # expansion partners carry the same category prefix
        pdf = expansion.toPandas()
        mismatch = [
            r
            for r in pdf.itertuples(index=False)
            if not r.exp_entity.startswith(f"e{r.category}_")
        ]
        assert not mismatch

    def test_invalid_top_n(self, ytube_spark):
        with pytest.raises(ValueError):
            entity_expansion(ytube_spark["items"], ytube_spark["item_entities"], top_n=0)

    def test_deterministic(self, ytube_spark):
        a = entity_expansion(
            ytube_spark["items"], ytube_spark["item_entities"], top_n=1
        ).toPandas()
        b = entity_expansion(
            ytube_spark["items"], ytube_spark["item_entities"], top_n=1
        ).toPandas()
        key = ["category", "entity"]
        assert a.sort_values(key).reset_index(drop=True).equals(
            b.sort_values(key).reset_index(drop=True)
        )


class TestExpansionMap:
    def test_map_matches_dataframe(self, expansion):
        m = expansion_map(expansion)
        pdf = expansion.toPandas()
        assert sum(len(v) for v in m.values()) == len(pdf)
        row = pdf.iloc[0]
        assert (row["exp_entity"], pytest.approx(row["weight"])) in [
            (e, pytest.approx(w)) for e, w in m[(int(row["category"]), row["entity"])]
        ]

    def test_map_sorted_by_weight(self, expansion):
        m = expansion_map(expansion)
        for v in m.values():
            ws = [w for _, w in v]
            assert ws == sorted(ws, reverse=True)
