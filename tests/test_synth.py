"""Tests for the synthetic social-media generator and dataset registry."""
import numpy as np
import pandas as pd
import pytest

from repro.data.datasets import DATASETS, load, overview
from repro.data.social_synth import (
    HORIZON,
    MLENS,
    YTUBE,
    entity_name,
    generate,
    regime_pools,
    synthetic_twin,
)


@pytest.fixture(scope="module")
def small():
    return generate(YTUBE.scaled(0.01))


class TestConfig:
    def test_scaled_shrinks_population(self):
        c = YTUBE.scaled(0.01)
        assert c.n_consumers < YTUBE.n_consumers
        assert c.n_producers < YTUBE.n_producers
        assert c.n_categories == YTUBE.n_categories

    def test_scaled_floor(self):
        c = YTUBE.scaled(1e-9)
        assert c.n_consumers >= 30 and c.n_producers >= 6

    def test_presets_differ(self):
        assert YTUBE.taste_switch_prob > MLENS.taste_switch_prob
        assert YTUBE.drift_prob > MLENS.drift_prob
        assert YTUBE.n_categories == 19 and MLENS.n_categories == 15


class TestRegimePools:
    def test_partition_of_categories(self):
        pools, shared = regime_pools(19, 2)
        all_cats = sorted(c for p in pools for c in p) + sorted(shared)
        assert sorted(all_cats) == list(range(19))

    def test_pools_disjoint(self):
        pools, shared = regime_pools(15, 2)
        assert not (set(pools[0]) & set(pools[1]))
        assert not (set(pools[0]) | set(pools[1])) & set(shared)

    def test_shared_nonempty(self):
        _, shared = regime_pools(10, 2)
        assert len(shared) >= 2


class TestGenerate:
    def test_schema(self, small):
        assert list(small.items.columns) == [
            "item_id", "producer", "category", "ts", "z_true",
        ]
        assert list(small.item_entities.columns) == ["item_id", "entity", "pos"]
        assert list(small.interactions.columns) == [
            "consumer", "item_id", "ts", "category", "producer",
        ]

    def test_deterministic(self):
        a = generate(YTUBE.scaled(0.01))
        b = generate(YTUBE.scaled(0.01))
        pd.testing.assert_frame_equal(a.items, b.items)
        pd.testing.assert_frame_equal(a.interactions, b.interactions)

    def test_different_seed_differs(self):
        from dataclasses import replace

        a = generate(YTUBE.scaled(0.01))
        b = generate(replace(YTUBE.scaled(0.01), seed=99))
        assert not a.interactions.equals(b.interactions)

    def test_timestamps_in_horizon(self, small):
        assert small.items["ts"].between(0, HORIZON).all()
        assert small.interactions["ts"].between(0, HORIZON).all()

    def test_interactions_reference_existing_items(self, small):
        assert set(small.interactions["item_id"]) <= set(small.items["item_id"])

    def test_interactions_only_consume_published_items(self, small):
        merged = small.interactions.merge(
            small.items[["item_id", "ts"]].rename(columns={"ts": "item_ts"}),
            on="item_id",
        )
        assert (merged["ts"] >= merged["item_ts"]).all()

    def test_denormalised_columns_consistent(self, small):
        merged = small.interactions.merge(
            small.items, on="item_id", suffixes=("", "_it")
        )
        assert (merged["category"] == merged["category_it"]).all()
        assert (merged["producer"] == merged["producer_it"]).all()

    def test_every_item_has_entities(self, small):
        with_ents = set(small.item_entities["item_id"])
        assert set(small.items["item_id"]) == with_ents

    def test_entity_names_match_category(self, small):
        merged = small.item_entities.merge(small.items, on="item_id")
        # entity names embed the item's category (possibly the noise draw)
        ok = [
            r.entity.startswith(f"e{r.category}_")
            for r in merged.itertuples(index=False)
        ]
        assert np.mean(ok) > 0.99

    def test_producers_have_narrow_category_sets(self, small):
        per_prod = small.items.groupby("producer")["category"].nunique()
        # regimes emit from ~3 planted categories + a 10% noise draw over
        # all C categories — far narrower than the full category space
        assert per_prod.median() <= small.config.n_categories * 0.6
        top3_share = (
            small.items.groupby(["producer", "category"]).size()
            .groupby("producer").apply(lambda s: s.nlargest(3).sum() / s.sum())
        )
        assert top3_share.min() > 0.6

    def test_regime_changes_category_mix(self, small):
        """Planted regimes are real: a producer's regime-0 items and
        regime-1 items have different exclusive categories."""
        diffs = 0
        for p, grp in small.items.groupby("producer"):
            c0 = set(grp[grp["z_true"] == 0]["category"])
            c1 = set(grp[grp["z_true"] == 1]["category"])
            if c0 and c1 and c0 != c1:
                diffs += 1
        assert diffs >= small.items["producer"].nunique() // 2

    def test_consumers_have_min_history(self, small):
        sizes = small.interactions.groupby("consumer").size()
        assert sizes.min() >= 5

    def test_entities_of_ordering(self, small):
        ents = small.entities_of()
        iid = small.items["item_id"].iloc[0]
        expected = small.item_entities[small.item_entities["item_id"] == iid]
        assert ents[iid] == expected.sort_values("pos")["entity"].tolist()


class TestSyntheticTwin:
    def test_twin_same_aggregate_shape(self, small):
        twin = synthetic_twin(small, seed=42)
        assert twin.config.name == "syn_ytube"
        assert twin.config.n_categories == small.config.n_categories
        assert len(twin.items) == len(small.items)
        # interaction totals close but not identical (resampled micro-data)
        ratio = len(twin.interactions) / len(small.interactions)
        assert 0.8 < ratio < 1.25
        assert not twin.interactions.equals(small.interactions)

    def test_twin_deterministic(self, small):
        a = synthetic_twin(small, seed=42)
        b = synthetic_twin(small, seed=42)
        pd.testing.assert_frame_equal(a.interactions, b.interactions)


class TestRegistry:
    def test_all_datasets_load(self):
        for name in DATASETS:
            d = load(name, 0.01)
            assert len(d.interactions) > 0

    def test_unknown_raises(self):
        with pytest.raises(ValueError):
            load("imdb", 0.01)

    def test_cache_returns_same_object(self):
        assert load("ytube", 0.01) is load("ytube", 0.01)

    def test_overview_fields(self):
        row = overview("ytube", 0.01)
        assert set(row) == {
            "dataset", "producers", "consumers", "entities",
            "categories", "interactions", "items",
        }
        assert row["categories"] == 19

    def test_mlens_fewer_categories(self):
        assert overview("mlens", 0.01)["categories"] == 15

    def test_entity_name_roundtrip(self):
        assert entity_name(3, 1, 7) == "e3_t1_7"
