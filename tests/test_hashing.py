"""Tests for shift-add-xor hashing and the chained hash table."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.index.hashing import ChainedHashTable, pair_key, shift_add_xor


class TestShiftAddXor:
    def test_deterministic(self):
        assert shift_add_xor("hello") == shift_add_xor("hello")

    def test_different_strings_differ(self):
        assert shift_add_xor("hello") != shift_add_xor("world")

    def test_seed_changes_hash(self):
        assert shift_add_xor("abc", seed=1) != shift_add_xor("abc", seed=2)

    def test_empty_string_is_seed(self):
        assert shift_add_xor("", seed=42) == 42

    def test_64_bit_range(self):
        for s in ["a", "abc", "x" * 100, "category|entity"]:
            h = shift_add_xor(s)
            assert 0 <= h < 2**64

    def test_roughly_uniform_buckets(self):
        """The paper picked this family for uniformity; check the spread of
        10k keys over 64 buckets is not pathological."""
        counts = np.zeros(64)
        for i in range(10_000):
            counts[shift_add_xor(f"e{i}_t{i % 7}_{i % 13}") % 64] += 1
        assert counts.min() > 0.5 * counts.mean()
        assert counts.max() < 2.0 * counts.mean()

    @settings(max_examples=50, deadline=None)
    @given(st.text(max_size=40))
    def test_stable_under_hypothesis(self, s):
        assert shift_add_xor(s) == shift_add_xor(s)


class TestPairKey:
    def test_distinct_pairs_distinct_keys(self):
        # the separator prevents ("1", "2e") colliding with ("12", "e")
        assert pair_key(1, "2e") != pair_key(12, "e")

    def test_contains_both_parts(self):
        k = pair_key(7, "federer")
        assert "7" in k and "federer" in k


class TestChainedHashTable:
    def test_insert_lookup(self):
        t = ChainedHashTable(16)
        t.insert(0, "a", "tree1")
        assert t.lookup(0, "a") == ["tree1"]

    def test_missing_pair_empty(self):
        t = ChainedHashTable(16)
        assert t.lookup(3, "nope") == []

    def test_multiple_trees_per_pair(self):
        t = ChainedHashTable(16)
        t.insert(0, "a", "t1")
        t.insert(0, "a", "t2")
        assert set(t.lookup(0, "a")) == {"t1", "t2"}

    def test_insert_idempotent(self):
        t = ChainedHashTable(16)
        t.insert(0, "a", "t1")
        t.insert(0, "a", "t1")
        assert t.lookup(0, "a") == ["t1"]
        assert len(t) == 1

    def test_same_entity_different_category_distinct(self):
        t = ChainedHashTable(16)
        t.insert(0, "a", "t1")
        t.insert(1, "a", "t2")
        assert t.lookup(0, "a") == ["t1"]
        assert t.lookup(1, "a") == ["t2"]
        assert len(t) == 2

    def test_collisions_chain_correctly(self):
        # one bucket forces every pair into the same chain
        t = ChainedHashTable(1)
        for i in range(50):
            t.insert(i % 3, f"e{i}", f"t{i}")
        for i in range(50):
            assert f"t{i}" in t.lookup(i % 3, f"e{i}")
        assert len(t) == 50
        assert t.chain_lengths() == [50]

    def test_contains(self):
        t = ChainedHashTable(8)
        t.insert(2, "x", "t")
        assert (2, "x") in t
        assert (2, "y") not in t

    def test_invalid_bucket_count(self):
        with pytest.raises(ValueError):
            ChainedHashTable(0)

    def test_chain_lengths_sum_to_pairs(self):
        t = ChainedHashTable(8)
        for i in range(30):
            t.insert(0, f"e{i}", "t")
        assert sum(t.chain_lengths()) == len(t) == 30
