"""Tests for one-pass user blocking (index/blocks.py)."""
import numpy as np
import pytest

from repro.index.blocks import assign_to_block, cosine, one_pass_cluster, threshold_for_blocks


def _two_cluster_vectors(n=40, seed=0):
    g = np.random.default_rng(seed)
    a = np.abs(g.normal([5, 0, 0], 0.3, size=(n // 2, 3)))
    b = np.abs(g.normal([0, 5, 0], 0.3, size=(n // 2, 3)))
    return np.vstack([a, b])


class TestCosine:
    def test_identical(self):
        v = np.array([1.0, 2.0, 3.0])
        assert np.isclose(cosine(v, v), 1.0)

    def test_orthogonal(self):
        assert np.isclose(cosine(np.array([1.0, 0.0]), np.array([0.0, 1.0])), 0.0)

    def test_zero_vector(self):
        assert cosine(np.zeros(3), np.ones(3)) == 0.0

    def test_scale_invariant(self):
        a = np.array([1.0, 2.0])
        assert np.isclose(cosine(a, a * 7), 1.0)


class TestOnePassCluster:
    def test_every_user_assigned_once(self):
        v = _two_cluster_vectors()
        blocks = one_pass_cluster(v, 0.8)
        flat = sorted(i for b in blocks for i in b)
        assert flat == list(range(len(v)))

    def test_zero_threshold_single_block(self):
        v = _two_cluster_vectors()
        blocks = one_pass_cluster(v, 0.0)
        assert len(blocks) == 1

    def test_unit_threshold_many_blocks(self):
        v = _two_cluster_vectors()
        blocks = one_pass_cluster(v, 1.0)
        assert len(blocks) > 2  # near-exact matches only

    def test_recovers_planted_clusters(self):
        v = _two_cluster_vectors()
        blocks = one_pass_cluster(v, 0.8)
        assert len(blocks) == 2
        assert set(blocks[0]) == set(range(20))
        assert set(blocks[1]) == set(range(20, 40))

    def test_block_count_monotone_in_threshold(self):
        v = _two_cluster_vectors(seed=3)
        counts = [len(one_pass_cluster(v, t)) for t in (0.0, 0.5, 0.9, 0.99)]
        assert counts == sorted(counts)

    def test_invalid_threshold(self):
        with pytest.raises(ValueError):
            one_pass_cluster(np.ones((2, 2)), 1.5)

    def test_deterministic(self):
        v = _two_cluster_vectors(seed=5)
        assert one_pass_cluster(v, 0.7) == one_pass_cluster(v, 0.7)

    def test_order_dependence_is_stable(self):
        # one-pass clustering is order-dependent by definition; same order
        # must give the same result, shuffled order a valid partition
        v = _two_cluster_vectors(seed=7)
        perm = np.random.default_rng(0).permutation(len(v))
        blocks = one_pass_cluster(v[perm], 0.8)
        flat = sorted(i for b in blocks for i in b)
        assert flat == list(range(len(v)))


class TestThresholdForBlocks:
    def test_hits_small_targets(self):
        v = _two_cluster_vectors()
        for target in (1, 2):
            _, blocks = threshold_for_blocks(v, target)
            assert len(blocks) == target

    def test_larger_target_more_blocks(self):
        g = np.random.default_rng(1)
        v = np.abs(g.random((120, 8)))
        _, b5 = threshold_for_blocks(v, 5)
        _, b20 = threshold_for_blocks(v, 20)
        assert len(b20) > len(b5)

    def test_invalid_target(self):
        with pytest.raises(ValueError):
            threshold_for_blocks(np.ones((3, 2)), 0)


class TestAssignToBlock:
    def test_assigns_to_nearest(self):
        v = _two_cluster_vectors()
        blocks = one_pass_cluster(v, 0.8)
        new = np.array([6.0, 0.1, 0.0])
        assert assign_to_block(v, blocks, new) == 0
        new2 = np.array([0.1, 6.0, 0.0])
        assert assign_to_block(v, blocks, new2) == 1

    def test_empty_blocks_raise(self):
        with pytest.raises(ValueError):
            assign_to_block(np.ones((2, 2)), [], np.ones(2))
