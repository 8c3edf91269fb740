"""Tests for evaluation metrics."""
import numpy as np
import pytest

from repro.eval.metrics import grouped_accuracy, hits_at_k, p_at_k


class TestHitsAtK:
    def test_counts_hits(self):
        assert hits_at_k(["a", "b", "c"], {"b", "c", "z"}, 3) == 2

    def test_cutoff_respected(self):
        assert hits_at_k(["a", "b", "c"], {"c"}, 2) == 0

    def test_empty_truth(self):
        assert hits_at_k(["a", "b"], set(), 2) == 0

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            hits_at_k(["a"], {"a"}, 0)


class TestPAtK:
    def test_formula(self):
        # P@k = #Hit / (|V| * k)
        assert p_at_k(10, 5, 4) == 10 / 20

    def test_zero_hits(self):
        assert p_at_k(0, 7, 3) == 0.0

    def test_invalid_inputs(self):
        with pytest.raises(ValueError):
            p_at_k(1, 0, 3)
        with pytest.raises(ValueError):
            p_at_k(1, 3, 0)


class TestGroupedAccuracy:
    def test_groups_by_state_count(self):
        rows = grouped_accuracy(
            np.array([1, 1, 2]), np.array([0.5, 0.7, 0.4]), np.array([0.6, 0.8, 0.9])
        )
        assert [r["opt_states"] for r in rows] == [1, 2]
        assert rows[0]["n_users"] == 2
        assert np.isclose(rows[0]["acc_hmm"], 0.6)
        assert np.isclose(rows[0]["acc_bihmm"], 0.7)

    def test_nan_rows_excluded(self):
        rows = grouped_accuracy(
            np.array([1, 1]), np.array([0.5, np.nan]), np.array([0.6, 0.9])
        )
        assert rows[0]["n_users"] == 1

    def test_empty_when_all_nan(self):
        rows = grouped_accuracy(np.array([1]), np.array([np.nan]), np.array([np.nan]))
        assert rows == []
