"""Evaluation metrics (§VI-B).

* ``P@k = #Hit / (|V| · k)`` — a *hit* is a recommended user who actually
  interacted with the item in the test partition (Wang et al.'s protocol).
* next-category ``Accuracy`` for the Fig. 5 model comparison lives in
  :mod:`repro.core.hmm` / :mod:`repro.core.bihmm`; here we aggregate it.
"""
from __future__ import annotations

import numpy as np


def hits_at_k(ranked_users: list[str], truth: set[str], k: int) -> int:
    """Number of the top-k recommended users that truly consumed the item."""
    if k < 1:
        raise ValueError("k must be >= 1")
    return sum(1 for u in ranked_users[:k] if u in truth)


def p_at_k(total_hits: int, n_items: int, k: int) -> float:
    """The paper's precision: ``#Hit / (|V| · k)``."""
    if n_items < 1 or k < 1:
        raise ValueError("n_items and k must be >= 1")
    return total_hits / (n_items * k)


def grouped_accuracy(
    opt_states: np.ndarray, acc_hmm: np.ndarray, acc_bihmm: np.ndarray
) -> list[dict]:
    """Fig. 5 rows: mean accuracies grouped by optimal hidden-state count,
    NaN accuracies (too-short histories) excluded."""
    opt_states = np.asarray(opt_states)
    acc_hmm = np.asarray(acc_hmm, dtype=float)
    acc_bihmm = np.asarray(acc_bihmm, dtype=float)
    ok = ~(np.isnan(acc_hmm) | np.isnan(acc_bihmm))
    rows = []
    for n in sorted(set(opt_states[ok].tolist())):
        m = ok & (opt_states == n)
        rows.append(
            {
                "opt_states": int(n),
                "n_users": int(m.sum()),
                "acc_hmm": float(acc_hmm[m].mean()),
                "acc_bihmm": float(acc_bihmm[m].mean()),
            }
        )
    return rows
