"""Distributed (Bi)HMM interest prediction on Spark.

This is the Spark face of Section IV: the a-HMM layer is fitted *per
producer* and the b-HMM *per consumer*, both via
``groupBy(...).applyInPandas(...)`` so the thousands of independent EM fits
run data-parallel across cores — the numpy model code in
:mod:`repro.core.hmm` / :mod:`repro.core.bihmm` stays engine-free.

Outputs are long-format DataFrames (no array columns) so every downstream
aggregation remains oracle-checkable and Arrow-friendly:

* :func:`decode_producers` — item_id → decoded producer hidden state ``z``.
* :func:`bihmm_vs_hmm_accuracy` — Fig. 5 rows: per consumer, the optimal
  hidden-state count and held-out next-category accuracy of HMM vs BiHMM.
* :func:`interest_probabilities` — per (consumer, category): the long-term
  BiHMM probability ``p_l`` (Eq. 2's ``p(c|u^c)``) and the short-term
  window probabilities ``p_s_w`` for every requested window size (Eq. 4),
  computed from one fit per consumer.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.bihmm import ConditionalHMM, fit_best_conditional
from repro.core.hmm import DiscreteHMM, fit_best_hmm, next_step_accuracy

_DECODE_SCHEMA = "item_id long, producer string, ts long, z integer"
_ACC_SCHEMA = "consumer string, opt_states integer, acc_hmm double, acc_bihmm double"

#: consumers with histories shorter than this get uniform predictions —
#: an EM fit on a handful of points is noise (cf. the paper's Eq. 4 note).
MIN_HISTORY = 6

#: EM can drive emission entries to exactly 0; downstream scoring takes
#: log-probabilities, so predictions are floored by mixing in a trace of
#: uniform mass (the paper's zero-probability concern, Eq. 2 discussion).
PROB_FLOOR_EPS = 1e-6


def _floor_dist(p: np.ndarray) -> np.ndarray:
    n = p.shape[-1]
    return (1.0 - PROB_FLOOR_EPS) * p + PROB_FLOOR_EPS / n


def _stable_seed(key: str, salt: int) -> int:
    """Deterministic per-group seed independent of partitioning."""
    return (hash_bytes(key.encode()) ^ salt) % (2**31 - 1)


def hash_bytes(b: bytes) -> int:
    h = 2166136261
    for c in b:
        h = ((h ^ c) * 16777619) & 0xFFFFFFFF
    return h


def decode_producers(
    items: DataFrame, *, n_z: int, n_categories: int, seed: int = 0, n_iter: int = 30
) -> DataFrame:
    """Fit one a-HMM per producer and Viterbi-decode its item sequence.

    ``items`` must have columns (item_id, producer, category, ts). Returns
    one row per item — (item_id, producer, ts, z) with ``z`` in
    ``0..n_z-1`` — the conditioning signal for every consumer's b-HMM.
    """

    def fit_decode(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values(["ts", "item_id"], kind="stable")
        obs = pdf["category"].to_numpy(dtype=np.int64)
        s = _stable_seed(str(pdf["producer"].iloc[0]), seed)
        if len(obs) < MIN_HISTORY:
            z = np.zeros(len(obs), dtype=np.int64)
        else:
            m = DiscreteHMM(n_z, n_categories).fit(
                obs, seed=s, n_iter=n_iter, n_restarts=3
            )
            # canonical labels: producer states decoded by *different*
            # a-HMMs must be comparable when they condition one b-HMM.
            z = m.canonicalize().viterbi(obs)
        return pd.DataFrame(
            {
                "item_id": pdf["item_id"].to_numpy(),
                "producer": pdf["producer"].to_numpy(),
                "ts": pdf["ts"].to_numpy(),
                "z": z.astype(np.int32),
            }
        )

    return items.groupBy("producer").applyInPandas(fit_decode, _DECODE_SCHEMA)


def with_producer_state(interactions: DataFrame, decoded: DataFrame) -> DataFrame:
    """Attach each interaction's *current* producer state.

    ``z`` is the decoded state of the producer's latest item at or before
    the interaction timestamp (an as-of join) — not the consumed item's own
    state. This mirrors Fig. 3's ``Z_{1,t'+1} → U_{i,t}`` arrow: the
    producer's newest regime steers the consumer's next move, so ``z`` can
    *lead* the categories visible in the consumer's own history (e.g. a
    burst that started after the consumed item was published).
    """
    d = decoded.select(
        F.col("producer").alias("d_producer"),
        F.col("ts").alias("d_ts"),
        F.col("item_id").alias("d_item"),
        "z",
    )
    i = interactions.withColumn("_rid", F.monotonically_increasing_id())
    joined = i.join(
        d, (i["producer"] == d["d_producer"]) & (d["d_ts"] <= i["ts"]), "left"
    )
    win = Window.partitionBy("_rid").orderBy(F.col("d_ts").desc(), F.col("d_item").desc())
    return (
        joined.withColumn("rn", F.row_number().over(win))
        .filter(F.col("rn") == 1)
        .drop("rn", "_rid", "d_producer", "d_ts", "d_item")
        .fillna({"z": 0})
    )


def bihmm_vs_hmm_accuracy(
    inter_z: DataFrame,
    *,
    n_categories: int,
    n_z: int,
    max_states: int = 8,
    train_frac: float = 0.8,
    seed: int = 0,
    n_iter: int = 20,
) -> DataFrame:
    """Fig. 5 experiment rows, one per consumer.

    Per the paper §VI-C.1: the first 80 % of each consumer's history trains,
    the rest tests; the optimal hidden-state count is tuned per user for
    both models (1..``max_states``, stop past the accuracy peak), and users
    are later grouped by the HMM's optimal state number (``opt_states``).
    """

    def per_user(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values(["ts", "item_id"], kind="stable")
        u = str(pdf["consumer"].iloc[0])
        obs = pdf["category"].to_numpy(dtype=np.int64)
        zs = pdf["z"].to_numpy(dtype=np.int64)
        if len(obs) < MIN_HISTORY:
            return pd.DataFrame(
                {"consumer": [u], "opt_states": [1], "acc_hmm": [np.nan], "acc_bihmm": [np.nan]}
            )
        s = _stable_seed(u, seed)
        _, n_opt, acc_h = fit_best_hmm(
            obs, n_categories, max_states=max_states, train_frac=train_frac,
            seed=s, n_iter=n_iter,
        )
        _, _, acc_b = fit_best_conditional(
            obs, zs, n_categories, n_z, max_states=max_states,
            train_frac=train_frac, seed=s, n_iter=n_iter,
        )
        return pd.DataFrame(
            {
                "consumer": [u],
                "opt_states": [int(n_opt)],
                "acc_hmm": [float(acc_h)],
                "acc_bihmm": [float(acc_b)],
            }
        )

    return inter_z.groupBy("consumer").applyInPandas(per_user, _ACC_SCHEMA)


def interest_probabilities(
    inter_z: DataFrame,
    *,
    n_categories: int,
    n_z: int,
    n_states: int = 3,
    window_sizes: tuple[int, ...] = (1, 2, 3, 4, 5, 6, 7, 8, 9, 10),
    seed: int = 0,
    n_iter: int = 15,
) -> DataFrame:
    """Per-(consumer, category) BiHMM probabilities for the ranker.

    One b-HMM fit per consumer on his full visible history; ``p_l`` is the
    next-category distribution given the whole history (long-term, Eq. 2)
    and ``p_s_w`` the distribution given only the last ``w`` interactions
    (the short-term window of Eq. 4), for every ``w`` in ``window_sizes`` —
    so the |W| sweep of Fig. 6 costs one fit, not ten.
    """
    ws = tuple(int(w) for w in window_sizes)
    schema = (
        "consumer string, category integer, p_l double, "
        + ", ".join(f"p_s_{w} double" for w in ws)
    )

    def per_user(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values(["ts", "item_id"], kind="stable")
        u = str(pdf["consumer"].iloc[0])
        obs = pdf["category"].to_numpy(dtype=np.int64)
        zs = pdf["z"].to_numpy(dtype=np.int64)
        out: dict[str, np.ndarray | list] = {
            "consumer": [u] * n_categories,
            "category": np.arange(n_categories, dtype=np.int32),
        }
        if len(obs) < MIN_HISTORY:
            uni = np.full(n_categories, 1.0 / n_categories)
            out["p_l"] = uni
            for w in ws:
                out[f"p_s_{w}"] = uni
            return pd.DataFrame(out)
        s = _stable_seed(u, seed)
        m = ConditionalHMM(n_states, n_categories, n_z).fit(
            [(obs, zs)], seed=s, n_iter=n_iter, n_restarts=2
        )
        out["p_l"] = _floor_dist(m.predict_next_dist(obs, zs))
        for w in ws:
            tail = slice(max(0, len(obs) - w), None)
            out[f"p_s_{w}"] = _floor_dist(m.predict_next_dist(obs[tail], zs[tail]))
        return pd.DataFrame(out)

    return inter_z.groupBy("consumer").applyInPandas(per_user, schema)
