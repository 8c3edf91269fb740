"""The stream-evaluation harness (§VI-B, protocol of Wang et al. [31]).

All interactions are ordered by timestamp and ntile-split into six
partitions; the first two train, the last four test. When partition ``i``
is under test, every model has seen only partitions ``< i`` (the *updated*
setting; the ``-nu`` ablation freezes the model after partitions 1–2). Per
test item the methods return a ranked user list; a hit is a returned user
who truly interacted with that item inside the test partition, and
``P@k = #Hit/(|V|·k)``.

The harness glues the Spark stages together per snapshot:

    decode_producers → with_producer_state → interest_probabilities
    build_profile_stats (per window) → entity_expansion

then evaluates with the vectorised scorer, the CPPse-index, or a baseline.
Snapshots are cached per (dataset, sf, upto) so parameter sweeps re-score
without re-fitting.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.ctt import build_ctt
from repro.baselines.ucd import build_ucd
from repro.core.entities import entity_expansion, expansion_map
from repro.core.interest import (
    bihmm_vs_hmm_accuracy,
    decode_producers,
    interest_probabilities,
    with_producer_state,
)
from repro.core.matching import ItemQuery, encode_item, score_users, top_k_users
from repro.core.profiles import ProfileStats, build_profile_stats, category_entity_pairs, split_short_window
from repro.core.streaming import N_PARTITIONS, N_TRAIN, partition_stream
from repro.data.datasets import load
from repro.eval.metrics import grouped_accuracy, hits_at_k, p_at_k
from repro.index.cppse import CPPseIndex

from pyspark.sql import functions as F

N_Z = 2  # a-HMM states (both planted generators use two regimes)
N_STATES = 3  # b-HMM consumer states for the ranker fits
WINDOW_SIZES = (1, 2, 3, 4, 5, 6, 7, 8, 9, 10)


@dataclass
class Prepared:
    """One dataset lifted to Spark with its stream partitioning."""

    name: str
    sf: float
    data: object
    sdf: dict
    inter_pd: pd.DataFrame  # interactions + partition column
    entities_of: dict[int, list[str]]
    _snapshots: dict = field(default_factory=dict)

    @property
    def n_categories(self) -> int:
        return self.data.config.n_categories


def prepare(spark: SparkSession, name: str, sf: float) -> Prepared:
    """Generate the dataset, lift to Spark, and assign stream partitions."""
    data = load(name, sf)
    sdf = data.to_spark(spark)
    for df in sdf.values():
        df.cache().count()
    inter_pd = (
        partition_stream(sdf["interactions"], N_PARTITIONS)
        .toPandas()
        .sort_values(["ts", "consumer", "item_id"], kind="stable")
        .reset_index(drop=True)
    )
    return Prepared(
        name=name,
        sf=sf,
        data=data,
        sdf=sdf,
        inter_pd=inter_pd,
        entities_of=data.entities_of(),
    )


@dataclass
class Snapshot:
    """Everything needed to score items after training on partitions
    ``<= upto``: per-window profile statistics, the BiHMM probability
    matrices, and the expansion map over the items visible so far."""

    upto: int
    boundary_ts: int
    train_pd: pd.DataFrame
    stats: dict[int, ProfileStats]
    p_l: np.ndarray
    p_s: dict[int, np.ndarray]
    users: list[str]
    expmap: dict
    pairs: list[tuple[str, int, str]]


def snapshot(spark: SparkSession, prep: Prepared, upto: int) -> Snapshot:
    """Build (or fetch cached) the training snapshot for partitions 1..upto."""
    if upto in prep._snapshots:
        return prep._snapshots[upto]
    if not 1 <= upto < N_PARTITIONS:
        raise ValueError(f"upto must be in 1..{N_PARTITIONS - 1}")
    train_pd = prep.inter_pd[prep.inter_pd["partition"] <= upto]
    boundary = int(train_pd["ts"].max())
    C = prep.n_categories

    inter = spark.createDataFrame(
        train_pd.drop(columns=["partition"])
    ).cache()
    items_vis = prep.sdf["items"].filter(F.col("ts") <= boundary).cache()

    decoded = decode_producers(items_vis, n_z=N_Z, n_categories=C, seed=7)
    inter_z = with_producer_state(inter, decoded)
    probs = interest_probabilities(
        inter_z,
        n_categories=C,
        n_z=N_Z,
        n_states=N_STATES,
        window_sizes=WINDOW_SIZES,
        seed=13,
    ).toPandas()

    all_producers = [r["producer"] for r in prep.sdf["items"].select("producer").distinct().collect()]
    all_entities = [r["entity"] for r in prep.sdf["item_entities"].select("entity").distinct().collect()]
    stats: dict[int, ProfileStats] = {}
    pairs: list[tuple[str, int, str]] = []
    for w in WINDOW_SIZES:
        stats[w] = build_profile_stats(
            inter,
            prep.sdf["item_entities"],
            window=w,
            all_producers=all_producers,
            all_entities=all_entities,
        )
    users = stats[WINDOW_SIZES[0]].users
    uidx = {u: i for i, u in enumerate(users)}
    p_l = np.full((len(users), C), 1.0 / C)
    p_s = {w: np.full((len(users), C), 1.0 / C) for w in WINDOW_SIZES}
    for r in probs.itertuples(index=False):
        i = uidx.get(r.consumer)
        if i is None:
            continue
        p_l[i, r.category] = r.p_l
        for w in WINDOW_SIZES:
            p_s[w][i, r.category] = getattr(r, f"p_s_{w}")

    expmap = expansion_map(
        entity_expansion(items_vis, prep.sdf["item_entities"], top_n=1)
    )
    long_term = split_short_window(inter, 5).filter("NOT in_window")
    pairs = [
        (r["consumer"], int(r["category"]), r["entity"])
        for r in category_entity_pairs(long_term, prep.sdf["item_entities"]).collect()
    ]
    snap = Snapshot(
        upto=upto,
        boundary_ts=boundary,
        train_pd=train_pd,
        stats=stats,
        p_l=p_l,
        p_s=p_s,
        users=users,
        expmap=expmap,
        pairs=pairs,
    )
    prep._snapshots[upto] = snap
    return snap


# ----------------------------------------------------------- evaluation


def test_items(prep: Prepared, part: int) -> list[tuple[int, set[str]]]:
    """The stream items of a test partition with their ground-truth
    consumers, in arrival order."""
    sl = prep.inter_pd[prep.inter_pd["partition"] == part]
    order = sl.groupby("item_id")["ts"].min().sort_values()
    truth = sl.groupby("item_id")["consumer"].apply(set)
    return [(int(i), set(truth[i])) for i in order.index]


def item_query(
    prep: Prepared, item_id: int, expmap: dict | None, *, expand: bool
) -> ItemQuery:
    row = prep.data.items.loc[item_id]
    return encode_item(
        item_id,
        int(row["category"]),
        str(row["producer"]),
        prep.entities_of.get(item_id, []),
        expmap,
        expand=expand,
    )


def evaluate_topk(
    prep: Prepared,
    part: int,
    topk_fn,
    k_list: tuple[int, ...],
    *,
    expmap: dict | None = None,
    expand: bool = False,
) -> dict[int, tuple[int, int]]:
    """Run ``topk_fn(q, k)`` over the partition's items; returns per k the
    (hits, n_items) pair so callers can pool across partitions."""
    kmax = max(k_list)
    out = {k: 0 for k in k_list}
    items = test_items(prep, part)
    for item_id, truth in items:
        q = item_query(prep, item_id, expmap, expand=expand)
        ranked = [u for u, _ in topk_fn(q, kmax)]
        for k in k_list:
            out[k] += hits_at_k(ranked, truth, k)
    return {k: (out[k], len(items)) for k in k_list}


def ssrec_topk_fn(snap: Snapshot, lam: float, w: int):
    """The ssRec ranker: Eq. (3) over the snapshot, vectorised."""
    stats = snap.stats[w]
    p_s = snap.p_s[w]

    def topk(q: ItemQuery, k: int):
        return top_k_users(score_users(stats, snap.p_l, p_s, q, lam), snap.users, k)

    return topk


def run_stream_eval(
    spark: SparkSession,
    prep: Prepared,
    *,
    method: str,
    k_list: tuple[int, ...] = (10,),
    lam: float = 0.4,
    w: int = 5,
    update: bool = True,
    index_mode: str = "hash",
) -> dict[int, float]:
    """Pooled P@k over the four test partitions for one method.

    ``method``: 'ssrec' (entity expansion), 'ssrec-ne' (no expansion),
    'ssrec-index' (CPPse-index ranking), 'ctt' or 'ucd'. ``update=False``
    freezes the model at partitions 1–2 (the Fig. 9 '-nu' ablation).
    """
    totals = {k: [0, 0] for k in k_list}
    for part in range(N_TRAIN + 1, N_PARTITIONS + 1):
        upto = part - 1 if update else N_TRAIN
        snap = snapshot(spark, prep, upto)
        if method in ("ssrec", "ssrec-ne"):
            fn = ssrec_topk_fn(snap, lam, w)
            res = evaluate_topk(
                prep, part, fn, k_list,
                expmap=snap.expmap, expand=(method == "ssrec"),
            )
        elif method == "ssrec-index":
            index = build_index(snap, lam=lam, w=w)
            fn = lambda q, k: index.query(q, k, mode=index_mode)[0]  # noqa: E731
            res = evaluate_topk(prep, part, fn, k_list, expmap=snap.expmap, expand=True)
        elif method == "ctt":
            model = build_ctt(snap.train_pd, prep.entities_of, prep.n_categories)
            res = evaluate_topk(prep, part, model.top_k, k_list)
        elif method == "ucd":
            model = build_ucd(snap.train_pd, prep.entities_of, prep.n_categories)
            res = evaluate_topk(prep, part, model.top_k, k_list)
        else:
            raise ValueError(f"unknown method {method!r}")
        for k, (h, n) in res.items():
            totals[k][0] += h
            totals[k][1] += n
    return {k: p_at_k(h, n, k) for k, (h, n) in totals.items()}


def build_index(
    snap: Snapshot, *, lam: float, w: int, n_blocks: int = 10, fanout: int = 8
) -> CPPseIndex:
    """A CPPse-index over one snapshot (used by ssrec-index and Fig. 10/11)."""
    return CPPseIndex.build(
        snap.stats[w],
        snap.p_l,
        snap.p_s[w],
        snap.pairs,
        lam=lam,
        n_blocks=n_blocks,
        fanout=fanout,
    )


# ----------------------------------------------------- Fig. 10 / Fig. 11


def run_efficiency(
    spark: SparkSession,
    prep: Prepared,
    *,
    k: int = 30,
    lam: float = 0.4,
    w: int = 5,
    max_items: int = 60,
    n_parts_list: tuple[int, ...] = (1, 2, 3, 4),
) -> list[dict]:
    """Fig. 10: average per-item response time as the accumulated data
    grows (the x-axis "number of partitions" = training-set size).

    ssRec answers through the CPPse-index (hash candidate filtering +
    branch-and-bound); CTT and UCD match every user sequentially, as the
    paper describes ("can only process all candidates sequentially").
    """
    import time

    rows = []
    for n_parts in n_parts_list:
        snap = snapshot(spark, prep, n_parts)
        index = build_index(snap, lam=lam, w=w)
        ctt = build_ctt(snap.train_pd, prep.entities_of, prep.n_categories)
        ucd = build_ucd(snap.train_pd, prep.entities_of, prep.n_categories)
        items = test_items(prep, n_parts + 1)[:max_items]
        queries = [
            item_query(prep, iid, snap.expmap, expand=True) for iid, _ in items
        ]
        timings: dict[str, float] = {}
        entries = 0
        for name, fn in (
            ("ssrec_cppse", lambda q: index.query(q, k, mode="hash")),
            ("ctt", lambda q: ctt.top_k_seq(q, k)),
            ("ucd", lambda q: ucd.top_k_seq(q, k)),
        ):
            t0 = time.perf_counter()
            for q in queries:
                out = fn(q)
                if name == "ssrec_cppse":
                    entries += out[1].n_entries_scored
            timings[name] = (time.perf_counter() - t0) / max(len(queries), 1)
        rows.append(
            {
                "n_partitions": n_parts,
                "n_users": len(snap.users),
                "n_interactions": len(snap.train_pd),
                "avg_entries_scored": entries / max(len(queries), 1),
                **{f"{m}_ms": 1000 * t for m, t in timings.items()},
            }
        )
    return rows


def run_update_cost(
    spark: SparkSession,
    prep: Prepared,
    *,
    lam: float = 0.4,
    w: int = 5,
    sizes: tuple[int, ...] = (100, 200, 400, 800, 1600),
) -> list[dict]:
    """Fig. 11: CPPse-index maintenance (Algorithm 2) cost vs update size.

    The index is built on the training partitions; update batches replay
    the next partition's interactions as profile updates (category,
    producer, entities per event), timing the full maintenance pass.
    """
    import time

    snap = snapshot(spark, prep, N_TRAIN)
    stream = prep.inter_pd[prep.inter_pd["partition"] == N_TRAIN + 1]
    rows = []
    for size in sizes:
        index = build_index(snap, lam=lam, w=w)
        batch = stream.head(size)
        events_by_user: dict[str, list] = {}
        for r in batch.itertuples(index=False):
            events_by_user.setdefault(r.consumer, []).append(
                (int(r.category), str(r.producer), prep.entities_of.get(int(r.item_id), []))
            )
        t0 = time.perf_counter()
        for user_id, events in events_by_user.items():
            index.update_user_profile(user_id, events)
        elapsed = time.perf_counter() - t0
        rows.append(
            {
                "update_size": len(batch),
                "n_users_touched": len(events_by_user),
                "total_s": elapsed,
                "per_event_ms": 1000 * elapsed / max(len(batch), 1),
            }
        )
    return rows


# --------------------------------------------------------- Table II


def run_table2(
    spark: SparkSession,
    prep: Prepared,
    *,
    block_nums: tuple[int, ...] = (1, 10, 20, 30, 40, 50),
    w: int = 5,
) -> list[dict]:
    """Table II: max per-block entity/producer vocabulary vs block count.

    One-pass clustering is re-run per target block count; the signature
    vocabulary of a block is the union of its users' consumed entity /
    producer sets — exactly what an extended signature tree must encode.
    """
    from repro.index.blocks import threshold_for_blocks

    snap = snapshot(spark, prep, N_TRAIN)
    stats = snap.stats[w]
    rows = []
    for target in block_nums:
        _, blocks = threshold_for_blocks(snap.p_l, target)
        max_e = max_p = 0
        for idxs in blocks:
            ents: set[int] = set()
            prods: set[int] = set()
            for u in idxs:
                ents.update(np.nonzero(stats.n_ue[u])[0].tolist())
                prods.update(np.nonzero(stats.n_up[u])[0].tolist())
            max_e = max(max_e, len(ents))
            max_p = max(max_p, len(prods))
        rows.append(
            {
                "target_blocks": target,
                "achieved_blocks": len(blocks),
                "max_entity_num": max_e,
                "max_producer_num": max_p,
            }
        )
    return rows


# ------------------------------------------------------- Fig. 5 pipeline


def run_fig5(spark: SparkSession, prep: Prepared, *, max_states: int = 8) -> list[dict]:
    """BiHMM vs HMM next-category accuracy, grouped by the per-user optimal
    hidden-state count (80/20 temporal split of each user's history)."""
    C = prep.n_categories
    decoded = decode_producers(prep.sdf["items"], n_z=N_Z, n_categories=C, seed=7)
    inter_z = with_producer_state(prep.sdf["interactions"], decoded)
    acc = bihmm_vs_hmm_accuracy(
        inter_z, n_categories=C, n_z=N_Z, max_states=max_states, seed=5
    ).toPandas()
    return grouped_accuracy(
        acc["opt_states"].to_numpy(),
        acc["acc_hmm"].to_numpy(),
        acc["acc_bihmm"].to_numpy(),
    )
