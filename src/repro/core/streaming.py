"""Stream simulation and stateful profile maintenance.

Two layers, mirroring the paper's setup (§VI-B, following Wang et al. [31]):

* **Protocol** — :func:`partition_stream` orders all user–item interactions
  by timestamp and splits them into six equal partitions (``ntile`` over the
  global order): partitions 1–2 train, 3–6 test, and when partition ``i``
  is being tested the models have seen only partitions ``< i``.
  :func:`stream_batches` replays a partition as ordered micro-batches.

* **Stateful operator** — :func:`profile_update_stream` is a *real*
  Structured Streaming job: interactions arrive on a file stream, are
  grouped by consumer, and ``applyInPandasWithState`` maintains each user's
  short-term window (a fixed-size deque) and long-term category/producer
  counts, flushing window overflow into the long-term profile exactly as
  Algorithm 2's leaf update does. The paper runs this maintenance on Storm;
  the pure update function (:func:`apply_interactions`) is shared between
  the streaming operator and the batch harness so both paths provably agree
  (tests/test_streaming.py).
"""
from __future__ import annotations

import json
from collections import Counter
from dataclasses import dataclass, field
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout
from pyspark.sql.types import (
    LongType,
    StringType,
    StructField,
    StructType,
)

N_PARTITIONS = 6
N_TRAIN = 2


def partition_stream(interactions: DataFrame, n: int = N_PARTITIONS) -> DataFrame:
    """Add a 1-based ``partition`` column: ``ntile(n)`` over the global
    (ts, consumer, item_id) order — the paper's even temporal split."""
    if n < 1:
        raise ValueError("need at least one partition")
    win = Window.orderBy("ts", "consumer", "item_id")
    return interactions.withColumn("partition", F.ntile(n).over(win))


def stream_batches(
    interactions: pd.DataFrame, batch_size: int
) -> Iterator[pd.DataFrame]:
    """Replay interactions in timestamp order as micro-batches."""
    if batch_size < 1:
        raise ValueError("batch_size must be >= 1")
    ordered = interactions.sort_values(["ts", "consumer", "item_id"], kind="stable")
    for lo in range(0, len(ordered), batch_size):
        yield ordered.iloc[lo : lo + batch_size]


# ---------------------------------------------------------------- profiles


@dataclass
class UserProfileState:
    """One consumer's maintained profile: the fixed-size short-term window
    and long-term counts. ``apply`` implements Algorithm 2's leaf-entry
    update: append to the window, flush overflow into the long-term lists."""

    window: int
    short: list[tuple[int, int, str]] = field(default_factory=list)  # (ts, cat, prod)
    long_cat: Counter = field(default_factory=Counter)
    long_prod: Counter = field(default_factory=Counter)
    n_long: int = 0

    def apply(self, events: list[tuple[int, int, str]]) -> None:
        for ev in sorted(events):
            self.short.append(ev)
        while len(self.short) > self.window:
            _, cat, prod = self.short.pop(0)
            self.long_cat[cat] += 1
            self.long_prod[prod] += 1
            self.n_long += 1

    def to_json(self) -> tuple[str, str, str]:
        return (
            json.dumps(self.short),
            json.dumps(dict(self.long_cat)),
            json.dumps(dict(self.long_prod)),
        )

    @classmethod
    def from_json(cls, window: int, short: str, cats: str, prods: str) -> "UserProfileState":
        st = cls(window)
        st.short = [tuple(x) for x in json.loads(short)]  # type: ignore[misc]
        st.long_cat = Counter({int(k): v for k, v in json.loads(cats).items()})
        st.long_prod = Counter(json.loads(prods))
        st.n_long = sum(st.long_cat.values())
        return st


def apply_interactions(
    state: UserProfileState, batch: pd.DataFrame
) -> UserProfileState:
    """Apply one micro-batch (columns ts, category, producer) to a profile."""
    state.apply(
        list(
            zip(
                batch["ts"].astype(int),
                batch["category"].astype(int),
                batch["producer"].astype(str),
            )
        )
    )
    return state


_STATE_SCHEMA = StructType(
    [
        StructField("short", StringType()),
        StructField("long_cat", StringType()),
        StructField("long_prod", StringType()),
    ]
)
_OUTPUT_SCHEMA = StructType(
    [
        StructField("consumer", StringType()),
        StructField("n_long", LongType()),
        StructField("n_window", LongType()),
        StructField("n_seen", LongType()),
    ]
)

INTERACTION_DDL = "consumer string, item_id long, ts long, category int, producer string"


def profile_update_stream(
    spark: SparkSession, input_path: str, *, window: int, checkpoint: str
):
    """Build the Structured Streaming query maintaining user profiles.

    Reads JSON interaction files from ``input_path``, groups by consumer and
    updates :class:`UserProfileState` per micro-batch via
    ``applyInPandasWithState``. Emits one row per touched user per batch
    with the updated profile sizes; the full profile lives in the state
    store. Caller starts it with ``.writeStream`` (see tests for the memory
    -sink harness).
    """

    def update(key, pdfs, state: GroupState):
        consumer = key[0]
        if state.exists:
            short, cats, prods = state.get
            st = UserProfileState.from_json(window, short, cats, prods)
        else:
            st = UserProfileState(window)
        n_new = 0
        for pdf in pdfs:
            pdf = pdf.sort_values(["ts", "item_id"], kind="stable")
            apply_interactions(st, pdf)
            n_new += len(pdf)
        state.update(st.to_json())
        yield pd.DataFrame(
            {
                "consumer": [consumer],
                "n_long": [st.n_long],
                "n_window": [len(st.short)],
                "n_seen": [st.n_long + len(st.short)],
            }
        )

    stream = (
        spark.readStream.schema(INTERACTION_DDL)
        .option("maxFilesPerTrigger", 1)
        .json(input_path)
    )
    return (
        stream.groupBy("consumer")
        .applyInPandasWithState(
            update,
            outputStructType=_OUTPUT_SCHEMA,
            stateStructType=_STATE_SCHEMA,
            outputMode="update",
            timeoutConf=GroupStateTimeout.NoTimeout,
        )
    )
