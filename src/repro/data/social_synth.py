"""Synthetic social-media streams standing in for the paper's datasets.

The paper evaluates on crawled YouTube data (YTube), MovieLens-derived data
(MLens) and synthpop twins of each. None are shippable here, so this module
generates seeded synthetic equivalents whose *generative process plants
exactly the structure the paper's models exploit* (DESIGN.md §2):

* **Producer-dependence** — each producer runs a hidden-state chain; a
  consumer's next category depends jointly on his own hidden "taste" state
  and the state of the producer of the item he just browsed. This is the
  premise of the BiHMM (Fig. 3), so BiHMM > HMM is a property of the data.
* **Entity-topic affinity** — entities live in per-category *topics*; items
  draw their entity sets from one topic, and consumers like whole topics.
  A user's history reveals only some of a topic's entities, so proximity
  (co-occurrence) expansion recovers liked-but-unseen entities — the
  mechanism behind ssRec > ssRec-ne (Fig. 8).
* **Drift** — consumer taste chains move over time, and the state→category
  mapping itself slowly rotates, so profile/model updates matter (Fig. 9)
  and a mid-sized short-term window is informative (Fig. 6).

Output is plain pandas (deterministic in ``seed``); ``SocialData.to_spark``
lifts the three tables (items, item_entities, interactions) into Spark
DataFrames for the pipeline. Entity sets are emitted as an exploded
``item_entities`` table so the DuckDB oracle can compare them (array columns
are not orderable).
"""
from __future__ import annotations

from dataclasses import dataclass, replace

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

HORIZON = 60_000  # simulated stream clock units; 6 partitions of ~10k


@dataclass(frozen=True)
class SocialConfig:
    """Knobs of the generative process. ``scaled(sf)`` shrinks/grows the
    population while keeping the behavioural parameters fixed."""

    name: str
    n_categories: int
    n_producers: int
    n_consumers: int
    topics_per_category: int = 4
    entities_per_topic: int = 20
    items_per_producer: int = 90
    mean_interactions: int = 56
    n_z: int = 2  # planted producer hidden states
    n_taste: int = 3  # planted consumer taste states
    producer_switch_prob: float = 0.08
    taste_switch_prob: float = 0.18
    producer_influence: float = 0.75  # β: taste follows producer state
    category_match_prob: float = 0.9
    drift_prob: float = 0.004  # per-step chance the taste→category map rotates
    #: near-duplicate aversion (the paper's "John gets bored of Nadal
    #: videos" motivation): item-choice penalty per entity shared with the
    #: consumer's last few consumed items. Rewards diversity-aware
    #: recommenders and punishes exact-repetition CF.
    boredom_weight: float = 0.8
    boredom_memory: int = 3
    entities_per_item: int = 4
    follow_min: int = 2
    follow_max: int = 4
    seed: int = 0

    def scaled(self, sf: float) -> "SocialConfig":
        return replace(
            self,
            n_producers=max(6, int(round(self.n_producers * sf))),
            n_consumers=max(30, int(round(self.n_consumers * sf))),
        )

    @property
    def n_entities(self) -> int:
        return self.n_categories * self.topics_per_category * self.entities_per_topic


#: Behavioural presets for the four paper datasets. Consumer/producer counts
#: are the SF=1.0 populations; experiments use ``.scaled(sf)``.
YTUBE = SocialConfig(
    name="ytube",
    n_categories=19,
    n_producers=400,
    n_consumers=10_000,
    taste_switch_prob=0.22,  # YouTube interests are volatile (paper §VI-C.3)
    drift_prob=0.015,
    seed=11,
)
MLENS = SocialConfig(
    name="mlens",
    n_categories=15,
    n_producers=160,
    n_consumers=6_000,
    taste_switch_prob=0.10,  # movie tastes are steadier → smaller optimal λs
    drift_prob=0.007,
    producer_switch_prob=0.06,
    seed=23,
)


@dataclass
class SocialData:
    """One generated dataset: three pandas tables + the config that made it.

    ``items``: item_id, producer, category, ts
    ``item_entities``: item_id, entity, pos (exploded entity sets)
    ``interactions``: consumer, item_id, ts, category, producer
    """

    config: SocialConfig
    items: pd.DataFrame
    item_entities: pd.DataFrame
    interactions: pd.DataFrame

    def to_spark(self, spark: SparkSession) -> dict[str, DataFrame]:
        return {
            "items": spark.createDataFrame(self.items),
            "item_entities": spark.createDataFrame(self.item_entities),
            "interactions": spark.createDataFrame(self.interactions),
        }

    def entities_of(self) -> dict[int, list[str]]:
        """item_id → entity list, in position order."""
        g = self.item_entities.sort_values(["item_id", "pos"])
        return g.groupby("item_id")["entity"].apply(list).to_dict()


def entity_name(category: int, topic: int, j: int) -> str:
    """Readable, collision-free entity identifiers, e.g. ``e7_t2_3``."""
    return f"e{category}_t{topic}_{j}"


def regime_pools(n_categories: int, n_z: int) -> tuple[list[list[int]], list[int]]:
    """Split the category space into ``n_z`` exclusive per-regime pools plus
    a *shared* pool every regime may also emit.

    The shared categories make a single item's category ambiguous about the
    regime — only the a-HMM, which sees the producer's whole stream, can
    decode which regime an ambiguous item belongs to. That information
    asymmetry is what gives the BiHMM its edge over a per-consumer HMM
    (Fig. 5): the paper's "bursting producer interrupts the user's regular
    trajectory" story.
    """
    n_shared = max(2, n_categories // 5)
    exclusive = list(range(n_categories - n_shared))
    shared = list(range(n_categories - n_shared, n_categories))
    per = max(1, len(exclusive) // n_z)
    pools = [exclusive[k * per : (k + 1) * per] for k in range(n_z)]
    pools[-1].extend(exclusive[n_z * per :])
    return pools, shared


def _producer_chain(g, cfg, pools, shared):
    """One producer's planted regimes: regime ``k`` emits {one exclusive
    category from global pool ``k``, one shared category}, plus a preferred
    entity topic. Exclusive pools are globally ordered, so regimes have
    consistent *semantics* across producers (low-id categories ↔ regime 0),
    which the canonical a-HMM state relabeling in ``decode_producers``
    recovers without touching ground truth."""
    states = []
    sh = int(shared[int(g.integers(0, len(shared)))])
    for k in range(cfg.n_z):
        excl = int(pools[k][int(g.integers(0, len(pools[k])))])
        topic = int(g.integers(0, cfg.topics_per_category))
        states.append(((excl, sh), topic))
    return states


def generate(cfg: SocialConfig) -> SocialData:
    """Run the generative process. Deterministic in ``cfg.seed``."""
    g = np.random.default_rng(cfg.seed)
    C, Z = cfg.n_categories, cfg.n_z

    # ---------------------------------------------------------- producers
    # Each producer emits from few categories overall, matching the paper's
    # observation that "producers often create social items of one category".
    producers = [f"p{i}" for i in range(cfg.n_producers)]
    pools, shared = regime_pools(C, Z)
    prod_states = {p: _producer_chain(g, cfg, pools, shared) for p in producers}
    prod_home = {
        p: sorted({c for cat_set, _ in prod_states[p] for c in cat_set})
        for p in producers
    }
    # Zipfian producer popularity — a handful of BBC-like accounts dominate.
    pop = 1.0 / np.arange(1, cfg.n_producers + 1) ** 1.05
    pop /= pop.sum()

    items_rows: list[tuple] = []
    ent_rows: list[tuple] = []
    prod_item_ids: dict[str, list[int]] = {p: [] for p in producers}
    prod_item_ts: dict[str, list[int]] = {p: [] for p in producers}
    prod_item_z: dict[str, list[int]] = {p: [] for p in producers}
    item_id = 0
    for p in producers:
        ts_list = np.sort(g.integers(0, HORIZON, cfg.items_per_producer))
        state = int(g.integers(0, Z))
        for ts in ts_list:
            if g.random() < cfg.producer_switch_prob:
                state = int(g.integers(0, Z))
            cat_set, topic_pref = prod_states[p][state]
            if g.random() < cfg.category_match_prob:
                cat = int(cat_set[int(g.integers(0, len(cat_set)))])
                topic = topic_pref
            else:
                cat = int(g.integers(0, C))
                topic = int(g.integers(0, cfg.topics_per_category))
            n_ent = 2 + int(g.integers(0, cfg.entities_per_item - 1))
            # Zipf-within-topic entity draws ⇒ strong co-occurrence structure.
            w = 1.0 / np.arange(1, cfg.entities_per_topic + 1) ** 0.7
            w /= w.sum()
            ent_idx = g.choice(cfg.entities_per_topic, size=n_ent, replace=False, p=w)
            items_rows.append((item_id, p, cat, int(ts), state))
            for pos, j in enumerate(sorted(ent_idx.tolist())):
                ent_rows.append((item_id, entity_name(cat, topic, j), pos))
            prod_item_ids[p].append(item_id)
            prod_item_ts[p].append(int(ts))
            prod_item_z[p].append(state)
            item_id += 1

    # z_true is the *planted* regime — test diagnostics only, never model
    # input (decode_producers recovers its own z from categories alone).
    items = pd.DataFrame(
        items_rows, columns=["item_id", "producer", "category", "ts", "z_true"]
    )
    item_entities = pd.DataFrame(ent_rows, columns=["item_id", "entity", "pos"])
    item_cat = items["category"].to_numpy()
    ents_by_item = item_entities.groupby("item_id")["entity"].apply(set).to_dict()

    # ---------------------------------------------------------- consumers
    # Each consumer follows a few producers; his taste chain prefers one
    # (category, topic) per state; with prob producer_influence his next
    # state is *aligned to the producer's state* instead of his own chain.
    inter_rows: list[tuple] = []
    for ci in range(cfg.n_consumers):
        u = f"u{ci}"
        n_follow = int(g.integers(cfg.follow_min, cfg.follow_max + 1))
        follows = g.choice(cfg.n_producers, size=n_follow, replace=False, p=pop)
        follows = [producers[i] for i in follows]
        # taste states: preferred (category, topic) pairs drawn from the
        # followed producers' home turf so matches actually exist.
        taste_pref = []
        for s in range(cfg.n_taste):
            p = follows[s % n_follow]
            cat = prod_home[p][s % len(prod_home[p])]
            topic = int(g.integers(0, cfg.topics_per_category))
            taste_pref.append([cat, topic])
        n_steps = max(12, int(g.poisson(cfg.mean_interactions)))
        step_ts = np.sort(g.integers(0, HORIZON, n_steps))
        taste = int(g.integers(0, cfg.n_taste))
        last_p: str | None = None
        recent_sets: list[set] = []  # boredom memory (near-duplicate aversion)
        for ts in step_ts:
            if g.random() < cfg.drift_prob:
                # interest drift: every state's preferred category rotates
                for pref in taste_pref:
                    pref[0] = (pref[0] + 1) % C
            # with prob producer_influence the consumer follows the *current
            # regime* of the producer he last consumed from — the planted
            # producer→consumer dependency the BiHMM exploits.
            p: str | None = None
            want_cat = want_topic = None
            if g.random() < cfg.producer_influence and last_p is not None:
                idx = int(np.searchsorted(prod_item_ts[last_p], ts, side="right")) - 1
                if idx >= 0:
                    regime = prod_item_z[last_p][idx]
                    cat_set, want_topic = prod_states[last_p][regime]
                    want_cat = int(cat_set[0])  # the regime's exclusive category
                    p = last_p
            if want_cat is None:
                if g.random() < cfg.taste_switch_prob:
                    taste = int(g.integers(0, cfg.n_taste))
                want_cat, want_topic = taste_pref[taste]
                cands = [q for q in follows if want_cat in prod_home[q]] or follows
                p = cands[int(g.integers(0, len(cands)))]
            assert p is not None
            # eligible: producer's items published before ts (last 12)
            ts_arr = prod_item_ts[p]
            hi = int(np.searchsorted(ts_arr, ts, side="right"))
            if hi == 0:
                continue
            lo = max(0, hi - 12)
            pool = prod_item_ids[p][lo:hi]
            want_ents = {
                entity_name(want_cat, want_topic, j)
                for j in range(cfg.entities_per_topic)
            }
            recent_union = set().union(*recent_sets) if recent_sets else set()
            scores = np.array(
                [
                    3.0 * (item_cat[i] == want_cat)
                    + 1.0 * len(ents_by_item.get(i, set()) & want_ents)
                    - cfg.boredom_weight
                    * len(ents_by_item.get(i, set()) & recent_union)
                    for i in pool
                ]
            )
            probs = np.exp(scores - scores.max())
            probs /= probs.sum()
            chosen = pool[int(g.choice(len(pool), p=probs))]
            inter_rows.append(
                (u, chosen, int(ts), int(item_cat[chosen]), items.at[chosen, "producer"])
            )
            last_p = str(items.at[chosen, "producer"])
            recent_sets.append(ents_by_item.get(chosen, set()))
            if len(recent_sets) > cfg.boredom_memory:
                recent_sets.pop(0)

    interactions = pd.DataFrame(
        inter_rows, columns=["consumer", "item_id", "ts", "category", "producer"]
    ).sort_values(["ts", "consumer", "item_id"], kind="stable").reset_index(drop=True)
    return SocialData(cfg, items, item_entities, interactions)


def synthetic_twin(base: SocialData, *, seed: int) -> SocialData:
    """A synthpop-style twin (used for SynYTube / SynMLens).

    synthpop fits conditional models to the original microdata and samples a
    new population from them. At our schema's granularity that means:
    re-run the generative process with a fresh seed but *the exact same
    behavioural configuration* — identical category/topic/producer structure
    and interaction dynamics, different micro-records — which matches the
    paper's Table III, where the twins have near-identical aggregate counts
    but slightly different interaction totals.
    """
    cfg = replace(base.config, name=f"syn_{base.config.name}", seed=seed)
    return generate(cfg)
