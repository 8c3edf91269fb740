"""Shift-add-xor string hashing and the chained hash table (§V-A).

The paper maps each *category–entity pair* to a hash code with the
shift-add-xor family of Ramakrishna & Zobel (their Eq. 5):

    init(s)        = seed
    step(i, h, c)  = h XOR (h<<L + h>>R + c)
    final(h)       = h mod T

and organises the pairs in a chained hash table whose elements are triads
``⟨key, sptr, nextptr⟩`` — the hash value, the set of pointers to the
extended signature-trees covering the pair, and the chain link. Python
lists play the chains; "pointers" are references to tree objects.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Hashable

_MASK = 0xFFFFFFFFFFFFFFFF  # 64-bit arithmetic like the paper's C setting


def shift_add_xor(s: str, *, seed: int = 1315423911, L: int = 5, R: int = 2) -> int:
    """The raw (un-modded) shift-add-xor hash of a string."""
    h = seed
    for ch in s:
        h = (h ^ (((h << L) & _MASK) + (h >> R) + ord(ch))) & _MASK
    return h


def pair_key(category: int, entity: str) -> str:
    """The phrase a category–entity pair is hashed as."""
    return f"{category}\x1f{entity}"


@dataclass
class _Triad:
    """One chain element: ⟨key, pair, sptrs⟩ (nextptr = list position)."""

    key: int
    pair: tuple[int, str]
    sptrs: list = field(default_factory=list)


class ChainedHashTable:
    """Chained hash table from category–entity pairs to signature trees.

    ``insert`` registers a tree under a pair (idempotent per (pair, tree));
    ``lookup`` returns the trees covering the pair. Collisions chain within
    a bucket and are disambiguated by the stored pair, exactly like the
    paper's ``nextptr`` walk.
    """

    def __init__(self, n_buckets: int = 1024, *, seed: int = 1315423911) -> None:
        if n_buckets < 1:
            raise ValueError("need at least one bucket")
        self.n_buckets = n_buckets
        self.seed = seed
        self.buckets: list[list[_Triad]] = [[] for _ in range(n_buckets)]
        self.n_pairs = 0

    def _bucket(self, category: int, entity: str) -> tuple[int, int]:
        h = shift_add_xor(pair_key(category, entity), seed=self.seed)
        return h, h % self.n_buckets

    def _find(self, category: int, entity: str) -> _Triad | None:
        h, b = self._bucket(category, entity)
        for triad in self.buckets[b]:
            if triad.key == h and triad.pair == (category, entity):
                return triad
        return None

    def insert(self, category: int, entity: str, tree: Hashable) -> None:
        """Register ``tree`` under the (category, entity) pair."""
        triad = self._find(category, entity)
        if triad is None:
            h, b = self._bucket(category, entity)
            triad = _Triad(h, (category, entity))
            self.buckets[b].append(triad)
            self.n_pairs += 1
        if tree not in triad.sptrs:
            triad.sptrs.append(tree)

    def lookup(self, category: int, entity: str) -> list:
        """Trees whose user block covers this pair (empty if unseen)."""
        triad = self._find(category, entity)
        return list(triad.sptrs) if triad else []

    def __contains__(self, pair: tuple[int, str]) -> bool:
        return self._find(*pair) is not None

    def __len__(self) -> int:
        return self.n_pairs

    def chain_lengths(self) -> list[int]:
        """Bucket occupancy — used by tests to check hash uniformity."""
        return [len(b) for b in self.buckets]
