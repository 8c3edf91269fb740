"""Dataset registry: the four evaluation collections at a scale factor.

Mirrors the paper's Table III line-up — YTube, SynYTube, MLens, SynMLens —
via the generators in :mod:`repro.data.social_synth`. Results are cached per
(name, sf) within a process so the harness and the benchmarks share one
generation pass.
"""
from __future__ import annotations

from functools import lru_cache

from repro.data.social_synth import MLENS, YTUBE, SocialData, generate, synthetic_twin

DATASETS = ("ytube", "syn_ytube", "mlens", "syn_mlens")


@lru_cache(maxsize=8)
def load(name: str, sf: float = 0.02) -> SocialData:
    """Generate (or fetch cached) dataset ``name`` at scale factor ``sf``."""
    if name == "ytube":
        return generate(YTUBE.scaled(sf))
    if name == "mlens":
        return generate(MLENS.scaled(sf))
    if name == "syn_ytube":
        return synthetic_twin(load("ytube", sf), seed=101)
    if name == "syn_mlens":
        return synthetic_twin(load("mlens", sf), seed=202)
    raise ValueError(f"unknown dataset {name!r}; choose from {DATASETS}")


def overview(name: str, sf: float = 0.02) -> dict:
    """One Table-III row: |Up|, |Uc|, |E|, |C|, |IRact|, |V|."""
    d = load(name, sf)
    return {
        "dataset": name,
        "producers": d.items["producer"].nunique(),
        "consumers": d.interactions["consumer"].nunique(),
        "entities": d.item_entities["entity"].nunique(),
        "categories": int(d.items["category"].nunique()),
        "interactions": len(d.interactions),
        "items": len(d.items),
    }
