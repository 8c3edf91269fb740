"""Benchmark fixtures: SF=0.1 datasets shared across all table/figure
benchmarks (snapshot caches live on the Prepared objects, so later
benchmarks reuse the earlier ones' model fits)."""
import json
import os
from pathlib import Path

import pytest

from repro.eval.harness import prepare

BENCH_SF = float(os.environ.get("BENCH_SF", "0.1"))
RESULTS_DIR = Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def bench_sf():
    return BENCH_SF

@pytest.fixture(scope="session")
def prep_ytube(spark):
    return prepare(spark, "ytube", BENCH_SF)


@pytest.fixture(scope="session")
def prep_mlens(spark):
    return prepare(spark, "mlens", BENCH_SF)


@pytest.fixture(scope="session")
def record():
    """Persist one benchmark's result rows for EXPERIMENTS.md."""
    RESULTS_DIR.mkdir(exist_ok=True)

    def _write(name: str, rows):
        path = RESULTS_DIR / f"{name}.json"
        path.write_text(json.dumps(rows, indent=2, default=str))
        print(f"\n[{name}] -> {path}")
        for r in rows:
            print(" ", r)

    return _write
