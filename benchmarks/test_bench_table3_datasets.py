"""Table III benchmark: generate all four datasets and report their
overview statistics (|Up|, |Uc|, |E|, |C|, |IRact|, |V|)."""
from repro.data.datasets import DATASETS, overview


def test_table3_datasets(benchmark, record, bench_sf):
    def run():
        return [overview(name, bench_sf) for name in DATASETS]

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    record("table3_datasets", rows)
    names = [r["dataset"] for r in rows]
    assert names == list(DATASETS)
    # twins mirror their base datasets' aggregate shape (Table III)
    by = {r["dataset"]: r for r in rows}
    assert by["syn_ytube"]["categories"] == by["ytube"]["categories"]
    assert by["syn_mlens"]["categories"] == by["mlens"]["categories"]
