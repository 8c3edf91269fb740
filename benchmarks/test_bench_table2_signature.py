"""Table II benchmark: signature vocabulary factors vs user-block count."""
from repro.eval.harness import run_table2


def test_table2_signature_size(benchmark, record, spark, prep_ytube):
    rows = benchmark.pedantic(
        lambda: run_table2(spark, prep_ytube), rounds=1, iterations=1
    )
    record("table2_signature_size", rows)
    # the paper's effect: more blocks => (weakly) smaller max vocabularies
    first, last = rows[0], rows[-1]
    assert last["max_entity_num"] <= first["max_entity_num"]
    assert last["max_producer_num"] <= first["max_producer_num"]
