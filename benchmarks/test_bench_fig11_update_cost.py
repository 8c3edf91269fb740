"""Fig. 11 benchmark: Algorithm-2 maintenance cost vs update batch size."""
from repro.eval.harness import run_update_cost


def test_fig11_update_cost(benchmark, record, spark, prep_ytube):
    rows = benchmark.pedantic(
        lambda: run_update_cost(spark, prep_ytube), rounds=1, iterations=1
    )
    record("fig11_update_cost", rows)
    # cost increases steadily (monotone) with the update size
    totals = [r["total_s"] for r in rows]
    assert totals[-1] > totals[0]
