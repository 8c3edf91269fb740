"""Fig. 7 benchmark: P@10 vs lambda_s at |W|=5, on both dataset families
(the paper finds a larger optimal lambda for YTube than MLens)."""
from repro.eval.harness import run_stream_eval


def _sweep(spark, prep):
    return [
        {
            "lambda_s": l / 10,
            "p_at_10": run_stream_eval(
                spark, prep, method="ssrec", k_list=(10,), lam=l / 10, w=5
            )[10],
        }
        for l in range(1, 11)
    ]


def test_fig7_lambda_ytube(benchmark, record, spark, prep_ytube):
    rows = benchmark.pedantic(lambda: _sweep(spark, prep_ytube), rounds=1, iterations=1)
    record("fig7_lambda_ytube", rows)
    ps = [r["p_at_10"] for r in rows]
    assert max(ps) > ps[-1]  # rise then fall: pure short-term is worse

def test_fig7_lambda_mlens(benchmark, record, spark, prep_mlens):
    rows = benchmark.pedantic(lambda: _sweep(spark, prep_mlens), rounds=1, iterations=1)
    record("fig7_lambda_mlens", rows)
    ps = [r["p_at_10"] for r in rows]
    assert max(ps) > ps[-1]
