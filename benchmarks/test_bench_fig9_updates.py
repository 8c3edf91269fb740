"""Fig. 9 benchmark: ssRec with vs without profile/model updates."""
from repro.eval.harness import run_stream_eval

KS = (5, 10, 20, 30)


def test_fig9_updates(benchmark, record, spark, prep_ytube):
    def run():
        rows = []
        for label, update in (("ssrec", True), ("ssrec-nu", False)):
            res = run_stream_eval(
                spark, prep_ytube, method="ssrec", k_list=KS, lam=0.4, w=5,
                update=update,
            )
            rows.append({"method": label, **{f"p_at_{k}": res[k] for k in KS}})
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    record("fig9_updates", rows)
    by = {r["method"]: r for r in rows}
    for k in KS:
        assert by["ssrec"][f"p_at_{k}"] > by["ssrec-nu"][f"p_at_{k}"]
