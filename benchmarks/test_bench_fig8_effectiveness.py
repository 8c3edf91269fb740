"""Fig. 8 benchmark: P@k comparison of ssRec / ssRec-ne / UCD / CTT."""
from repro.eval.harness import run_stream_eval

KS = (5, 10, 20, 30)


def test_fig8_effectiveness(benchmark, record, spark, prep_ytube):
    def run():
        rows = []
        for method in ("ssrec", "ssrec-ne", "ucd", "ctt"):
            res = run_stream_eval(
                spark, prep_ytube, method=method, k_list=KS, lam=0.4, w=5
            )
            rows.append({"method": method, **{f"p_at_{k}": res[k] for k in KS}})
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    record("fig8_effectiveness", rows)
    by = {r["method"]: r for r in rows}
    # the paper's ordering: ssRec best, CTT worst, at every k
    for k in KS:
        col = f"p_at_{k}"
        assert by["ssrec"][col] >= by["ucd"][col]
        assert by["ssrec"][col] >= by["ctt"][col]
        assert by["ucd"][col] >= by["ctt"][col]
