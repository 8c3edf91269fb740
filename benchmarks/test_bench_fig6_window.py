"""Fig. 6 benchmark: P@10 vs short-term window size (lambda tuned)."""
from repro.eval.harness import run_stream_eval


def test_fig6_window_size(benchmark, record, spark, prep_ytube):
    def run():
        rows = []
        for w in range(1, 11):
            best_p, best_l = max(
                (
                    run_stream_eval(
                        spark, prep_ytube, method="ssrec", k_list=(10,), lam=l / 10, w=w
                    )[10],
                    l / 10,
                )
                for l in range(1, 11)
            )
            rows.append({"window": w, "best_lambda": best_l, "p_at_10": best_p})
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    record("fig6_window_size", rows)
    ps = [r["p_at_10"] for r in rows]
    best_w = rows[ps.index(max(ps))]["window"]
    # interior optimum: extremes do not win outright
    assert ps[best_w - 1] >= ps[-1]
    assert best_w < 10
