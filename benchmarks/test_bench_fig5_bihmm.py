"""Fig. 5 benchmark: BiHMM vs HMM accuracy grouped by optimal states."""
from repro.eval.harness import run_fig5


def test_fig5_bihmm_vs_hmm(benchmark, record, spark, prep_ytube):
    rows = benchmark.pedantic(
        lambda: run_fig5(spark, prep_ytube, max_states=6), rounds=1, iterations=1
    )
    record("fig5_bihmm_vs_hmm", rows)
    # the paper's claim: BiHMM beats HMM overall (weighted by group size)
    n = sum(r["n_users"] for r in rows)
    hmm = sum(r["acc_hmm"] * r["n_users"] for r in rows) / n
    bihmm = sum(r["acc_bihmm"] * r["n_users"] for r in rows) / n
    assert bihmm > hmm
