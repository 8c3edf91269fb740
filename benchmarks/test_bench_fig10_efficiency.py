"""Fig. 10 benchmark: per-item response time, CPPse vs sequential CTT/UCD,
as the accumulated training stream grows."""
from repro.eval.harness import run_efficiency


def test_fig10_efficiency(benchmark, record, spark, prep_ytube):
    rows = benchmark.pedantic(
        lambda: run_efficiency(spark, prep_ytube, k=30), rounds=1, iterations=1
    )
    record("fig10_efficiency", rows)
    last = rows[-1]
    # the paper's shape: the index is faster than both sequential baselines,
    # and UCD is the slowest method
    assert last["ssrec_cppse_ms"] < last["ctt_ms"]
    assert last["ssrec_cppse_ms"] < last["ucd_ms"]
    assert last["ucd_ms"] > last["ctt_ms"]
    # baselines grow with data size; the index stays comparatively flat
    assert rows[-1]["ucd_ms"] > rows[0]["ucd_ms"]
