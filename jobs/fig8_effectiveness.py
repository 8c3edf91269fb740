"""Fig. 8: P@k of ssRec vs ssRec-ne vs CTT vs UCD at k in {5,10,20,30}."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_stream_eval


def main() -> None:
    p = base_parser("Fig. 8 effectiveness comparison")
    p.add_argument("--lam", type=float, default=0.4)
    p.add_argument("--window", type=int, default=5)
    args = p.parse_args()
    spark = make_spark("fig8")
    prep = prepare(spark, args.dataset, args.sf)
    rows = []
    for method in ("ssrec", "ssrec-ne", "ucd", "ctt"):
        res = run_stream_eval(
            spark, prep, method=method, k_list=(5, 10, 20, 30),
            lam=args.lam, w=args.window,
        )
        rows.append({"method": method, **{f"p_at_{k}": v for k, v in res.items()}})
    print_table(f"Fig. 8 ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
