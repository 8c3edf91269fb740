"""Fig. 9: effect of user profile updates (ssRec vs frozen ssRec-nu)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_stream_eval


def main() -> None:
    p = base_parser("Fig. 9 profile update effect")
    p.add_argument("--lam", type=float, default=0.4)
    p.add_argument("--window", type=int, default=5)
    args = p.parse_args()
    spark = make_spark("fig9")
    prep = prepare(spark, args.dataset, args.sf)
    rows = []
    for label, update in (("ssrec", True), ("ssrec-nu", False)):
        res = run_stream_eval(
            spark, prep, method="ssrec", k_list=(5, 10, 20, 30),
            lam=args.lam, w=args.window, update=update,
        )
        rows.append({"method": label, **{f"p_at_{k}": v for k, v in res.items()}})
    print_table(f"Fig. 9 ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
