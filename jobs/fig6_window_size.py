"""Fig. 6: effect of the short-term interest window size |W| (P@10,
lambda tuned per |W| as in the paper)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_stream_eval


def main() -> None:
    args = base_parser("Fig. 6 window size sweep").parse_args()
    spark = make_spark("fig6")
    prep = prepare(spark, args.dataset, args.sf)
    rows = []
    for w in range(1, 11):
        best = max(
            (run_stream_eval(spark, prep, method="ssrec", k_list=(10,), lam=l / 10, w=w)[10], l / 10)
            for l in range(1, 11)
        )
        rows.append({"window": w, "best_lambda": best[1], "p_at_10": best[0]})
    print_table(f"Fig. 6 ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
