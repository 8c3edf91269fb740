"""Fig. 7: effect of the short-term weight lambda_s at |W|=5 (P@10)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_stream_eval


def main() -> None:
    args = base_parser("Fig. 7 lambda sweep").parse_args()
    spark = make_spark("fig7")
    prep = prepare(spark, args.dataset, args.sf)
    rows = [
        {
            "lambda_s": l / 10,
            "p_at_10": run_stream_eval(
                spark, prep, method="ssrec", k_list=(10,), lam=l / 10, w=5
            )[10],
        }
        for l in range(1, 11)
    ]
    print_table(f"Fig. 7 ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
