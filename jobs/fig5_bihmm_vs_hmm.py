"""Fig. 5: BiHMM vs HMM next-category accuracy by optimal state count."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_fig5


def main() -> None:
    p = base_parser("Fig. 5 BiHMM vs HMM accuracy")
    p.add_argument("--max-states", type=int, default=8)
    args = p.parse_args()
    spark = make_spark("fig5")
    prep = prepare(spark, args.dataset, args.sf)
    rows = run_fig5(spark, prep, max_states=args.max_states)
    print_table(f"Fig. 5 ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
