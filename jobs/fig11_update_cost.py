"""Fig. 11: CPPse-index maintenance cost (Algorithm 2) vs update size."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_update_cost


def main() -> None:
    args = base_parser("Fig. 11 media update efficiency").parse_args()
    spark = make_spark("fig11")
    prep = prepare(spark, args.dataset, args.sf)
    rows = run_update_cost(spark, prep)
    print_table(f"Fig. 11 ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
