"""Table II: user-profile signature size factors vs user-block count."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_table2


def main() -> None:
    args = base_parser("Table II signature size factors").parse_args()
    spark = make_spark("table2")
    prep = prepare(spark, args.dataset, args.sf)
    rows = run_table2(spark, prep)
    print_table(f"Table II ({args.dataset}, sf={args.sf})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
