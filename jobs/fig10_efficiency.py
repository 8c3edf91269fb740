"""Fig. 10: avg per-item response time, CPPse-index vs sequential CTT/UCD,
as the accumulated stream grows."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.eval.harness import prepare, run_efficiency


def main() -> None:
    p = base_parser("Fig. 10 recommendation efficiency")
    p.add_argument("--k", type=int, default=30)
    args = p.parse_args()
    spark = make_spark("fig10")
    prep = prepare(spark, args.dataset, args.sf)
    rows = run_efficiency(spark, prep, k=args.k)
    print_table(f"Fig. 10 ({args.dataset}, sf={args.sf}, k={args.k})", rows)
    spark.stop()


if __name__ == "__main__":
    main()
