"""Table III: overview of the four (synthetic twin) datasets."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import base_parser, make_spark, print_table

from repro.data.datasets import DATASETS, overview


def main() -> None:
    args = base_parser("Table III dataset overview").parse_args()
    rows = [overview(name, args.sf) for name in DATASETS]
    print_table(f"Table III (sf={args.sf})", rows)


if __name__ == "__main__":
    main()
