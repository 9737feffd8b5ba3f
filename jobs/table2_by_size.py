"""Table 2 (paper Figs 6–15): throughput & memory vs pattern size.

Usage: spark-submit jobs/table2_by_size.py --sizes 3 4 5 6 7 [--categories ...]
"""
import sys

sys.path.insert(0, ".")

from jobs._common import base_parser, build_spark, config_from
from repro.experiments.report import save_table
from repro.experiments.tables import table2
from repro.workloads.generator import CATEGORIES


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--categories", nargs="+", default=list(CATEGORIES))
    args = p.parse_args()
    spark = build_spark("table2")
    try:
        _, text = table2(
            spark, config_from(args, categories=tuple(args.categories))
        )
    finally:
        spark.stop()
    print(text)
    print("saved:", save_table("table2", text))


if __name__ == "__main__":
    main()
