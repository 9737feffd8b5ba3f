"""Table 3 (paper Fig 16): measured throughput & memory vs plan cost.

Usage: spark-submit jobs/table3_cost_validation.py
"""
import sys

sys.path.insert(0, ".")

from jobs._common import base_parser, build_spark, config_from
from repro.experiments.report import save_table
from repro.experiments.tables import table3


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = build_spark("table3")
    try:
        _, text = table3(
            spark, config_from(args, categories=("sequence", "conjunction"))
        )
    finally:
        spark.stop()
    print(text)
    print("saved:", save_table("table3", text))


if __name__ == "__main__":
    main()
