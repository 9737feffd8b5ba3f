"""Table 1 (paper Figs 4–5): avg throughput & memory per category × algorithm.

Usage: spark-submit jobs/table1_throughput_memory.py [--sizes 3 4 5 ...]
"""
import sys

sys.path.insert(0, ".")  # allow running from the repo root without install

from jobs._common import base_parser, build_spark, config_from
from repro.experiments.report import save_table
from repro.experiments.tables import table1


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = build_spark("table1")
    try:
        _, text = table1(spark, config_from(args))
    finally:
        spark.stop()
    print(text)
    print("saved:", save_table("table1", text))


if __name__ == "__main__":
    main()
