"""spark-submit entrypoint for the Table 3 reproduction (main comparison).

Usage: ``spark-submit jobs/table3_comparison.py [scale] [parb_budget_s]``
(defaults: bench, 90s per side for the Spark ParB baseline). Prints the
markdown table and writes ``results/table3.{md,json}``.
"""
import sys

from repro.experiments import table3
from repro.experiments.session import get_session


def main() -> None:
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    budget = float(sys.argv[2]) if len(sys.argv) > 2 else 90.0
    spark = get_session("receipt-table3")
    try:
        spark.sparkContext.setLogLevel("ERROR")
        print(table3.main(spark, scale, parb_budget_s=budget))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
