"""spark-submit entrypoint for the Table 2 reproduction (dataset stats).

Usage: ``spark-submit jobs/table2_datasets.py [scale]`` (default bench).
Prints the markdown table and writes ``results/table2.{md,json}``.
"""
import sys

from repro.experiments import table2
from repro.experiments.session import get_session


def main() -> None:
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_session("receipt-table2")
    try:
        spark.sparkContext.setLogLevel("ERROR")
        print(table2.main(spark, scale))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
