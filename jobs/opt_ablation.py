"""spark-submit entrypoint for the HUC/DGM ablation (paper figs. 6-7 as a
table).

Usage: ``spark-submit jobs/opt_ablation.py [scale]`` (default bench).
Writes ``results/ablation.{md,json}``.
"""
import sys

from repro.experiments import ablation
from repro.experiments.session import get_session


def main() -> None:
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_session("receipt-ablation")
    try:
        spark.sparkContext.setLogLevel("ERROR")
        print(ablation.main(spark, scale))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
