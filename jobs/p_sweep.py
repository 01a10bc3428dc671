"""spark-submit entrypoint for the P-sweep (paper fig. 5 as a table).

Usage: ``spark-submit jobs/p_sweep.py [scale]`` (default bench).
Writes ``results/psweep.{md,json}``.
"""
import sys

from repro.experiments import psweep
from repro.experiments.session import get_session


def main() -> None:
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_session("receipt-psweep")
    try:
        spark.sparkContext.setLogLevel("ERROR")
        print(psweep.main(spark, scale))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
