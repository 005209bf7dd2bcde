"""Job: paper Table IV — dataset properties of both TP workloads.

Usage: spark-submit jobs/run_table4.py [n_tuples]
"""
import sys

from _common import get_spark
from repro.bench.experiments import table4_dataset_stats


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 20_000
    spark = get_spark("repro-table4")
    table4_dataset_stats(spark, n)
    spark.stop()


if __name__ == "__main__":
    main()
