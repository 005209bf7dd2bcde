"""Job: E5 (paper Fig. 15) — NJ-only scalability sweep.

Usage: spark-submit jobs/run_e5_scalability.py
"""
from _common import get_spark
from repro.bench.experiments import table_e5_scalability


def main() -> None:
    spark = get_spark("repro-e5-scalability")
    table_e5_scalability(spark)
    spark.stop()


if __name__ == "__main__":
    main()
