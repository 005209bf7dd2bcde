"""Job: E4 (paper Fig. 14) — NJ left-outer-join runtime breakdown.

Usage: spark-submit jobs/run_e4_breakdown.py [webkit|meteo|both]
"""
import sys

from _common import get_spark
from repro.bench.experiments import table_e4_breakdown


def main() -> None:
    which = sys.argv[1] if len(sys.argv) > 1 else "both"
    spark = get_spark("repro-e4-breakdown")
    for kind in ("webkit", "meteo") if which == "both" else (which,):
        table_e4_breakdown(spark, kind)
    spark.stop()


if __name__ == "__main__":
    main()
