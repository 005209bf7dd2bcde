"""Job: E2 (paper Fig. 12) — negating windows runtime sweep, NJ vs TA.

Usage: spark-submit jobs/run_e2_negating.py [webkit|meteo|both]
"""
import sys

from _common import get_spark
from repro.bench.experiments import table_e2_negating


def main() -> None:
    which = sys.argv[1] if len(sys.argv) > 1 else "both"
    spark = get_spark("repro-e2-negating")
    for kind in ("webkit", "meteo") if which == "both" else (which,):
        table_e2_negating(spark, kind)
    spark.stop()


if __name__ == "__main__":
    main()
