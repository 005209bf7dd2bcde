"""Job: E3 (paper Fig. 13) — TP left outer join runtime sweep, NJ vs TA.

Usage: spark-submit jobs/run_e3_loj.py [webkit|meteo|both]
"""
import sys

from _common import get_spark
from repro.bench.experiments import table_e3_left_outer_join


def main() -> None:
    which = sys.argv[1] if len(sys.argv) > 1 else "both"
    spark = get_spark("repro-e3-loj")
    for kind in ("webkit", "meteo") if which == "both" else (which,):
        table_e3_left_outer_join(spark, kind)
    spark.stop()


if __name__ == "__main__":
    main()
