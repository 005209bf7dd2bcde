"""Job: E1 (paper Fig. 11) — W_UO windows runtime sweep, NJ vs TA.

Usage: spark-submit jobs/run_e1_wuo.py [webkit|meteo|both]
"""
import sys

from _common import get_spark
from repro.bench.experiments import table_e1_wuo


def main() -> None:
    which = sys.argv[1] if len(sys.argv) > 1 else "both"
    spark = get_spark("repro-e1-wuo")
    for kind in ("webkit", "meteo") if which == "both" else (which,):
        table_e1_wuo(spark, kind)
    spark.stop()


if __name__ == "__main__":
    main()
