"""Snapshot (per-time-point) expansion of TP relations.

TP snapshot reducibility (paper Section III) defines the result of a
TP operation at each time point ``t`` as the result of the
probabilistic operation on the tuples valid at ``t``. This module
expands TP relations into per-time-point snapshots — the semantic
ground truth that both the reference implementation
(:mod:`repro.core.reference`) and the DuckDB probability oracle build
on.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, functions as F


def expand_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """Per-time-point expansion of a pandas TP relation.

    Each tuple valid over ``[ts, te)`` becomes ``te - ts`` rows with a
    single ``t`` column replacing ``ts``/``te``. Intended for small
    test inputs only (row count is the sum of interval lengths).
    """
    out = pdf.copy()
    out["t"] = [range(ts, te) for ts, te in zip(out["ts"], out["te"])]
    out = out.explode("t", ignore_index=True)
    out["t"] = out["t"].astype("int64")
    return out.drop(columns=["ts", "te"])


def expand_df(df: DataFrame) -> DataFrame:
    """Per-time-point expansion of a Spark TP relation (or join result).

    Spark-side equivalent of :func:`expand_pdf` via ``sequence`` +
    ``explode`` — used by oracle tests to compare a TP join result
    with a per-time-point DuckDB query.
    """
    return (
        df.withColumn("t", F.explode(F.sequence(F.col("ts"), F.col("te") - 1)))
        .drop("ts", "te")
    )
