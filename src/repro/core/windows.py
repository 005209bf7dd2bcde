"""winit: the conventional θ∧overlap left outer join (paper §VI-A).

The overlapping windows of ``r`` with respect to ``s`` are computed by
ONE conventional left outer join ``r ⟕_{θ ∧ θo} s`` with the overlap
predicate ``θo : r.T ∩ s.T ≠ ∅`` — this is the single expensive node
of the NJ query tree (paper Fig. 10a) and is delegated entirely to
Catalyst, which plans it as a sort-merge join when θ has equality
terms (the WebKit workload) or a broadcast/loop join otherwise (the
Meteo workload), just as PostgreSQL's optimizer does in the paper.

Result schema (paper Fig. 5): for each r fact column ``c`` a column
``r_c``, plus ``r_lid``, ``r_p``, ``r_ts``, ``r_te`` (the tuple of the
positive relation), and for each s fact column ``c`` a column ``s_c``,
plus ``s_lid``, ``s_p`` (the matched negative tuple, null when ``r``
matched nothing), and the overlap interval ``[o_ts, o_te)`` — encoded
with the sentinel ``-1`` when there is no match so the interval
columns stay non-null int64 through Arrow.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F

from ..tp.model import TP_COLS, fact_columns
from .theta import Theta

NO_OVERLAP = -1  # sentinel for the o_ts/o_te of unmatched winit rows


def prefixed(df: DataFrame, prefix: str) -> DataFrame:
    """Rename every column of ``df`` with ``prefix`` (join hygiene)."""
    return df.select(*(F.col(c).alias(prefix + c) for c in df.columns))


def winit_columns(r_facts: list[str], s_facts: list[str]) -> list[str]:
    """The column order of a winit DataFrame for the given fact columns."""
    return (
        [f"r_{c}" for c in r_facts]
        + ["r_lid", "r_p", "r_ts", "r_te"]
        + [f"s_{c}" for c in s_facts]
        + ["s_lid", "s_p", "o_ts", "o_te"]
    )


def winit(r: DataFrame, s: DataFrame, theta: Theta) -> DataFrame:
    """``r ⟕_{θ ∧ θo} s`` — overlapping windows plus the unmatched
    windows of r tuples that overlap/match no s tuple at all.

    Exactly one Catalyst join; every downstream window set is derived
    from this result without touching ``r`` or ``s`` again (the core
    efficiency claim of the NJ approach).
    """
    r_facts, s_facts = fact_columns(r), fact_columns(s)
    rr, ss = prefixed(r, "r_"), prefixed(s, "s_")
    cond = (
        theta.spark_condition(rr, ss, "r_", "s_")
        & (rr["r_ts"] < ss["s_te"])
        & (ss["s_ts"] < rr["r_te"])
    )
    joined = rr.join(ss, cond, "left")
    matched = joined["s_lid"].isNotNull()
    return joined.select(
        *[joined[f"r_{c}"] for c in r_facts],
        "r_lid",
        "r_p",
        "r_ts",
        "r_te",
        *[joined[f"s_{c}"] for c in s_facts],
        "s_lid",
        "s_p",
        F.when(matched, F.greatest("r_ts", "s_ts"))
        .otherwise(F.lit(NO_OVERLAP))
        .cast("long")
        .alias("o_ts"),
        F.when(matched, F.least("r_te", "s_te"))
        .otherwise(F.lit(NO_OVERLAP))
        .cast("long")
        .alias("o_te"),
    )
