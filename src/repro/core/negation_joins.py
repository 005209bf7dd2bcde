"""NegationJoins — TP outer and anti joins as a DataFrame operator.

Paper Algorithm 3, ported to distributed dataflow. The plan of the NJ
approach (paper Fig. 10a) is:

1. ``winit = r ⟕_{θ ∧ overlap} s`` — ONE Catalyst join
   (:func:`repro.core.windows.winit`);
2. repartition by the r-tuple group key (``r_lid``) and sort each
   partition by ``(r_lid, o_ts)`` — the distributed equivalent of
   Algorithm 3 line 2;
3. one ``mapInPandas`` pass that streams each group through LAWA_U and
   (when requested) LAWA_N, pipelined: a window emitted by LAWA_U
   flows into LAWA_N and out as a finalized output tuple without ever
   materializing the intermediate sets.

Entry points mirror the stages the paper benchmarks separately:

- :func:`wuo` — unmatched + overlapping windows (paper Fig. 11);
- :func:`all_windows` — adds negating windows (paper Fig. 12);
- :func:`negation_join` — the TP join result for ``op`` in
  ``{"anti", "left", "right", "full"}`` (paper Fig. 13).

Output schemas:

- window DataFrames carry the r side as ``r_<fact>``, ``r_lid``,
  ``r_p``, the window interval ``[w_ts, w_te)``, the s side as
  ``s_<fact>`` (null except for overlapping windows), the decoupled
  negative lineage as ``s_lids``/``s_ps`` arrays, and ``kind`` in
  ``{"U","O","N"}``;
- ``negation_join(..., "anti")`` returns r's fact columns under their
  original names plus ``lineage``, ``ts``, ``te``, ``p``;
- outer joins return fact columns prefixed ``r_``/``s_`` (the two
  sides may share column names, e.g. WebKit's ``file_path``) plus
  ``lineage``, ``ts``, ``te``, ``p``.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from ..lineage.formula import conjunction_lineage, negation_lineage
from ..lineage.probability import negation_probability
from ..tp.model import fact_columns
from . import lawa_n, lawa_u
from .stream import chunked, iter_groups
from .theta import Theta
from .windows import winit

OPS = ("anti", "left", "right", "full")


# ---------------------------------------------------------------------------
# schemas
# ---------------------------------------------------------------------------

def _window_schema(winit_schema: StructType, s_facts: list[str]) -> StructType:
    """Schema of a window DataFrame, derived from the winit schema."""
    by_name = {f.name: f for f in winit_schema.fields}
    fields: list[StructField] = []
    for f in winit_schema.fields:
        if f.name.startswith("r_") and f.name not in ("r_ts", "r_te"):
            fields.append(f)
    fields += [
        StructField("w_ts", LongType(), False),
        StructField("w_te", LongType(), False),
    ]
    for c in s_facts:
        sf = by_name[f"s_{c}"]
        fields.append(StructField(sf.name, sf.dataType, True))
    fields += [
        StructField("s_lids", ArrayType(StringType(), False), False),
        StructField("s_ps", ArrayType(DoubleType(), False), False),
        StructField("kind", StringType(), False),
    ]
    return StructType(fields)


def _join_schema(
    winit_schema: StructType, r_facts: list[str], s_facts: list[str], op: str
) -> StructType:
    by_name = {f.name: f for f in winit_schema.fields}
    fields: list[StructField] = []
    if op == "anti":
        for c in r_facts:
            rf = by_name[f"r_{c}"]
            fields.append(StructField(c, rf.dataType, True))
    else:
        for c in r_facts:
            fields.append(StructField(f"r_{c}", by_name[f"r_{c}"].dataType, True))
        for c in s_facts:
            fields.append(StructField(f"s_{c}", by_name[f"s_{c}"].dataType, True))
    fields += [
        StructField("lineage", StringType(), False),
        StructField("ts", LongType(), False),
        StructField("te", LongType(), False),
        StructField("p", DoubleType(), False),
    ]
    return StructType(fields)


# ---------------------------------------------------------------------------
# the mapInPandas sweep
# ---------------------------------------------------------------------------

def _sweep_partition(
    batches: Iterator[pd.DataFrame],
    r_fact_cols: list[str],
    s_fact_cols: list[str],
    out_columns: list[str],
    with_negating: bool,
    finalize_op: str | None,
) -> Iterator[pd.DataFrame]:
    """Run LAWA_U (and LAWA_N) over every r-tuple group of a partition.

    When ``finalize_op`` is None, emits window rows; otherwise emits
    finalized TP join output tuples for ``op`` in {"anti", "left"}
    (right/full are composed from these by the driver-side wrappers).
    """
    rows: list[dict] = []
    for _, group in iter_groups(batches, "r_lid"):
        head = group[0]
        r_ts, r_te = head["r_ts"], head["r_te"]
        group.sort(key=lambda m: (m["o_ts"], m["o_te"], m["s_lid"] or ""))
        stream = lawa_u.sweep_group(r_ts, r_te, group)
        if with_negating:
            stream = lawa_n.sweep_group(stream)
        for w in stream:
            if finalize_op is None:
                rec = {f"r_{c}": head[f"r_{c}"] for c in r_fact_cols}
                rec["r_lid"] = head["r_lid"]
                rec["r_p"] = head["r_p"]
                rec["w_ts"] = w["w_ts"]
                rec["w_te"] = w["w_te"]
                s_row = w["s_row"]
                for c in s_fact_cols:
                    rec[f"s_{c}"] = s_row[f"s_{c}"] if s_row else None
                rec["s_lids"] = w["s_lids"]
                rec["s_ps"] = w["s_ps"]
                rec["kind"] = w["kind"]
                rows.append(rec)
            else:
                rec = _finalize(w, head, r_fact_cols, s_fact_cols, finalize_op)
                if rec is not None:
                    rows.append(rec)
        if len(rows) >= 8192:
            yield from chunked(rows, out_columns)
            rows = []
    yield from chunked(rows, out_columns)


def _finalize(
    w: dict, head: dict, r_fact_cols: list[str], s_fact_cols: list[str], op: str
) -> dict | None:
    """Turn one window into one TP output tuple (Alg. 3 lines 10-17).

    Applies the per-window-kind lineage-concatenation function and the
    exact probability valuation under tuple independence.
    """
    kind = w["kind"]
    if kind == lawa_u.KIND_OVERLAPPING and op == "anti":
        return None  # anti join keeps only windows with negation
    r_lid, r_p = head["r_lid"], head["r_p"]
    if kind == lawa_u.KIND_UNMATCHED:
        lineage, p = r_lid, r_p
    elif kind == lawa_u.KIND_NEGATING:
        lineage = negation_lineage(r_lid, w["s_lids"])
        p = negation_probability(r_p, w["s_ps"])
    else:
        lineage = conjunction_lineage(r_lid, w["s_lids"][0])
        p = r_p * w["s_ps"][0]
    if op == "anti":
        rec = {c: head[f"r_{c}"] for c in r_fact_cols}
    else:
        rec = {f"r_{c}": head[f"r_{c}"] for c in r_fact_cols}
        s_row = w["s_row"]
        for c in s_fact_cols:
            rec[f"s_{c}"] = s_row[f"s_{c}"] if s_row else None
    rec["lineage"] = lineage
    rec["ts"] = w["w_ts"]
    rec["te"] = w["w_te"]
    rec["p"] = p
    return rec


def _grouped(winit_df: DataFrame) -> DataFrame:
    """Distribute winit by r-tuple group and sort for the sweeps."""
    return winit_df.repartition("r_lid").sortWithinPartitions(
        "r_lid", "o_ts", "o_te", "s_lid"
    )


def _run_sweeps(
    r: DataFrame,
    s: DataFrame,
    theta: Theta,
    with_negating: bool,
    finalize_op: str | None,
) -> DataFrame:
    r_facts, s_facts = fact_columns(r), fact_columns(s)
    x = winit(r, s, theta)
    if finalize_op is None:
        schema = _window_schema(x.schema, s_facts)
    else:
        schema = _join_schema(x.schema, r_facts, s_facts, finalize_op)
    cols = [f.name for f in schema.fields]

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        return _sweep_partition(
            batches, r_facts, s_facts, cols, with_negating, finalize_op
        )

    return _grouped(x).mapInPandas(run, schema)


# ---------------------------------------------------------------------------
# public entry points
# ---------------------------------------------------------------------------

def wuo(r: DataFrame, s: DataFrame, theta: Theta) -> DataFrame:
    """Unmatched + overlapping windows of r w.r.t. s (paper W_UO)."""
    return _run_sweeps(r, s, theta, with_negating=False, finalize_op=None)


def all_windows(r: DataFrame, s: DataFrame, theta: Theta) -> DataFrame:
    """All three window sets of r w.r.t. s, computed in one pipeline."""
    return _run_sweeps(r, s, theta, with_negating=True, finalize_op=None)


def negation_join(r: DataFrame, s: DataFrame, theta: Theta, op: str) -> DataFrame:
    """The TP join with negation ``op`` of r and s under θ.

    ``op``: ``"anti"`` (r ▷ s), ``"left"`` (r ⟕ s), ``"right"``
    (r ⟖ s) or ``"full"`` (r ⟗ s) — all with TP semantics: snapshot
    reducibility and change preservation (paper Section III).
    """
    if op not in OPS:
        raise ValueError(f"op must be one of {OPS}, got {op!r}")
    if op in ("anti", "left"):
        return _run_sweeps(r, s, theta, with_negating=True, finalize_op=op)
    if op == "right":
        return _swap_sides(
            negation_join(s, r, theta.swapped(), "left"),
            fact_columns(s),
            fact_columns(r),
        )
    # full outer: left join plus the unmatched/negating windows of s
    # w.r.t. r — Algorithm 3 line 18 re-runs with swapped arguments and
    # op = anti so overlapping windows are not emitted twice.
    left = negation_join(r, s, theta, "left")
    right_only = negation_join(s, r, theta.swapped(), "anti")
    r_facts, s_facts = fact_columns(r), fact_columns(s)
    left_types = {f.name: f.dataType for f in left.schema.fields}
    promoted = right_only.select(
        *[
            F.lit(None).cast(left_types[f"r_{c}"]).alias(f"r_{c}")
            for c in r_facts
        ],
        *[F.col(c).alias(f"s_{c}") for c in s_facts],
        "lineage",
        "ts",
        "te",
        "p",
    )
    return left.unionByName(promoted)


def _swap_sides(
    df: DataFrame, left_facts: list[str], right_facts: list[str]
) -> DataFrame:
    """Rename ``r_*``↔``s_*`` and reorder for the right outer join."""
    return df.select(
        *[F.col(f"s_{c}").alias(f"r_{c}") for c in right_facts],
        *[F.col(f"r_{c}").alias(f"s_{c}") for c in left_facts],
        "lineage",
        "ts",
        "te",
        "p",
    )
