"""Shared helpers for the test suite."""
from __future__ import annotations

import pandas as pd

from repro.tp.model import tp_pdf

# ---------------------------------------------------------------------------
# the paper's running example (Fig. 1a)
# ---------------------------------------------------------------------------

def paper_a() -> pd.DataFrame:
    return tp_pdf(
        [("Ann", "ZAK", "a1", 2, 8, 0.7), ("Jim", "WEN", "a2", 7, 10, 0.8)],
        ["name", "loc"],
    )


def paper_b() -> pd.DataFrame:
    return tp_pdf(
        [
            ("hotel3", "SOR", "b1", 1, 4, 0.9),
            ("hotel2", "ZAK", "b2", 5, 8, 0.6),
            ("hotel1", "ZAK", "b3", 4, 6, 0.7),
        ],
        ["hotel", "loc"],
    )


# ---------------------------------------------------------------------------
# canonical row sets for frame comparison
# ---------------------------------------------------------------------------

def _cell(v):
    if isinstance(v, (list, tuple)) or type(v).__name__ == "ndarray":
        return tuple(_cell(x) for x in v)
    if v is None or (isinstance(v, float) and v != v):
        return "·"
    return v


def norm(records) -> list[tuple]:
    """Normalize+sort plain tuples the same way :func:`rows` does."""
    normalized = [tuple(_cell(v) for v in r) for r in records]
    return sorted(normalized, key=lambda r: tuple(map(str, r)))


def rows(df, round_p: int = 9) -> list[tuple]:
    """Canonical sorted row tuples of a Spark or pandas DataFrame.

    NaN/None are normalized to the marker '·', array cells to tuples,
    and probabilities are rounded so float association order does not
    break equality. Sorting is by stringified cells so heterogeneous
    columns (nulls vs ints) stay comparable.
    """
    pdf = df.toPandas() if hasattr(df, "toPandas") else df.copy()
    if "p" in pdf.columns:
        pdf["p"] = pdf["p"].astype(float).round(round_p)
    return norm(map(tuple, pdf.itertuples(index=False)))


# ---------------------------------------------------------------------------
# brute-force window expectations (independent of the sweeps under test)
# ---------------------------------------------------------------------------

def expected_gaps(r_ts: int, r_te: int, overlaps: list[tuple[int, int]]) -> list[tuple[int, int]]:
    """Maximal subintervals of [r_ts, r_te) covered by no overlap."""
    covered = set()
    for o_ts, o_te in overlaps:
        covered.update(range(o_ts, o_te))
    gaps, start = [], None
    for t in range(r_ts, r_te):
        if t not in covered:
            if start is None:
                start = t
        elif start is not None:
            gaps.append((start, t))
            start = None
    if start is not None:
        gaps.append((start, r_te))
    return gaps


def expected_negating(
    overlaps: list[tuple[int, int, str]]
) -> list[tuple[int, int, tuple[str, ...]]]:
    """Maximal intervals with a constant non-empty active lid set."""
    if not overlaps:
        return []
    lo = min(o[0] for o in overlaps)
    hi = max(o[1] for o in overlaps)
    out: list[tuple[int, int, tuple[str, ...]]] = []
    run_start, run_set = None, None
    for t in range(lo, hi + 1):
        active = tuple(sorted(l for o_ts, o_te, l in overlaps if o_ts <= t < o_te))
        if active != run_set or t == hi:
            if run_set:
                out.append((run_start, t, run_set))
            run_start, run_set = t, active
    return out
