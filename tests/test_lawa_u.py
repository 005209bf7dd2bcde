"""Unit tests for LAWA_U (Algorithm 1) — pure Python, no Spark."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.core import lawa_u
from repro.core.windows import NO_OVERLAP
from util import expected_gaps


def match(o_ts, o_te, lid="s", p=0.5, **facts):
    return {"o_ts": o_ts, "o_te": o_te, "s_lid": lid, "s_p": p, **facts}


def null_match():
    return {"o_ts": NO_OVERLAP, "o_te": NO_OVERLAP, "s_lid": None, "s_p": None}


def run(r_ts, r_te, matches):
    return list(lawa_u.sweep_group(r_ts, r_te, matches))


def intervals(ws, kind):
    return [(w["w_ts"], w["w_te"]) for w in ws if w["kind"] == kind]


class TestPaperExample:
    """The group of tuple a1 from the paper's running example (Fig. 7)."""

    def test_fig7_group(self):
        ws = run(2, 8, [match(4, 6, "b3", 0.7), match(5, 8, "b2", 0.6)])
        assert [(w["kind"], w["w_ts"], w["w_te"]) for w in ws] == [
            ("U", 2, 4),
            ("O", 4, 6),
            ("O", 5, 8),
        ]

    def test_fig7_null_group(self):
        # tuple a2 matches nothing: one unmatched window over its interval
        ws = run(7, 10, [null_match()])
        assert [(w["kind"], w["w_ts"], w["w_te"]) for w in ws] == [("U", 7, 10)]


class TestCases:
    """The five windTe cases of Fig. 6."""

    def test_case1_overlap_copied_verbatim(self):
        ws = run(0, 10, [match(0, 10)])
        assert intervals(ws, "O") == [(0, 10)] and intervals(ws, "U") == []

    def test_case2_gap_before_first_overlap(self):
        ws = run(0, 10, [match(4, 10)])
        assert intervals(ws, "U") == [(0, 4)]

    def test_case3_gap_between_two_overlaps(self):
        ws = run(0, 10, [match(0, 3), match(6, 10)])
        assert intervals(ws, "U") == [(3, 6)]

    def test_case4_trailing_gap(self):
        ws = run(0, 10, [match(0, 4)])
        assert intervals(ws, "U") == [(4, 10)]

    def test_case5_unmatched_tuple(self):
        ws = run(3, 9, [null_match()])
        assert intervals(ws, "U") == [(3, 9)]

    def test_mixed_null_and_real_matches_rejected(self):
        with pytest.raises(ValueError):
            run(0, 10, [match(0, 4), null_match()])


class TestOverlappingOverlaps:
    def test_contained_overlap_produces_no_gap(self):
        ws = run(0, 10, [match(0, 10), match(3, 5)])
        assert intervals(ws, "U") == []
        assert intervals(ws, "O") == [(0, 10), (3, 5)]

    def test_chained_overlaps_no_gap(self):
        ws = run(0, 10, [match(0, 5), match(4, 10)])
        assert intervals(ws, "U") == []

    def test_adjacent_overlaps_no_gap(self):
        ws = run(0, 10, [match(0, 5), match(5, 10)])
        assert intervals(ws, "U") == []

    def test_equal_start_points(self):
        ws = run(0, 10, [match(2, 4, "x"), match(2, 6, "y")])
        assert intervals(ws, "U") == [(0, 2), (6, 10)]
        assert intervals(ws, "O") == [(2, 4), (2, 6)]

    def test_duplicate_intervals_both_copied(self):
        ws = run(0, 6, [match(1, 3, "x"), match(1, 3, "y")])
        assert intervals(ws, "O") == [(1, 3), (1, 3)]
        assert intervals(ws, "U") == [(0, 1), (3, 6)]


class TestInvariants:
    def test_output_sorted_by_start(self):
        ws = run(0, 20, [match(2, 5), match(3, 9), match(12, 14)])
        starts = [w["w_ts"] for w in ws]
        assert starts == sorted(starts)

    def test_unmatched_windows_carry_no_s_lineage(self):
        for w in run(0, 10, [match(4, 6)]):
            if w["kind"] == "U":
                assert w["s_lids"] == [] and w["s_ps"] == [] and w["s_row"] is None

    def test_overlapping_windows_carry_their_match(self):
        m = match(4, 6, "b9", 0.25)
        (w,) = intervals_of_kind = [w for w in run(4, 6, [m]) if w["kind"] == "O"]
        assert w["s_lids"] == ["b9"] and w["s_ps"] == [0.25] and w["s_row"] is m


@settings(max_examples=200, deadline=None)
@given(
    r_ts=st.integers(0, 10),
    length=st.integers(1, 20),
    raw=st.lists(st.tuples(st.integers(0, 29), st.integers(1, 8)), max_size=6),
)
def test_gaps_match_bruteforce(r_ts, length, raw):
    """Unmatched windows == the maximal uncovered subintervals."""
    r_te = r_ts + length
    overlaps = []
    for o_ts, dur in raw:
        o_ts = max(r_ts, min(o_ts, r_te - 1))
        o_te = min(r_te, o_ts + dur)
        if o_ts < o_te:
            overlaps.append((o_ts, o_te))
    overlaps.sort()
    matches = [match(a, b, f"s{i}") for i, (a, b) in enumerate(overlaps)]
    ws = run(r_ts, r_te, matches if matches else [null_match()])
    assert intervals(ws, "U") == expected_gaps(r_ts, r_te, overlaps)
    assert intervals(ws, "O") == overlaps
