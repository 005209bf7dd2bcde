"""Unit tests for LAWA_N (Algorithm 2) — pure Python, no Spark."""
from hypothesis import given, settings, strategies as st

from repro.core import lawa_n, lawa_u
from repro.core.windows import NO_OVERLAP
from util import expected_negating


def match(o_ts, o_te, lid, p=0.5):
    return {"o_ts": o_ts, "o_te": o_te, "s_lid": lid, "s_p": p}


def run(r_ts, r_te, matches):
    if not matches:
        matches = [{"o_ts": NO_OVERLAP, "o_te": NO_OVERLAP, "s_lid": None, "s_p": None}]
    return list(lawa_n.sweep_group(lawa_u.sweep_group(r_ts, r_te, matches)))


def negs(ws):
    return [(w["w_ts"], w["w_te"], tuple(w["s_lids"])) for w in ws if w["kind"] == "N"]


class TestPaperExample:
    """Fig. 9: the six LAWA_N outputs of the group of tuple a1."""

    def test_fig9_trace(self):
        ws = run(2, 8, [match(4, 6, "b3", 0.7), match(5, 8, "b2", 0.6)])
        assert [(w["kind"], w["w_ts"], w["w_te"], tuple(w["s_lids"])) for w in ws] == [
            ("U", 2, 4, ()),
            ("O", 4, 6, ("b3",)),
            ("N", 4, 5, ("b3",)),
            ("O", 5, 8, ("b2",)),
            ("N", 5, 6, ("b2", "b3")),
            ("N", 6, 8, ("b2",)),
        ]

    def test_fig9_probability_payload(self):
        ws = run(2, 8, [match(4, 6, "b3", 0.7), match(5, 8, "b2", 0.6)])
        w56 = next(w for w in ws if w["kind"] == "N" and w["w_ts"] == 5)
        assert w56["s_lids"] == ["b2", "b3"]
        assert w56["s_ps"] == [0.6, 0.7]  # aligned with the sorted lids


class TestStructure:
    def test_unmatched_only_group_produces_no_negating(self):
        assert negs(run(0, 10, [])) == []

    def test_single_overlap_negates_over_its_interval(self):
        assert negs(run(0, 10, [match(3, 7, "x")])) == [(3, 7, ("x",))]

    def test_disjoint_overlaps_negate_separately(self):
        assert negs(run(0, 20, [match(1, 4, "x"), match(10, 14, "y")])) == [
            (1, 4, ("x",)),
            (10, 14, ("y",)),
        ]

    def test_nested_overlap_splits_into_three(self):
        assert negs(run(0, 20, [match(2, 12, "x"), match(5, 8, "y")])) == [
            (2, 5, ("x",)),
            (5, 8, ("x", "y")),
            (8, 12, ("x",)),
        ]

    def test_equal_intervals_merge_into_one_window(self):
        assert negs(run(0, 10, [match(2, 6, "x"), match(2, 6, "y")])) == [
            (2, 6, ("x", "y"))
        ]

    def test_adjacent_overlaps_stay_separate(self):
        # x ends where y starts: the valid set changes at t=5
        assert negs(run(0, 10, [match(2, 5, "x"), match(5, 9, "y")])) == [
            (2, 5, ("x",)),
            (5, 9, ("y",)),
        ]

    def test_all_input_windows_copied_through(self):
        matches = [match(2, 5, "x"), match(4, 9, "y")]
        ws = run(0, 10, matches)
        uo = [(w["kind"], w["w_ts"], w["w_te"]) for w in ws if w["kind"] != "N"]
        expected = [
            (w["kind"], w["w_ts"], w["w_te"])
            for w in lawa_u.sweep_group(0, 10, matches)
        ]
        assert uo == expected

    def test_output_sorted_by_start(self):
        ws = run(0, 30, [match(1, 9, "a"), match(3, 5, "b"), match(12, 20, "c")])
        starts = [w["w_ts"] for w in ws]
        assert starts == sorted(starts)

    def test_negating_windows_tile_covered_region(self):
        ws = run(0, 30, [match(1, 9, "a"), match(3, 5, "b"), match(8, 16, "c")])
        n = negs(ws)
        assert n[0][0] == 1 and n[-1][1] == 16
        for (a, b, _), (c, d, _) in zip(n, n[1:]):
            assert b == c  # covered region is contiguous here


@settings(max_examples=200, deadline=None)
@given(
    raw=st.lists(st.tuples(st.integers(0, 25), st.integers(1, 10)), max_size=6),
)
def test_negating_windows_match_bruteforce(raw):
    """Negating windows == maximal constant non-empty active sets."""
    r_ts, r_te = 0, 40
    overlaps = []
    for i, (o_ts, dur) in enumerate(raw):
        o_te = min(r_te, o_ts + dur)
        if o_ts < o_te:
            overlaps.append((o_ts, o_te, f"s{i}"))
    overlaps.sort()
    matches = [match(a, b, l) for a, b, l in overlaps]
    got = negs(run(r_ts, r_te, matches))
    assert got == expected_negating(overlaps)
