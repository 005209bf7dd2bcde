"""Tests for the streaming group iterator used by all sweep passes."""
import pandas as pd
import pytest

from repro.core.stream import chunked, iter_groups


def batches(*frames):
    return iter([pd.DataFrame(f) for f in frames])


def test_single_batch_single_group():
    out = list(iter_groups(batches([{"k": 1, "v": 10}, {"k": 1, "v": 20}]), "k"))
    assert out == [(1, [{"k": 1, "v": 10}, {"k": 1, "v": 20}])]


def test_single_batch_many_groups():
    out = list(
        iter_groups(
            batches([{"k": 1, "v": 1}, {"k": 2, "v": 2}, {"k": 2, "v": 3}]), "k"
        )
    )
    assert [k for k, _ in out] == [1, 2]
    assert [len(g) for _, g in out] == [1, 2]


def test_group_spanning_batch_boundary():
    out = list(
        iter_groups(
            batches(
                [{"k": 1, "v": 1}, {"k": 2, "v": 2}],
                [{"k": 2, "v": 3}, {"k": 3, "v": 4}],
            ),
            "k",
        )
    )
    assert [(k, len(g)) for k, g in out] == [(1, 1), (2, 2), (3, 1)]


def test_empty_batches_are_skipped():
    out = list(
        iter_groups(
            batches([], [{"k": 1, "v": 1}], [], [{"k": 1, "v": 2}]), "k"
        )
    )
    assert out == [(1, [{"k": 1, "v": 1}, {"k": 1, "v": 2}])]


def test_no_rows_yields_nothing():
    assert list(iter_groups(batches([]), "k")) == []


def test_string_keys():
    out = list(iter_groups(batches([{"k": "a"}, {"k": "b"}]), "k"))
    assert [k for k, _ in out] == ["a", "b"]


def test_chunked_bounds_frame_size():
    rows = [{"x": i} for i in range(10)]
    frames = list(chunked(rows, ["x"], size=4))
    assert [len(f) for f in frames] == [4, 4, 2]
    assert frames[0].columns.tolist() == ["x"]


def test_chunked_empty_rows():
    assert list(chunked([], ["x"], size=4)) == []


def test_chunked_preserves_column_order():
    frames = list(chunked([{"b": 1, "a": 2}], ["a", "b"]))
    assert frames[0].columns.tolist() == ["a", "b"]
