"""Streaming group iteration over sorted Arrow batches.

The LAWA sweeps (and the TA baseline's normalization) process the
winit join result one r-tuple group at a time, in sorted order, with
state that never exceeds one group — the paper's pipelined executor
model. Spark's ``mapInPandas`` hands each partition to Python as an
iterator of Arrow-sized pandas batches; a group never spans partitions
(we repartition by the group key first) but can span batches, so this
helper re-chunks the batch stream into complete groups.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd


def iter_groups(
    batches: Iterator[pd.DataFrame], key: str
) -> Iterator[tuple[object, list[dict]]]:
    """Yield ``(key_value, records)`` per contiguous group of rows.

    ``batches`` must already be sorted by ``key`` within the stream
    (``sortWithinPartitions`` upstream). Records are plain dicts —
    the sweeps are row-at-a-time algorithms, not vectorizable ones.
    """
    current_key: object = None
    current: list[dict] = []
    started = False
    for batch in batches:
        if batch.empty:
            continue
        for rec in batch.to_dict("records"):
            k = rec[key]
            if not started:
                current_key, started = k, True
            elif k != current_key:
                yield current_key, current
                current_key, current = k, []
            current.append(rec)
    if started:
        yield current_key, current


def chunked(rows: list[dict], columns: list[str], size: int = 4096):
    """Render output rows as pandas DataFrames of bounded size.

    Keeps the Arrow writer fed with reasonably sized batches instead of
    one giant frame per partition.
    """
    for i in range(0, len(rows), size):
        chunk = rows[i : i + size]
        yield pd.DataFrame(chunk, columns=columns)
