"""Smoke tests: every experiment function runs end-to-end (tiny sizes).

The jobs in ``jobs/`` are thin argv wrappers around these functions;
running the functions in-process exercises the same code paths without
paying spark-submit startup per job.
"""
import pytest

from repro.bench.experiments import (
    table4_dataset_stats,
    table_e1_wuo,
    table_e2_negating,
    table_e3_left_outer_join,
    table_e4_breakdown,
    table_e5_scalability,
)

TINY = (60,)


def test_table4_runs(spark):
    t = table4_dataset_stats(spark, n=200)
    assert len(t.rows) == 9  # one row per Table IV property
    assert t.rows[0][0] == "cardinality"


@pytest.mark.parametrize("kind", ["webkit", "meteo"])
def test_e1_runs(spark, kind):
    t = table_e1_wuo(spark, kind, sizes=TINY)
    assert len(t.rows) == 1
    assert int(t.rows[0][0]) == TINY[0]


@pytest.mark.parametrize("kind", ["webkit", "meteo"])
def test_e2_runs(spark, kind):
    t = table_e2_negating(spark, kind, sizes=TINY)
    assert len(t.rows) == 1


@pytest.mark.parametrize("kind", ["webkit", "meteo"])
def test_e3_runs(spark, kind):
    t = table_e3_left_outer_join(spark, kind, sizes=TINY)
    assert len(t.rows) == 1
    assert int(t.rows[0][4]) > 0  # produced output rows


@pytest.mark.parametrize("kind", ["webkit", "meteo"])
def test_e4_runs_and_percentages_sum(spark, kind):
    t = table_e4_breakdown(spark, kind, sizes=TINY)
    clj, wuo_pct, wn_pct = (float(x) for x in t.rows[0][2:5])
    assert clj + wuo_pct + wn_pct == pytest.approx(100.0, abs=0.1)


def test_e5_runs(spark):
    t = table_e5_scalability(spark, sizes_webkit=(60,), sizes_meteo=(60,))
    assert [r[0] for r in t.rows] == ["webkit", "meteo"]


def test_job_scripts_are_importable():
    """The argv wrappers parse (no spark-submit in unit tests)."""
    import ast
    import pathlib

    jobs = sorted(pathlib.Path(__file__).parent.parent.glob("jobs/*.py"))
    assert len(jobs) == 7
    for path in jobs:
        tree = ast.parse(path.read_text())
        names = {n.name for n in tree.body if isinstance(n, ast.FunctionDef)}
        if path.name != "_common.py":
            assert "main" in names, path
