"""Shared cached workload inputs for the benchmark suite.

One (r, s, θ) triple per workload at the benchmark's representative
size, cached and materialized once per session so every benchmark
times the operator under test, not the generator.
"""
import pytest

from repro.bench.harness import materialize
from repro.synth_data import tp_workload

BENCH_WEBKIT_N = 8_000
BENCH_METEO_N = 1_000


@pytest.fixture(scope="session")
def webkit_inputs(spark):
    r, s, theta = tp_workload(spark, "webkit", BENCH_WEBKIT_N)
    yield materialize(r), materialize(s), theta
    r.unpersist()
    s.unpersist()


@pytest.fixture(scope="session")
def meteo_inputs(spark):
    r, s, theta = tp_workload(spark, "meteo", BENCH_METEO_N)
    yield materialize(r), materialize(s), theta
    r.unpersist()
    s.unpersist()
