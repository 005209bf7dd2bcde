"""E3 (paper Fig. 13): the full TP left outer join — NJ vs TA.

The paper's headline result: the end-to-end join is where TA pays for
running both reduction trees plus a duplicate-eliminating union, making
NJ up to two orders of magnitude faster in their PostgreSQL kernel.
"""
import pytest

from repro.baselines.alignment import ta_negation_join
from repro.core.negation_joins import negation_join

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="e3-loj-webkit")
def test_e3_loj_nj_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(
        lambda: negation_join(r, s, theta, "left").count(), **ROUNDS
    )
    assert rows > 0


@pytest.mark.benchmark(group="e3-loj-webkit")
def test_e3_loj_ta_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(
        lambda: ta_negation_join(r, s, theta, "left").count(), **ROUNDS
    )
    assert rows > 0


@pytest.mark.benchmark(group="e3-loj-meteo")
def test_e3_loj_nj_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    rows = benchmark.pedantic(
        lambda: negation_join(r, s, theta, "left").count(), **ROUNDS
    )
    assert rows > 0


@pytest.mark.benchmark(group="e3-loj-meteo")
def test_e3_loj_ta_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    rows = benchmark.pedantic(
        lambda: ta_negation_join(r, s, theta, "left").count(), **ROUNDS
    )
    assert rows > 0


@pytest.mark.benchmark(group="e3-anti-webkit")
def test_e3_anti_nj_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(
        lambda: negation_join(r, s, theta, "anti").count(), **ROUNDS
    )
    assert rows > 0


@pytest.mark.benchmark(group="e3-anti-webkit")
def test_e3_anti_ta_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(
        lambda: ta_negation_join(r, s, theta, "anti").count(), **ROUNDS
    )
    assert rows > 0


def test_e3_results_have_equal_cardinality(meteo_inputs):
    r, s, theta = meteo_inputs
    assert (
        negation_join(r, s, theta, "left").count()
        == ta_negation_join(r, s, theta, "left").count()
    )
