"""E1 (paper Fig. 11): W_UO windows — NJ vs TA, webkit & meteo.

The paper's claim: both approaches are join-dominated, but TA runs the
conventional θ∧overlap join twice (one align per relation) while NJ
runs it once, so NJ is 2x-4x faster. The benchmark pairs below measure
both at the same input so the ratio can be read off the report.
"""
import pytest

from repro.baselines.alignment import ta_wuo
from repro.core.negation_joins import wuo

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="e1-wuo-webkit")
def test_e1_wuo_nj_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(lambda: wuo(r, s, theta).count(), **ROUNDS)
    assert rows > 0


@pytest.mark.benchmark(group="e1-wuo-webkit")
def test_e1_wuo_ta_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(lambda: ta_wuo(r, s, theta).count(), **ROUNDS)
    assert rows > 0


@pytest.mark.benchmark(group="e1-wuo-meteo")
def test_e1_wuo_nj_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    rows = benchmark.pedantic(lambda: wuo(r, s, theta).count(), **ROUNDS)
    assert rows > 0


@pytest.mark.benchmark(group="e1-wuo-meteo")
def test_e1_wuo_ta_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    rows = benchmark.pedantic(lambda: ta_wuo(r, s, theta).count(), **ROUNDS)
    assert rows > 0


def test_e1_both_approaches_agree_on_cardinality(webkit_inputs):
    """The timed pipelines compute the same window multiset size."""
    r, s, theta = webkit_inputs
    assert wuo(r, s, theta).count() == ta_wuo(r, s, theta).count()
