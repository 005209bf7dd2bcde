"""E4 (paper Fig. 14): runtime breakdown of the NJ left outer join.

Times each prefix of the NJ pipeline separately: the conventional
θ∧overlap join (CLJ), CLJ + LAWA_U (W_UO), and the full join
(+ LAWA_N + finalization). The paper reports CLJ dominating on webkit
(>50%) and the window passes growing on meteo, where many valid tuples
contribute to each output interval.
"""
import pytest

from repro.core.negation_joins import negation_join, wuo
from repro.core.windows import winit

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="e4-breakdown-webkit")
def test_e4_clj_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    assert benchmark.pedantic(lambda: winit(r, s, theta).count(), **ROUNDS) > 0


@pytest.mark.benchmark(group="e4-breakdown-webkit")
def test_e4_wuo_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    assert benchmark.pedantic(lambda: wuo(r, s, theta).count(), **ROUNDS) > 0


@pytest.mark.benchmark(group="e4-breakdown-webkit")
def test_e4_full_nj_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    assert (
        benchmark.pedantic(
            lambda: negation_join(r, s, theta, "left").count(), **ROUNDS
        )
        > 0
    )


@pytest.mark.benchmark(group="e4-breakdown-meteo")
def test_e4_clj_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    assert benchmark.pedantic(lambda: winit(r, s, theta).count(), **ROUNDS) > 0


@pytest.mark.benchmark(group="e4-breakdown-meteo")
def test_e4_wuo_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    assert benchmark.pedantic(lambda: wuo(r, s, theta).count(), **ROUNDS) > 0


@pytest.mark.benchmark(group="e4-breakdown-meteo")
def test_e4_full_nj_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    assert (
        benchmark.pedantic(
            lambda: negation_join(r, s, theta, "left").count(), **ROUNDS
        )
        > 0
    )
