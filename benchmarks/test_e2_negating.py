"""E2 (paper Fig. 12): negating windows — NJ (incremental) vs TA.

NJ computes W_N by streaming LAWA_N over the already-computed W_UO set
(NJ-WUON times the whole pipeline); TA recomputes from scratch via the
Fig. 10c normalize tree, which the paper reports as 4x-20x slower.
"""
import pytest

from repro.baselines.alignment import ta_nu
from repro.core.negation_joins import all_windows

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="e2-negating-webkit")
def test_e2_negating_nj_wuon_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(lambda: all_windows(r, s, theta).count(), **ROUNDS)
    assert rows > 0


@pytest.mark.benchmark(group="e2-negating-webkit")
def test_e2_negating_ta_webkit(benchmark, webkit_inputs):
    r, s, theta = webkit_inputs
    rows = benchmark.pedantic(lambda: ta_nu(r, s, theta).count(), **ROUNDS)
    assert rows > 0


@pytest.mark.benchmark(group="e2-negating-meteo")
def test_e2_negating_nj_wuon_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    rows = benchmark.pedantic(lambda: all_windows(r, s, theta).count(), **ROUNDS)
    assert rows > 0


@pytest.mark.benchmark(group="e2-negating-meteo")
def test_e2_negating_ta_meteo(benchmark, meteo_inputs):
    r, s, theta = meteo_inputs
    rows = benchmark.pedantic(lambda: ta_nu(r, s, theta).count(), **ROUNDS)
    assert rows > 0


def test_e2_negating_window_counts_agree(meteo_inputs):
    """NJ's N+U windows match TA's Fig. 10c output cardinality."""
    r, s, theta = meteo_inputs
    nj = all_windows(r, s, theta).where("kind != 'O'").count()
    assert nj == ta_nu(r, s, theta).count()
