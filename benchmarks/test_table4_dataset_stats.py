"""Table IV: dataset-property computation over the synthetic datasets.

The paper's Table IV is a property table, not a timing figure; this
benchmark times the Spark aggregation/sweep pipeline that computes it
(and the job prints the property values themselves).
"""
import pytest

from repro.bench.dataset_stats import dataset_stats

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="table4-stats")
def test_table4_stats_webkit(benchmark, webkit_inputs):
    r, _, _ = webkit_inputs
    stats = benchmark.pedantic(lambda: dataset_stats(r), **ROUNDS)
    assert stats["cardinality"] == r.count()
    assert stats["max_tuples_per_point"] >= 1


@pytest.mark.benchmark(group="table4-stats")
def test_table4_stats_meteo(benchmark, meteo_inputs):
    r, _, _ = meteo_inputs
    stats = benchmark.pedantic(lambda: dataset_stats(r), **ROUNDS)
    assert stats["cardinality"] == r.count()
    assert stats["num_facts"] <= 320
