"""Table 2 benchmark — the Δd=1 ADSampling pruning-power trace per
dataset (the Table 2 harness itself; the job prints the power table)."""
import pytest

from repro.analysis.pruning import pruning_power_trace
from repro.core.pruners import ADSampling

DATASETS = ["nytimes16", "glove50", "deep96", "gist960"]


@pytest.mark.parametrize("name", DATASETS)
def test_ads_pruning_trace(benchmark, bench_datasets, name):
    data, queries = bench_datasets(name, sf=0.002, n_queries=10)
    ads = ADSampling(data.shape[1], seed=0)
    power = benchmark.pedantic(
        pruning_power_trace, args=(data, queries, ads), rounds=2, iterations=1
    )
    assert (power >= 0).all()
