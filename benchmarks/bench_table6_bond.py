"""Table 6 benchmark — Δd=1 PDX-BOND pruning-power trace per dataset."""
import pytest

from repro.analysis.pruning import pruning_power_trace
from repro.core.pruners import PDXBond

DATASETS = ["nytimes16", "glove50", "deep96", "gist960"]


@pytest.mark.parametrize("name", DATASETS)
def test_bond_pruning_trace(benchmark, bench_datasets, name):
    data, queries = bench_datasets(name, sf=0.002, n_queries=10)
    bond = PDXBond(data.shape[1], order="means")
    power = benchmark.pedantic(
        pruning_power_trace, args=(data, queries, bond), rounds=2, iterations=1
    )
    assert (power >= 0).all()
