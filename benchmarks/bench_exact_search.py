"""Exact-search competitors (§6.5 / Figure 9 machinery): per-query
latency of every layout's exact KNN on two datasets. Supports the
EXPERIMENTS.md exact-search comparison (PDX-BOND / PDX linear scan vs
N-ary and DSM scans)."""
import pytest

from repro.core.layout import to_dsm
from repro.core.pdxearch import pdx_linear_scan
from repro.search.exact import (
    brute_force_dsm,
    brute_force_nary,
    build_exact_collection,
    pdx_bond_search,
)

K = 10
DATASETS = ["glove50", "msong420"]


@pytest.fixture(scope="module", params=DATASETS)
def data(request, bench_datasets):
    return request.param, *bench_datasets(request.param, sf=0.01, n_queries=10)


def test_nary_scan(benchmark, data):
    _, x, queries = data

    def run():
        for q in queries:
            brute_force_nary(x, q, K)

    benchmark.pedantic(run, rounds=3, iterations=1)


def test_dsm_scan(benchmark, data):
    _, x, queries = data
    dm = to_dsm(x)

    def run():
        for q in queries:
            brute_force_dsm(dm, q, K)

    benchmark.pedantic(run, rounds=3, iterations=1)


def test_pdx_linear_scan(benchmark, data):
    _, x, queries = data
    coll = build_exact_collection(x, block_size=64)

    def run():
        for q in queries:
            pdx_linear_scan(coll, q, K)

    benchmark.pedantic(run, rounds=3, iterations=1)


def test_pdx_bond(benchmark, data):
    _, x, queries = data
    coll = build_exact_collection(x)

    def run():
        for q in queries:
            pdx_bond_search(coll, q, K, order="means")

    benchmark.pedantic(run, rounds=3, iterations=1)
