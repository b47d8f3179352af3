"""Table 7 benchmark — per-algorithm IVF query latency on the
OpenAI/1536 stand-in at a fixed nprobe (the job tunes nprobe to the
paper's 0.95 recall and prints the phase shares)."""
import pytest

from repro.core.pruners import ADSampling, BSA, PDXBond
from repro.ivf.index import IVFNarySearcher, IVFPDXSearcher, build_ivf

SF = 0.004
NPROBE = 8
K = 10


@pytest.fixture(scope="module")
def setup(bench_datasets):
    data, queries = bench_datasets("openai1536", sf=SF, n_queries=5)
    index = build_ivf(data, seed=0)
    return data, queries, index


def _run_all(searcher, queries, **kw):
    for q in queries:
        searcher.search(q, K, nprobe=NPROBE, **kw)


@pytest.mark.parametrize("algo", ["ads", "bsa", "bond"])
def test_pdx_ivf_search(benchmark, setup, algo):
    data, queries, index = setup
    dim = data.shape[1]
    pruner = {
        "ads": lambda: ADSampling(dim, seed=0),
        "bsa": lambda: BSA(dim).fit(data),
        "bond": lambda: PDXBond(dim, order="zones"),
    }[algo]()
    s = IVFPDXSearcher(index, data, pruner)
    benchmark.pedantic(_run_all, args=(s, queries), rounds=3, iterations=1)


@pytest.mark.parametrize("algo", ["ads", "bsa"])
def test_nary_ivf_search(benchmark, setup, algo):
    data, queries, index = setup
    dim = data.shape[1]
    pruner = {
        "ads": lambda: ADSampling(dim, seed=0),
        "bsa": lambda: BSA(dim).fit(data),
    }[algo]()
    s = IVFNarySearcher(index, data, pruner)
    benchmark.pedantic(_run_all, args=(s, queries), rounds=3, iterations=1)


def test_nary_ivf_linear_scan(benchmark, setup):
    """FAISS IVF_FLAT stand-in: unpruned bucket scans."""
    from repro.core.pruners import Pruner

    data, queries, index = setup
    s = IVFNarySearcher(index, data, Pruner(data.shape[1]))
    benchmark.pedantic(
        _run_all, args=(s, queries), kwargs={"pruned": False}, rounds=3, iterations=1
    )
