"""Table 4 benchmark — N-ary vs PDX distance kernels.

One pytest-benchmark entry per (metric, layout, dimensionality) at a
fixed collection size; the Table 4 speedup is t(nary)/t(pdx) per pair.
``jobs/table4_kernels.py`` prints the full aggregated table.
"""
import numpy as np
import pytest

from repro.core import kernels
from repro.core.layout import stack_pdx
from repro.vecdata import random_collection

N = 16384
DIMS = [8, 32, 128, 1024]


def _data(dim):
    data = random_collection(N, dim, seed=dim)
    return data, stack_pdx(data, 64), np.random.default_rng(1).standard_normal(dim).astype(np.float32)


@pytest.mark.parametrize("dim", DIMS)
@pytest.mark.parametrize("metric", ["l2", "ip", "l1"])
def test_nary_kernel(benchmark, metric, dim):
    data, _, q = _data(dim)
    fn = kernels.METRICS_NARY[metric]
    benchmark(fn, data, q)


@pytest.mark.parametrize("dim", DIMS)
@pytest.mark.parametrize("metric", ["l2", "ip", "l1"])
def test_pdx_kernel(benchmark, metric, dim):
    _, stacked, q = _data(dim)
    fn = kernels.METRICS_PDX[metric]
    benchmark(fn, stacked, q)
