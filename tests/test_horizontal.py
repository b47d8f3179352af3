"""Horizontal (N-ary) Δd-stepped pruned search — the SIMD-ADS baseline."""
import numpy as np
import pytest

from _util import assert_same_topk

from repro import vecdata
from repro.core.pruners import ADSampling, PDXBond
from repro.core.topk import TopK
from repro.search.horizontal import horizontal_pruned_search


@pytest.fixture(scope="module")
def ds():
    d = vecdata.generate("glove50", sf=0.001, n_queries=10, seed=3)
    gt = vecdata.ground_truth(d.data, d.queries, 10)
    return d, gt


def test_horizontal_with_exact_pruner_is_exact(ds):
    d, (gt_ids, gt_d) = ds
    bond = PDXBond(d.dim, order="sequential")
    ids_all = np.arange(d.n, dtype=np.int64)
    for qi, q in enumerate(d.queries):
        ctx = bond.prepare(q)
        heap = TopK(10)
        horizontal_pruned_search(d.data, ids_all, ctx, bond, heap)
        got_ids, got_d = heap.result()
        assert_same_topk(got_ids, got_d, gt_ids[qi], gt_d[qi])


def test_horizontal_ads_recall(ds):
    d, (gt_ids, _) = ds
    ads = ADSampling(d.dim, seed=0)
    t = ads.transform_data(d.data)
    ids_all = np.arange(d.n, dtype=np.int64)
    found = []
    for q in d.queries:
        ctx = ads.prepare(q)
        heap = TopK(10)
        horizontal_pruned_search(t, ids_all, ctx, ads, heap, delta_d=16)
        found.append(heap.result()[0])
    assert vecdata.recall_at_k(np.stack(found), gt_ids) >= 0.95


def test_horizontal_timers(ds):
    d, _ = ds
    bond = PDXBond(d.dim, order="sequential")
    ctx = bond.prepare(d.queries[0])
    heap = TopK(10)
    timers = {}
    horizontal_pruned_search(
        d.data[:200], np.arange(200, dtype=np.int64), ctx, bond, heap, timers=timers
    )
    assert timers["distance"] > 0


def test_heap_shared_across_calls(ds):
    """Chained bucket scans must keep tightening one heap (IVF use)."""
    d, (gt_ids, gt_d) = ds
    bond = PDXBond(d.dim, order="sequential")
    ctx = bond.prepare(d.queries[0])
    heap = TopK(10)
    half = d.n // 2
    horizontal_pruned_search(d.data[:half], np.arange(half, dtype=np.int64), ctx, bond, heap)
    horizontal_pruned_search(
        d.data[half:], np.arange(half, d.n, dtype=np.int64), ctx, bond, heap
    )
    got_ids, got_d = heap.result()
    assert_same_topk(got_ids, got_d, gt_ids[0], gt_d[0])
