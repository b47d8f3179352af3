"""IVF index substrate with PDX buckets (§2.1, Figure 2, §6.3).

:func:`build_ivf` clusters the collection once (Lloyd's k-means,
``nlist ≈ √n`` centroids by default — the FAISS/Milvus convention the
paper cites). All competitors then share the *same* bucket membership,
as in the paper's setup ("all competitors share the same IVF index").

Per-algorithm searchers wrap the shared index:

- :class:`IVFPDXSearcher` — buckets stored as PDX blocks over the
  pruner's transformed space; search streams nprobe buckets' blocks
  through PDXearch with one shared heap (threshold propagates across
  buckets). Centroids are also stored as PDX blocks, so "find nearest
  buckets" uses the PDX kernel (Table 7's observation).
- :class:`IVFNarySearcher` — buckets stored row-major; either a plain
  linear scan per bucket (FAISS IVF_FLAT stand-in) or the Δd-stepped
  horizontal pruned search (SIMD-ADS / N-ary BSA stand-ins).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from types import SimpleNamespace

import numpy as np

from repro.core.kernels import PDX_BLOCK_SIZE, l2_accumulate, l2_nary
from repro.core.layout import PDXCollection, build_pdx
from repro.core.pdxearch import search_blocks
from repro.core.pruners import Pruner
from repro.core.topk import TopK
from repro.ivf.kmeans import kmeans
from repro.search.horizontal import horizontal_pruned_search


@dataclass
class IVFIndex:
    """Shared clustering: raw-space centroids + per-bucket global ids."""

    centroids: np.ndarray  # (nlist, D) float32, raw space
    bucket_ids: list[np.ndarray]  # global vector ids per bucket

    @property
    def nlist(self) -> int:
        return len(self.bucket_ids)


def build_ivf(
    data: np.ndarray, *, nlist: int | None = None, iters: int = 8, seed: int = 0
) -> IVFIndex:
    n = len(data)
    if nlist is None:
        nlist = max(1, int(np.sqrt(n)))
    centroids, labels = kmeans(data, nlist, iters=iters, seed=seed)
    buckets = [np.flatnonzero(labels == c).astype(np.int64) for c in range(nlist)]
    return IVFIndex(centroids=centroids, bucket_ids=buckets)


def _pdx_all_distances(coll: PDXCollection, query: np.ndarray) -> np.ndarray:
    """Full PDX-kernel distances over a small collection (centroids)."""
    out = np.empty(coll.n, dtype=np.float32)
    order = np.arange(coll.dim)
    pos = 0
    for block in coll.blocks:
        d = np.zeros(block.n, dtype=np.float32)
        l2_accumulate(block.data, query, d, order)
        out[pos : pos + block.n] = d
        pos += block.n
    return out


class IVFPDXSearcher:
    """PDXearch over IVF buckets stored in the PDX layout."""

    def __init__(
        self,
        index: IVFIndex,
        data: np.ndarray,
        pruner: Pruner,
        *,
        block_size: int = PDX_BLOCK_SIZE,
    ):
        self.index = index
        self.pruner = pruner
        tdata = pruner.transform_data(data)
        self.tcentroids = pruner.transform_data(index.centroids)
        self._cent_coll = build_pdx(self.tcentroids, block_size=block_size)
        self.buckets: list[PDXCollection] = [
            build_pdx(tdata[ids], ids=ids, block_size=block_size)
            for ids in index.bucket_ids
        ]
        # Collection-level metadata for query-aware ordering (PDX-BOND).
        self._meta = SimpleNamespace(
            dim_means=tdata.mean(axis=0).astype(np.float32)
        )

    def search(
        self,
        query: np.ndarray,
        k: int,
        *,
        nprobe: int,
        selection_fraction: float = 0.2,
        fixed_step: int | None = None,
        timers: dict | None = None,
    ) -> tuple[np.ndarray, np.ndarray]:
        if timers is not None:
            t0 = time.perf_counter()
        ctx = self.pruner.prepare(query, self._meta)
        if timers is not None:
            t1 = time.perf_counter()
            timers["query_prep"] = timers.get("query_prep", 0.0) + t1 - t0
        cdists = _pdx_all_distances(self._cent_coll, ctx.query)
        probe = np.argsort(cdists, kind="stable")[:nprobe]
        if timers is not None:
            timers["find_buckets"] = (
                timers.get("find_buckets", 0.0) + time.perf_counter() - t1
            )
        heap = TopK(k)
        blocks = (b for c in probe for b in self.buckets[c].blocks)
        search_blocks(
            blocks,
            ctx,
            self.pruner,
            heap,
            selection_fraction=selection_fraction,
            fixed_step=fixed_step,
            timers=timers,
        )
        return heap.result()


class IVFNarySearcher:
    """Horizontal-layout search over the same IVF buckets."""

    def __init__(self, index: IVFIndex, data: np.ndarray, pruner: Pruner):
        self.index = index
        self.pruner = pruner
        tdata = pruner.transform_data(data)
        self.tcentroids = pruner.transform_data(index.centroids)
        self.buckets = [
            (np.ascontiguousarray(tdata[ids]), ids) for ids in index.bucket_ids
        ]
        self._meta = SimpleNamespace(
            dim_means=tdata.mean(axis=0).astype(np.float32)
        )

    def search(
        self,
        query: np.ndarray,
        k: int,
        *,
        nprobe: int,
        pruned: bool = True,
        delta_d: int = 32,
        timers: dict | None = None,
    ) -> tuple[np.ndarray, np.ndarray]:
        """``pruned=True`` → Δd-stepped pruning (SIMD-ADS shape);
        ``pruned=False`` → plain linear bucket scans (FAISS IVF_FLAT)."""
        if timers is not None:
            t0 = time.perf_counter()
        ctx = self.pruner.prepare(query, self._meta)
        if timers is not None:
            t1 = time.perf_counter()
            timers["query_prep"] = timers.get("query_prep", 0.0) + t1 - t0
        cdists = l2_nary(self.tcentroids, ctx.query)
        probe = np.argsort(cdists, kind="stable")[:nprobe]
        if timers is not None:
            timers["find_buckets"] = (
                timers.get("find_buckets", 0.0) + time.perf_counter() - t1
            )
        heap = TopK(k)
        for c in probe:
            bdata, bids = self.buckets[c]
            if len(bids) == 0:
                continue
            if pruned and np.isfinite(heap.threshold):
                horizontal_pruned_search(
                    bdata, bids, ctx, self.pruner, heap, delta_d=delta_d, timers=timers
                )
            else:
                if timers is not None:
                    t2 = time.perf_counter()
                d = l2_nary(bdata, ctx.query)
                if timers is not None:
                    timers["distance"] = (
                        timers.get("distance", 0.0) + time.perf_counter() - t2
                    )
                heap.update(bids, d)
        return heap.result()
