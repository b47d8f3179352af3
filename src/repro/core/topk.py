"""Bounded top-k accumulator — the KNN candidate "max-heap" of the paper.

Implemented over NumPy arrays instead of a literal heap: candidates are
merged in batches (a whole block's survivors at once) and re-partitioned,
which is both faster in NumPy and matches how PDXearch merges at block
boundaries. ``threshold`` is the current k-th best distance (+inf until k
candidates have been seen) — the pruning bound every pruner compares
against.
"""
from __future__ import annotations

import numpy as np


class TopK:
    """Keep the k smallest (distance, id) pairs seen so far."""

    def __init__(self, k: int):
        if k < 1:
            raise ValueError("k must be >= 1")
        self.k = k
        self._ids = np.empty(0, dtype=np.int64)
        self._dists = np.empty(0, dtype=np.float64)

    @property
    def threshold(self) -> float:
        """Current pruning bound: k-th best distance, or +inf if < k seen."""
        if len(self._dists) < self.k:
            return float("inf")
        return float(self._dists[-1])

    def update(self, ids: np.ndarray, dists: np.ndarray) -> None:
        """Merge a batch of candidates (block survivors) into the top-k."""
        if len(ids) == 0:
            return
        ids = np.concatenate([self._ids, np.asarray(ids, dtype=np.int64)])
        dists = np.concatenate([self._dists, np.asarray(dists, dtype=np.float64)])
        if len(ids) > 2 * self.k:
            # O(n) pre-filter for large batches (whole-block merges):
            # keep everything at or below the k-th distance — boundary
            # ties included, so the final lexsort stays deterministic
            # regardless of partition order.
            kth = np.partition(dists, self.k - 1)[self.k - 1]
            keep = dists <= kth
            ids, dists = ids[keep], dists[keep]
        # Sort by (distance, id): O(1) threshold, deterministic ties.
        order = np.lexsort((ids, dists))[: self.k]
        self._ids, self._dists = ids[order], dists[order]

    def result(self) -> tuple[np.ndarray, np.ndarray]:
        """Return ``(ids, dists)`` sorted ascending by distance, then id."""
        return self._ids.copy(), self._dists.copy()
