"""Lloyd's k-means — the IVF clustering substrate (§2.1).

The paper's IVF indexes come from FAISS ("non-optimized Lloyd
algorithm"); we implement Lloyd's from scratch: k-means++-lite seeding
(distinct random points), chunked nearest-centroid assignment, mean
update, empty clusters reseeded to the farthest points. Deterministic in
``seed``.
"""
from __future__ import annotations

import numpy as np


def assign(data: np.ndarray, centroids: np.ndarray, *, chunk: int = 65536) -> np.ndarray:
    """Nearest-centroid id for every row of ``data`` (squared L2)."""
    c64 = centroids.astype(np.float64)
    c_norms = (c64 * c64).sum(axis=1)
    out = np.empty(len(data), dtype=np.int64)
    for s in range(0, len(data), chunk):
        x = data[s : s + chunk].astype(np.float64)
        # ||x-c||² = ||x||² − 2x·c + ||c||²; ||x||² constant per row.
        d2 = c_norms[None, :] - 2.0 * (x @ c64.T)
        out[s : s + chunk] = np.argmin(d2, axis=1)
    return out


def kmeans(
    data: np.ndarray, k: int, *, iters: int = 10, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Run Lloyd's algorithm; returns ``(centroids (k, D), assignment (N,))``."""
    n = len(data)
    if k > n:
        raise ValueError(f"k={k} > n={n}")
    rng = np.random.default_rng(seed)
    centroids = data[rng.choice(n, k, replace=False)].astype(np.float64)
    labels = assign(data, centroids)
    for _ in range(iters):
        for c in range(k):
            members = labels == c
            if members.any():
                centroids[c] = data[members].mean(axis=0)
            else:
                # Reseed an empty cluster to the point farthest from its
                # current centroid assignment.
                d = data.astype(np.float64)
                far = np.argmax(((d - centroids[labels]) ** 2).sum(axis=1))
                centroids[c] = data[far]
        new_labels = assign(data, centroids)
        if np.array_equal(new_labels, labels):
            break
        labels = new_labels
    return centroids.astype(np.float32), labels
