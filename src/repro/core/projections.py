"""Vector-space transforms used by the approximate pruners (§2.3).

- :func:`random_orthogonal` — the ADSampling preprocessing: a uniformly
  random rotation (QR of a Gaussian matrix with sign-fixed R diagonal).
  It preserves L2 distances exactly, while making every prefix of
  dimensions a random sample of the full distance.
- :class:`PCAProjection` — the BSA preprocessing: project onto the
  data's principal axes (full rank, so distances are preserved) ordered
  by decreasing variance, concentrating distance "energy" in the first
  dimensions for earlier pruning.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


def random_orthogonal(dim: int, *, seed: int = 0) -> np.ndarray:
    """A Haar-ish random orthogonal (dim, dim) float32 matrix."""
    rng = np.random.default_rng(seed)
    g = rng.standard_normal((dim, dim))
    q, r = np.linalg.qr(g)
    # Fix signs so the distribution is uniform over O(dim), not biased by
    # QR's sign convention.
    q *= np.sign(np.diag(r))
    return q.astype(np.float32)


@dataclass
class PCAProjection:
    """Full-rank PCA basis fit on (a sample of) the collection.

    ``transform`` maps vectors into the principal-axis frame (centered),
    which preserves pairwise L2 distances: for x, y,
    ‖W(x−μ) − W(y−μ)‖ = ‖x − y‖ since W is orthogonal.
    ``explained`` holds the per-component variances (descending) — the
    error model BSA's quantile bound is built from.
    """

    components: np.ndarray  # (D, D), rows = principal axes, orthonormal
    mean: np.ndarray  # (D,)
    explained: np.ndarray  # (D,) descending variances

    @classmethod
    def fit(cls, data: np.ndarray, *, sample: int | None = 4096, seed: int = 0) -> "PCAProjection":
        rng = np.random.default_rng(seed)
        x = data
        if sample is not None and len(data) > sample:
            x = data[rng.choice(len(data), sample, replace=False)]
        x = x.astype(np.float64)
        mu = x.mean(axis=0)
        xc = x - mu
        # SVD of the (sample, D) matrix; Vt rows are principal axes.
        _, s, vt = np.linalg.svd(xc, full_matrices=True)
        var = np.zeros(data.shape[1])
        var[: len(s)] = (s**2) / max(1, len(x) - 1)
        return cls(
            components=vt.astype(np.float32),
            mean=mu.astype(np.float32),
            explained=var,
        )

    def transform(self, vecs: np.ndarray) -> np.ndarray:
        v2 = np.atleast_2d(vecs).astype(np.float32)
        out = (v2 - self.mean) @ self.components.T
        return np.ascontiguousarray(out.reshape(vecs.shape), dtype=np.float32)
