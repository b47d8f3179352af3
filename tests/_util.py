"""Shared test assertions.

``assert_same_topk`` treats two KNN answers as equal when they contain
the same ids with matching distances, allowing permutations among
floating-point near-ties: visiting dimensions in a different order
accumulates float32 rounding differently, which can swap two vectors
whose true distances agree to ~1e-6 — still the exact answer.
"""
import numpy as np


def assert_same_topk(ids, dists, gt_ids, gt_dists, *, rtol=1e-3, atol=1e-3):
    ids, gt_ids = np.asarray(ids), np.asarray(gt_ids)
    np.testing.assert_allclose(np.sort(dists), np.sort(gt_dists), rtol=rtol, atol=atol)
    if set(ids.tolist()) != set(gt_ids.tolist()):
        # Only near-ties at the k-th boundary may differ: distances of the
        # symmetric difference must match the boundary distance.
        diff = set(ids.tolist()) ^ set(gt_ids.tolist())
        boundary = np.max(gt_dists)
        all_d = dict(zip(gt_ids.tolist(), np.asarray(gt_dists).tolist()))
        for v in diff:
            d = all_d.get(v)
            if d is not None:
                assert abs(d - boundary) <= rtol * abs(boundary) + atol, (
                    f"id {v} differs beyond tie tolerance"
                )
