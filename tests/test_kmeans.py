"""Lloyd's k-means substrate."""
import numpy as np
import pytest

from repro.ivf.kmeans import assign, kmeans
from repro.vecdata import random_collection


def test_assign_matches_naive():
    data = random_collection(200, 8, seed=0)
    cents = random_collection(5, 8, seed=1)
    got = assign(data, cents)
    naive = np.argmin(
        ((data[:, None, :].astype(np.float64) - cents[None]) ** 2).sum(-1), axis=1
    )
    np.testing.assert_array_equal(got, naive)


def test_assign_chunked_consistent():
    data = random_collection(500, 6, seed=2)
    cents = random_collection(7, 6, seed=3)
    np.testing.assert_array_equal(
        assign(data, cents, chunk=64), assign(data, cents, chunk=100000)
    )


def test_kmeans_deterministic():
    data = random_collection(300, 4, seed=4)
    c1, l1 = kmeans(data, 6, seed=5)
    c2, l2 = kmeans(data, 6, seed=5)
    np.testing.assert_array_equal(c1, c2)
    np.testing.assert_array_equal(l1, l2)


def test_kmeans_shapes_and_coverage():
    data = random_collection(400, 5, seed=6)
    cents, labels = kmeans(data, 10, seed=7)
    assert cents.shape == (10, 5)
    assert labels.shape == (400,)
    assert labels.min() >= 0 and labels.max() < 10


def test_kmeans_separates_obvious_clusters():
    rng = np.random.default_rng(8)
    a = rng.standard_normal((100, 3)).astype(np.float32)
    b = rng.standard_normal((100, 3)).astype(np.float32) + 50
    data = np.vstack([a, b])
    _, labels = kmeans(data, 2, seed=9)
    assert len(set(labels[:100].tolist())) == 1
    assert len(set(labels[100:].tolist())) == 1
    assert labels[0] != labels[150]


def test_kmeans_reduces_inertia():
    data = random_collection(500, 8, seed=10)
    c0 = data[np.random.default_rng(11).choice(500, 8, replace=False)]
    inertia0 = ((data - c0[assign(data, c0)]) ** 2).sum()
    cents, labels = kmeans(data, 8, iters=10, seed=11)
    inertia = ((data - cents[labels]) ** 2).sum()
    assert inertia <= inertia0 * 1.01


def test_kmeans_k_too_large():
    data = random_collection(5, 3, seed=12)
    with pytest.raises(ValueError):
        kmeans(data, 10)


def test_kmeans_k_equals_n():
    data = random_collection(6, 3, seed=13)
    cents, labels = kmeans(data, 6, seed=14)
    # every point its own cluster (up to permutation)
    assert len(set(labels.tolist())) == 6
