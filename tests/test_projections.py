"""Random-orthogonal and PCA transforms: the ADSampling/BSA substrate."""
import numpy as np
import pytest

from repro.core.projections import PCAProjection, random_orthogonal
from repro.vecdata import random_collection


@pytest.mark.parametrize("dim", [8, 50, 200])
def test_random_orthogonal_is_orthogonal(dim):
    o = random_orthogonal(dim, seed=1)
    np.testing.assert_allclose(o @ o.T, np.eye(dim), atol=1e-4)
    np.testing.assert_allclose(o.T @ o, np.eye(dim), atol=1e-4)


def test_random_orthogonal_deterministic():
    np.testing.assert_array_equal(
        random_orthogonal(16, seed=9), random_orthogonal(16, seed=9)
    )
    assert not np.array_equal(random_orthogonal(16, seed=9), random_orthogonal(16, seed=10))


@pytest.mark.parametrize("dim", [8, 64])
def test_rotation_preserves_distances(dim):
    o = random_orthogonal(dim, seed=2)
    x = random_collection(50, dim, seed=3)
    y = x @ o.T
    dx = ((x[:25] - x[25:]) ** 2).sum(axis=1)
    dy = ((y[:25] - y[25:]) ** 2).sum(axis=1)
    np.testing.assert_allclose(dx, dy, rtol=1e-3)


def test_pca_components_orthonormal():
    x = random_collection(500, 20, seed=4)
    p = PCAProjection.fit(x)
    np.testing.assert_allclose(p.components @ p.components.T, np.eye(20), atol=1e-3)


def test_pca_preserves_pairwise_distances():
    x = random_collection(100, 16, seed=5)
    p = PCAProjection.fit(x)
    y = p.transform(x)
    dx = ((x[:50].astype(np.float64) - x[50:]) ** 2).sum(axis=1)
    dy = ((y[:50].astype(np.float64) - y[50:]) ** 2).sum(axis=1)
    np.testing.assert_allclose(dx, dy, rtol=1e-3)


def test_pca_concentrates_variance_in_early_dims():
    # Anisotropic data: PCA space variance must be descending and front-loaded.
    rng = np.random.default_rng(6)
    x = (rng.standard_normal((1000, 12)) * np.linspace(5, 0.1, 12)).astype(np.float32)
    p = PCAProjection.fit(x)
    y = p.transform(x)
    var = y.var(axis=0)
    assert var[0] > var[-1] * 10
    assert np.all(np.diff(p.explained) <= 1e-6)


def test_pca_explained_matches_transformed_variance():
    x = random_collection(2000, 10, seed=7)
    p = PCAProjection.fit(x, sample=None)
    y = p.transform(x).astype(np.float64)
    np.testing.assert_allclose(y.var(axis=0, ddof=1), p.explained, rtol=0.05)


def test_pca_sampled_fit_close_to_full_fit():
    x = random_collection(5000, 8, seed=8)
    full = PCAProjection.fit(x, sample=None)
    sub = PCAProjection.fit(x, sample=2000)
    np.testing.assert_allclose(sub.explained, full.explained, rtol=0.2)


def test_pca_transform_single_vector_shape():
    x = random_collection(300, 9, seed=9)
    p = PCAProjection.fit(x)
    v = p.transform(x[0])
    assert v.shape == (9,)
