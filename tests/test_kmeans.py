"""k-means trainer (IVF "Train" stage)."""
import numpy as np
import pytest

from repro.ivf.kmeans import kmeans, pairwise_sq_l2


def _blobs(n=300, k=4, dim=8, seed=0, spread=5.0):
    g = np.random.default_rng(seed)
    centers = g.standard_normal((k, dim)) * spread
    x = centers[g.integers(0, k, n)] + g.standard_normal((n, dim)) * 0.3
    return x.astype(np.float32), centers


def test_pairwise_sq_l2_matches_naive():
    g = np.random.default_rng(0)
    a = g.standard_normal((7, 5)).astype(np.float32)
    b = g.standard_normal((9, 5)).astype(np.float32)
    got = pairwise_sq_l2(a, b)
    want = ((a[:, None, :] - b[None, :, :]) ** 2).sum(-1)
    np.testing.assert_allclose(got, want, rtol=1e-4, atol=1e-4)


def test_pairwise_sq_l2_nonnegative():
    g = np.random.default_rng(1)
    a = g.standard_normal((50, 16)).astype(np.float32) * 100
    assert pairwise_sq_l2(a, a).min() >= 0.0


def test_pairwise_sq_l2_self_diagonal_zero():
    g = np.random.default_rng(2)
    a = g.standard_normal((20, 8)).astype(np.float32)
    np.testing.assert_allclose(np.diag(pairwise_sq_l2(a, a)), 0.0,
                               atol=1e-3)


def test_kmeans_shape_dtype():
    x, _ = _blobs()
    c = kmeans(x, 4)
    assert c.shape == (4, 8) and c.dtype == np.float32


def test_kmeans_deterministic():
    x, _ = _blobs()
    np.testing.assert_array_equal(kmeans(x, 4, seed=3), kmeans(x, 4, seed=3))


def test_kmeans_seed_changes_result():
    x, _ = _blobs(n=500, k=6)
    assert not np.array_equal(kmeans(x, 6, seed=0), kmeans(x, 6, seed=1))


def test_kmeans_recovers_separated_blobs():
    x, centers = _blobs(n=600, k=4, spread=20.0)
    c = kmeans(x, 4)
    # every true center has a learned centroid nearby
    d = pairwise_sq_l2(centers.astype(np.float32), c)
    assert d.min(axis=1).max() < 1.0


def test_kmeans_k_clamped_to_n():
    x = np.random.default_rng(0).standard_normal((3, 4)).astype(np.float32)
    c = kmeans(x, 10)
    assert c.shape == (3, 4)


def test_kmeans_single_cluster():
    x, _ = _blobs(n=50)
    c = kmeans(x, 1)
    np.testing.assert_allclose(c[0], x.mean(axis=0), rtol=1e-2, atol=1e-2)


def test_kmeans_no_nan_with_duplicates():
    x = np.ones((100, 4), dtype=np.float32)
    c = kmeans(x, 4)
    assert np.isfinite(c).all()


@pytest.mark.parametrize("k", [2, 8, 16])
def test_kmeans_quantization_error_reasonable(k):
    x, _ = _blobs(n=400, k=8, spread=10.0)
    c = kmeans(x, k)
    err = pairwise_sq_l2(x, c).min(axis=1).mean()
    base = ((x - x.mean(0)) ** 2).sum(1).mean()
    assert err < base  # better than a single global centroid
