"""K-MEANS and K-MEANS-S baselines.

K-MEANS is k-means++ initialization plus Lloyd iterations (the paper uses
an MPI scalable k-means++; absolute speed is not the point of the quality
comparison, determinism is, so seeds are explicit).

K-MEANS-S reproduces the paper's preprocessing: a spectral embedding whose
affinity matrix comes from a beta-nearest-neighbor graph; the data is
projected onto c dimensions (c = number of ground-truth clusters) before
k-means. Implemented with numpy.linalg.eigh on the normalized Laplacian
(no scipy/sklearn in the environment).
"""
from __future__ import annotations

from typing import Tuple

import numpy as np


def kmeans_pp_init(X: np.ndarray, k: int, rng: np.random.Generator) -> np.ndarray:
    """k-means++ seeding: D^2-weighted sampling of initial centers."""
    n = X.shape[0]
    centers = np.empty((k, X.shape[1]))
    first = int(rng.integers(n))
    centers[0] = X[first]
    d2 = ((X - centers[0]) ** 2).sum(axis=1)
    for i in range(1, k):
        total = d2.sum()
        if total <= 0:
            idx = int(rng.integers(n))
        else:
            idx = int(rng.choice(n, p=d2 / total))
        centers[i] = X[idx]
        d2 = np.minimum(d2, ((X - centers[i]) ** 2).sum(axis=1))
    return centers


def kmeans(X: np.ndarray, k: int, *, seed: int = 0, n_init: int = 4,
           max_iter: int = 100, tol: float = 1e-7) -> Tuple[np.ndarray, float]:
    """Lloyd's algorithm with k-means++ init; returns (labels, inertia).

    Best of ``n_init`` restarts (deterministic in ``seed``).
    """
    X = np.asarray(X, dtype=np.float64)
    rng = np.random.default_rng(seed)
    best_labels, best_inertia = None, np.inf
    for _ in range(n_init):
        centers = kmeans_pp_init(X, k, rng)
        labels = None
        for _ in range(max_iter):
            d2 = ((X[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
            labels = d2.argmin(axis=1)
            new_centers = centers.copy()
            for c in range(k):
                pts = X[labels == c]
                if len(pts):
                    new_centers[c] = pts.mean(axis=0)
            shift = ((new_centers - centers) ** 2).sum()
            centers = new_centers
            if shift < tol:
                break
        d2 = ((X[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
        labels = d2.argmin(axis=1)
        inertia = float(d2[np.arange(len(X)), labels].sum())
        if inertia < best_inertia:
            best_inertia, best_labels = inertia, labels
    return best_labels, best_inertia


def knn_affinity(X: np.ndarray, beta: int) -> np.ndarray:
    """Symmetrized beta-nearest-neighbor connectivity affinity matrix."""
    n = X.shape[0]
    beta = min(beta, n - 1)
    sq = (X ** 2).sum(axis=1)
    d2 = sq[:, None] + sq[None, :] - 2.0 * (X @ X.T)
    np.fill_diagonal(d2, np.inf)
    W = np.zeros((n, n))
    nn = np.argpartition(d2, beta - 1, axis=1)[:, :beta]
    rows = np.repeat(np.arange(n), beta)
    W[rows, nn.ravel()] = 1.0
    W = 0.5 * (W + W.T)  # sklearn-style symmetrization
    return W


def spectral_embedding(X: np.ndarray, n_components: int, beta: int) -> np.ndarray:
    """Normalized-Laplacian eigenmap of the beta-NN affinity graph.

    Returns the ``n_components`` eigenvectors of ``D^{-1/2} W D^{-1/2}``
    with largest eigenvalues (equivalently smallest Laplacian eigenvalues),
    rescaled by ``D^{-1/2}`` as in diffusion-map style embeddings.
    """
    W = knn_affinity(X, beta)
    d = W.sum(axis=1)
    d_inv_sqrt = np.where(d > 0, 1.0 / np.sqrt(np.maximum(d, 1e-12)), 0.0)
    A = (W * d_inv_sqrt[:, None]) * d_inv_sqrt[None, :]
    vals, vecs = np.linalg.eigh(A)
    top = vecs[:, ::-1][:, :n_components]
    return top * d_inv_sqrt[:, None]


def kmeans_s(X: np.ndarray, k: int, beta: int, *, seed: int = 0) -> np.ndarray:
    """K-MEANS-S: spectral embedding to ``k`` dims, then k-means++."""
    emb = spectral_embedding(X, n_components=k, beta=beta)
    labels, _ = kmeans(emb, k, seed=seed)
    return labels
