"""Clustering quality metrics: Adjusted Rand Index and Adjusted Mutual
Information, implemented from scratch (no sklearn in the environment).

ARI follows the formula in Section VII of the paper (Hubert & Arabie).
AMI follows Vinh et al. (JMLR 2010) with the exact hypergeometric expected
mutual information, arithmetic-mean normalization (sklearn's default).
"""
from __future__ import annotations

from math import lgamma, log
from typing import Sequence

import numpy as np


def contingency(labels_true: Sequence[int], labels_pred: Sequence[int]) -> np.ndarray:
    """Contingency table ``n_ij`` between two labelings."""
    a = np.asarray(labels_true)
    b = np.asarray(labels_pred)
    if a.shape != b.shape:
        raise ValueError("label arrays must have the same length")
    _, ai = np.unique(a, return_inverse=True)
    _, bi = np.unique(b, return_inverse=True)
    table = np.zeros((ai.max() + 1, bi.max() + 1), dtype=np.int64)
    np.add.at(table, (ai, bi), 1)
    return table


def _comb2(x: np.ndarray) -> np.ndarray:
    x = np.asarray(x, dtype=np.float64)
    return x * (x - 1.0) / 2.0


def ari(labels_true: Sequence[int], labels_pred: Sequence[int]) -> float:
    """Adjusted Rand Index; 1 for a perfect match, ~0 for random labels."""
    t = contingency(labels_true, labels_pred)
    n = t.sum()
    if n < 2:
        return 1.0
    sum_ij = _comb2(t).sum()
    sum_i = _comb2(t.sum(axis=1)).sum()
    sum_j = _comb2(t.sum(axis=0)).sum()
    total = _comb2(np.array([n]))[0]
    expected = sum_i * sum_j / total
    max_index = 0.5 * (sum_i + sum_j)
    if max_index == expected:  # both labelings are a single cluster (or all-singletons)
        return 1.0
    return float((sum_ij - expected) / (max_index - expected))


def _entropy(counts: np.ndarray) -> float:
    n = counts.sum()
    p = counts[counts > 0] / n
    return float(-(p * np.log(p)).sum())


def mutual_information(t: np.ndarray) -> float:
    """MI (nats) of a contingency table."""
    n = t.sum()
    ai = t.sum(axis=1)
    bj = t.sum(axis=0)
    mi = 0.0
    for i in range(t.shape[0]):
        for j in range(t.shape[1]):
            nij = t[i, j]
            if nij > 0:
                mi += (nij / n) * log(n * nij / (ai[i] * bj[j]))
    return mi


def expected_mutual_information(t: np.ndarray) -> float:
    """Exact E[MI] under the permutation model (Vinh et al. 2010).

    O(c^2 * n) sum over the hypergeometric support, via log-gamma.
    """
    n = int(t.sum())
    ai = t.sum(axis=1).astype(np.int64)
    bj = t.sum(axis=0).astype(np.int64)
    lg = lgamma
    log_n_fact = lg(n + 1)
    emi = 0.0
    for a in ai:
        a = int(a)
        for b in bj:
            b = int(b)
            lo = max(1, a + b - n)
            hi = min(a, b)
            for nij in range(lo, hi + 1):
                term1 = (nij / n) * log(n * nij / (a * b))
                log_term2 = (
                    lg(a + 1) + lg(b + 1) + lg(n - a + 1) + lg(n - b + 1)
                    - log_n_fact - lg(nij + 1) - lg(a - nij + 1)
                    - lg(b - nij + 1) - lg(n - a - b + nij + 1)
                )
                emi += term1 * np.exp(log_term2)
    return emi


def ami(labels_true: Sequence[int], labels_pred: Sequence[int]) -> float:
    """Adjusted Mutual Information, arithmetic-mean normalized."""
    t = contingency(labels_true, labels_pred)
    if t.shape == (1, 1):
        return 1.0
    mi = mutual_information(t)
    emi = expected_mutual_information(t)
    h_true = _entropy(t.sum(axis=1))
    h_pred = _entropy(t.sum(axis=0))
    normalizer = 0.5 * (h_true + h_pred)
    denom = normalizer - emi
    if abs(denom) < 1e-15:
        return 1.0 if abs(mi - emi) < 1e-15 else 0.0
    return float((mi - emi) / denom)
