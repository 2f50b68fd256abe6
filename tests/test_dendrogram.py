"""Dendrogram structure, validation, and cut semantics."""
import numpy as np
import pytest

from repro.core.dendrogram import Dendrogram, from_linkage
from repro.core.linkage import hac


def chain_dendrogram(n):
    """((0,1),2),3... with heights 1..n-1."""
    merges = []
    prev = 0
    for i in range(1, n):
        merges.append((prev, i, float(i)))
        prev = n + i - 1
    return Dendrogram(n, np.array(merges))


class TestStructure:
    def test_children_heights(self):
        d = chain_dendrogram(4)
        assert d.children(4) == (0, 1)
        assert d.height(4) == 1.0
        assert d.height(0) == 0.0
        assert d.n_nodes == 7

    def test_roots_single(self):
        d = chain_dendrogram(5)
        assert d.roots() == [8]

    def test_leaves_under(self):
        d = chain_dendrogram(4)
        assert d.leaves_under(4).tolist() == [0, 1]
        assert d.leaves_under(6).tolist() == [0, 1, 2, 3]
        assert d.leaves_under(2).tolist() == [2]

    def test_validate_ok(self):
        chain_dendrogram(6).validate()

    def test_validate_rejects_nonmonotone(self):
        merges = np.array([(0, 1, 2.0), (3, 2, 1.0)])
        with pytest.raises(ValueError, match="monotone"):
            Dendrogram(3, merges).validate()

    def test_validate_rejects_missing_merge(self):
        with pytest.raises(ValueError, match="merges"):
            Dendrogram(4, np.array([(0, 1, 1.0)])).validate()

    def test_validate_rejects_double_merge(self):
        merges = np.array([(0, 1, 1.0), (0, 2, 2.0), (3, 4, 3.0)])
        with pytest.raises(ValueError):
            Dendrogram(4, merges).validate()


class TestCut:
    def test_cut_1_is_all_one(self):
        d = chain_dendrogram(6)
        assert len(np.unique(d.cut_k(1))) == 1

    def test_cut_n_is_singletons(self):
        d = chain_dendrogram(6)
        assert len(np.unique(d.cut_k(6))) == 6

    @pytest.mark.parametrize("k", [1, 2, 3, 4, 5])
    def test_cut_k_cluster_count(self, k):
        d = chain_dendrogram(5)
        labels = d.cut_k(k)
        assert len(np.unique(labels)) == k
        assert labels.min() == 0 and labels.max() == k - 1

    def test_cut_chain_peels_last(self):
        # highest merge is the last: cutting k=2 separates leaf n-1
        d = chain_dendrogram(5)
        labels = d.cut_k(2)
        assert labels[4] != labels[0]
        assert np.all(labels[:4] == labels[0])

    def test_cut_out_of_range(self):
        d = chain_dendrogram(4)
        with pytest.raises(ValueError):
            d.cut_k(0)
        with pytest.raises(ValueError):
            d.cut_k(5)

    def test_cut_balanced(self):
        merges = np.array([(0, 1, 1.0), (2, 3, 1.0), (4, 5, 2.0)])
        d = Dendrogram(4, merges)
        labels = d.cut_k(2)
        assert labels[0] == labels[1]
        assert labels[2] == labels[3]
        assert labels[0] != labels[2]

    def test_cut_ties_split_later_node_first(self):
        # two internal nodes at the same height; larger id splits first
        merges = np.array([(0, 1, 1.0), (2, 3, 1.0), (4, 5, 1.0)])
        d = Dendrogram(4, merges)
        labels = d.cut_k(3)
        # root (6) splits, then node 5 (later than 4): {0,1} stays merged
        assert labels[0] == labels[1]
        assert labels[2] != labels[3]

    def test_cut_matches_linkage_threshold(self):
        rng = np.random.default_rng(0)
        X = np.concatenate([rng.normal(0, 0.1, (5, 2)),
                            rng.normal(5, 0.1, (5, 2))])
        D = np.sqrt(((X[:, None] - X[None]) ** 2).sum(-1))
        d = from_linkage(hac(D, "complete"), 10)
        labels = d.cut_k(2)
        assert np.all(labels[:5] == labels[0])
        assert np.all(labels[5:] == labels[5])
        assert labels[0] != labels[5]

    def test_labels_ordered_by_smallest_leaf(self):
        merges = np.array([(2, 3, 1.0), (0, 1, 1.0), (4, 5, 2.0)])
        d = Dendrogram(4, merges)
        labels = d.cut_k(2)
        assert labels[0] == 0  # cluster containing leaf 0 gets label 0
