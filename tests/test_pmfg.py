"""PMFG baseline tests: maximal planarity, greedy ordering, timeout, and
the paper's TMFG/PMFG edge-weight relationship."""
import numpy as np
import pytest

from repro.core.pmfg import pmfg
from repro.core.tmfg import tmfg
from repro.graphs.planarity import is_planar


def rand_sim(n, seed):
    rng = np.random.default_rng(seed)
    S = rng.random((n, n))
    S = (S + S.T) / 2
    np.fill_diagonal(S, 1.0)
    return S


def edge_sum(S, edges):
    return float(S[edges[:, 0], edges[:, 1]].sum())


class TestStructure:
    @pytest.mark.parametrize("n,seed", [(6, 0), (10, 1), (20, 2), (35, 3)])
    def test_maximal_planar(self, n, seed):
        S = rand_sim(n, seed)
        e = pmfg(S)
        assert e.shape == (3 * n - 6, 2)
        assert is_planar(n, [tuple(x) for x in e])
        # maximality: adding any absent edge breaks planarity
        present = {tuple(x) for x in e}
        rng = np.random.default_rng(seed)
        absent = [(i, j) for i in range(n) for j in range(i + 1, n)
                  if (i, j) not in present]
        rng.shuffle(absent)
        for extra in absent[:5]:
            assert not is_planar(n, [tuple(x) for x in e] + [extra])

    def test_deterministic(self):
        S = rand_sim(15, 4)
        assert np.array_equal(pmfg(S), pmfg(S))

    def test_contains_top_edges(self):
        """The heaviest few edges can always be added to an empty graph
        without breaking planarity, so they must be in the PMFG."""
        n = 12
        S = rand_sim(n, 5)
        e = {tuple(x) for x in pmfg(S)}
        iu, ju = np.triu_indices(n, 1)
        order = np.argsort(-S[iu, ju])
        for idx in order[:3]:
            assert (int(iu[idx]), int(ju[idx])) in e

    def test_timeout_returns_none(self):
        assert pmfg(rand_sim(60, 6), time_budget_s=0.0) is None

    def test_tiny_graph(self):
        e = pmfg(rand_sim(4, 7))
        assert e.shape == (6, 2)  # K4


class TestVsTMFG:
    @pytest.mark.parametrize("n,seed", [(20, 0), (30, 1), (40, 2)])
    def test_weight_band(self, n, seed):
        """Paper Section VII-B: TMFG prefix graphs have 92.1-100.3% of the
        PMFG edge weight sum; the exact TMFG should be close to PMFG."""
        S = rand_sim(n, seed)
        wp = edge_sum(S, pmfg(S))
        for prefix in (1, 5, 10):
            wt = tmfg(S, prefix=prefix).edge_weight_sum(S)
            assert 0.85 <= wt / wp <= 1.05

    def test_pmfg_at_least_greedy_quality(self):
        """PMFG considers edges globally (best-first), so it is usually at
        least as heavy as TMFG; assert it's never much lighter."""
        S = rand_sim(25, 3)
        wp = edge_sum(S, pmfg(S))
        wt = tmfg(S, prefix=1).edge_weight_sum(S)
        assert wp >= 0.95 * wt
