"""TMFG construction tests: structural invariants, greedy semantics at
prefix=1, prefix batching behavior, determinism."""
import numpy as np
import pytest

from repro.core.tmfg import select_batch, tmfg
from repro.graphs.planarity import is_planar


def rand_sim(n, seed):
    rng = np.random.default_rng(seed)
    S = rng.random((n, n))
    S = (S + S.T) / 2
    np.fill_diagonal(S, 1.0)
    return S


class TestStructure:
    @pytest.mark.parametrize("n", [4, 5, 6, 10, 30, 80])
    @pytest.mark.parametrize("prefix", [1, 3, 10])
    def test_edge_count_and_planarity(self, n, prefix):
        t = tmfg(rand_sim(n, n + prefix), prefix=prefix)
        assert t.edges.shape == (3 * n - 6, 2)
        assert len({tuple(e) for e in t.edges}) == 3 * n - 6
        assert np.all(t.edges[:, 0] < t.edges[:, 1])
        assert is_planar(n, [tuple(e) for e in t.edges])

    def test_n4_is_k4(self):
        t = tmfg(rand_sim(4, 0))
        assert t.edges.tolist() == [[0, 1], [0, 2], [0, 3], [1, 2], [1, 3], [2, 3]]
        assert t.rounds == 0
        assert t.tree.n_bubbles() == 1

    def test_all_vertices_covered(self):
        t = tmfg(rand_sim(25, 1), prefix=5)
        assert set(t.edges.ravel()) == set(range(25))

    def test_seed_vertices_max_row_sum(self):
        S = rand_sim(20, 2)
        t = tmfg(S)
        top4 = set(np.argsort(-S.sum(1), kind="stable")[:4])
        assert set(int(v) for v in t.seed_vertices) == top4

    @pytest.mark.parametrize("prefix", [1, 2, 7])
    def test_deterministic(self, prefix):
        S = rand_sim(30, 3)
        t1, t2 = tmfg(S, prefix), tmfg(S, prefix)
        assert np.array_equal(t1.edges, t2.edges)
        assert t1.insertions == t2.insertions

    def test_insertion_count(self):
        n = 40
        t = tmfg(rand_sim(n, 4), prefix=6)
        assert len(t.insertions) == n - 4
        inserted = [v for v, _ in t.insertions]
        assert len(set(inserted)) == n - 4

    def test_rounds_bounds(self):
        n, prefix = 50, 8
        t = tmfg(rand_sim(n, 5), prefix=prefix)
        assert int(np.ceil((n - 4) / prefix)) <= t.rounds <= n - 4

    def test_prefix1_rounds_equals_insertions(self):
        n = 30
        t = tmfg(rand_sim(n, 6), prefix=1)
        assert t.rounds == n - 4

    def test_invalid_inputs(self):
        with pytest.raises(ValueError):
            tmfg(rand_sim(3, 0))
        with pytest.raises(ValueError):
            tmfg(rand_sim(5, 0), prefix=0)
        with pytest.raises(ValueError):
            tmfg(np.arange(16.0).reshape(4, 4))  # not symmetric


class TestGreedySemantics:
    def test_prefix1_each_insertion_is_best_gain(self):
        """At prefix=1, replaying the insertions must show each inserted
        vertex/face pair had the globally maximal gain at its turn."""
        n = 18
        S = rand_sim(n, 7)
        t = tmfg(S, prefix=1)
        # replay: maintain face set, check each insertion dominates
        faces = {tuple(sorted(f)) for f in [
            (t.seed_vertices[0], t.seed_vertices[1], t.seed_vertices[2]),
            (t.seed_vertices[0], t.seed_vertices[1], t.seed_vertices[3]),
            (t.seed_vertices[0], t.seed_vertices[2], t.seed_vertices[3]),
            (t.seed_vertices[1], t.seed_vertices[2], t.seed_vertices[3]),
        ]}
        remaining = set(range(n)) - {int(v) for v in t.seed_vertices}
        for v, tri in t.insertions:
            tri = tuple(sorted(tri))
            gain = S[tri[0], v] + S[tri[1], v] + S[tri[2], v]
            best = max(S[f[0], u] + S[f[1], u] + S[f[2], u]
                       for f in faces for u in remaining)
            assert gain == pytest.approx(best), f"insertion {v} not greedy"
            faces.remove(tri)
            vx, vy, vz = tri
            faces |= {tuple(sorted((v, vx, vy))), tuple(sorted((v, vy, vz))),
                      tuple(sorted((v, vx, vz)))}
            remaining.discard(v)

    def test_larger_prefix_weight_close(self):
        """Paper Section VII-B: prefix graphs keep 92-100% of the exact
        TMFG edge weight."""
        S = rand_sim(60, 8)
        w1 = tmfg(S, prefix=1).edge_weight_sum(S)
        for prefix in (2, 5, 10, 30):
            wp = tmfg(S, prefix=prefix).edge_weight_sum(S)
            assert wp >= 0.9 * w1
            assert wp <= w1 * 1.02 + 1e-9

    def test_prefix_larger_than_n_single_round_after_start(self):
        n = 20
        t = tmfg(rand_sim(n, 9), prefix=1000)
        # everything insertable goes in very few rounds (conflicts may
        # leave stragglers, but far fewer than n-4 rounds)
        assert t.rounds <= 8


class TestSelectBatch:
    def test_top_prefix_only(self):
        gains = {0: (7, 1.0), 1: (8, 3.0), 2: (9, 2.0)}
        batch = select_batch(gains, 2)
        assert batch == [(9, 2), (8, 1)] or batch == [(8, 1), (9, 2)]
        assert sorted(batch, key=lambda p: p[1]) == batch

    def test_vertex_conflict_keeps_best_face(self):
        gains = {0: (7, 1.0), 1: (7, 3.0), 2: (9, 2.0)}
        batch = select_batch(gains, 3)
        assert (7, 1) in batch and (9, 2) in batch and len(batch) == 2

    def test_vertex_conflict_tie_smallest_face(self):
        gains = {3: (7, 2.0), 1: (7, 2.0)}
        batch = select_batch(gains, 2)
        assert batch == [(7, 1)]

    def test_gain_tie_smallest_face_first(self):
        gains = {5: (1, 2.0), 2: (3, 2.0), 9: (4, 2.0)}
        batch = select_batch(gains, 2)
        assert {fid for _, fid in batch} == {2, 5}
