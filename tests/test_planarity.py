"""Planarity substrate tests: known families, subdivisions, maximal planar
graphs from TMFG construction, and an exact Kuratowski checker for n<=6
cross-validated with hypothesis."""
import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.tmfg import tmfg
from repro.graphs.planarity import is_planar


def complete_graph(n):
    return [(i, j) for i in range(n) for j in range(i + 1, n)]


def complete_bipartite(a, b):
    return [(i, a + j) for i in range(a) for j in range(b)]


def cycle(n):
    return [(i, (i + 1) % n) for i in range(n)]


def grid(rows, cols):
    e = []
    for r in range(rows):
        for c in range(cols):
            v = r * cols + c
            if c + 1 < cols:
                e.append((v, v + 1))
            if r + 1 < rows:
                e.append((v, v + cols))
    return e


def petersen():
    outer = [(i, (i + 1) % 5) for i in range(5)]
    inner = [(5 + i, 5 + (i + 2) % 5) for i in range(5)]
    spokes = [(i, 5 + i) for i in range(5)]
    return outer + inner + spokes


def subdivide(edges, n, which, times=1):
    """Subdivide edge index ``which`` by inserting ``times`` new vertices."""
    edges = list(edges)
    u, v = edges.pop(which)
    prev = u
    for t in range(times):
        edges.append((prev, n + t))
        prev = n + t
    edges.append((prev, v))
    return edges, n + times


class TestKnownFamilies:
    @pytest.mark.parametrize("n", [1, 2, 3, 4])
    def test_complete_small_planar(self, n):
        assert is_planar(n, complete_graph(n))

    @pytest.mark.parametrize("n", [5, 6, 7, 8])
    def test_complete_large_nonplanar(self, n):
        assert not is_planar(n, complete_graph(n))

    def test_k33_nonplanar(self):
        assert not is_planar(6, complete_bipartite(3, 3))

    def test_k23_planar(self):
        assert is_planar(5, complete_bipartite(2, 3))

    def test_k33_minus_edge_planar(self):
        e = complete_bipartite(3, 3)
        assert is_planar(6, e[1:])

    def test_k5_minus_edge_planar(self):
        e = complete_graph(5)
        assert is_planar(5, e[:-1])

    def test_petersen_nonplanar(self):
        assert not is_planar(10, petersen())

    @pytest.mark.parametrize("n", [3, 5, 10, 50])
    def test_cycles_planar(self, n):
        assert is_planar(n, cycle(n))

    @pytest.mark.parametrize("rc", [(2, 2), (3, 4), (5, 5), (8, 8)])
    def test_grids_planar(self, rc):
        r, c = rc
        assert is_planar(r * c, grid(r, c))

    def test_octahedron_planar(self):
        octa = [(0, 1), (0, 2), (0, 3), (0, 4), (1, 2), (2, 3), (3, 4),
                (4, 1), (5, 1), (5, 2), (5, 3), (5, 4)]
        assert is_planar(6, octa)

    def test_empty_and_trivial(self):
        assert is_planar(0, [])
        assert is_planar(1, [])
        assert is_planar(2, [(0, 1)])

    def test_disconnected_planar(self):
        assert is_planar(8, cycle(4) + [(4 + u, 4 + v) for u, v in cycle(4)])

    def test_disconnected_with_nonplanar_component(self):
        e = complete_graph(5) + [(5 + u, 5 + v) for u, v in cycle(4)]
        assert not is_planar(9, e)

    def test_tree_planar(self):
        rng = np.random.default_rng(0)
        edges = [(int(rng.integers(0, i)), i) for i in range(1, 60)]
        assert is_planar(60, edges)

    def test_self_loops_and_parallel_ignored(self):
        assert is_planar(3, [(0, 0), (0, 1), (1, 0), (1, 2)])


class TestSubdivisions:
    @pytest.mark.parametrize("which,times", [(0, 1), (3, 2), (7, 3)])
    def test_k5_subdivision_nonplanar(self, which, times):
        e, n = subdivide(complete_graph(5), 5, which, times)
        assert not is_planar(n, e)

    @pytest.mark.parametrize("which,times", [(0, 1), (4, 2), (8, 3)])
    def test_k33_subdivision_nonplanar(self, which, times):
        e, n = subdivide(complete_bipartite(3, 3), 6, which, times)
        assert not is_planar(n, e)

    def test_subdivided_planar_stays_planar(self):
        e, n = subdivide(grid(3, 3), 9, 2, 2)
        assert is_planar(n, e)


class TestMaximalPlanar:
    """TMFG outputs are maximal planar by construction: planar with 3n-6
    edges, and adding ANY absent edge must break planarity."""

    @pytest.mark.parametrize("n,seed", [(10, 0), (20, 1), (40, 2), (80, 3)])
    def test_tmfg_planar(self, n, seed):
        rng = np.random.default_rng(seed)
        S = rng.random((n, n))
        S = (S + S.T) / 2
        t = tmfg(S, prefix=1)
        edges = [tuple(e) for e in t.edges]
        assert len(edges) == 3 * n - 6
        assert is_planar(n, edges)

    @pytest.mark.parametrize("n,seed,prefix", [(12, 0, 1), (25, 1, 3), (40, 2, 10)])
    def test_tmfg_plus_chord_nonplanar(self, n, seed, prefix):
        rng = np.random.default_rng(seed)
        S = rng.random((n, n))
        S = (S + S.T) / 2
        t = tmfg(S, prefix=prefix)
        present = {tuple(e) for e in t.edges}
        absent = [(i, j) for i in range(n) for j in range(i + 1, n)
                  if (i, j) not in present]
        rng.shuffle(absent)
        for extra in absent[:10]:
            assert not is_planar(n, [tuple(e) for e in t.edges] + [extra]), (
                f"adding {extra} to a maximal planar graph must break planarity"
            )


def exact_planar_upto6(n, edges):
    """Kuratowski-exhaustive planarity for n <= 6 (test oracle).

    With at most 6 vertices the only obstructions are a K5 subgraph, a
    K3,3 subgraph, or a K5 subdivision with exactly one degree-2 vertex.
    """
    assert n <= 6
    es = {frozenset(e) for e in edges if e[0] != e[1]}

    def has(a, b):
        return frozenset((a, b)) in es

    for sub in itertools.combinations(range(n), 5):
        if all(has(a, b) for a, b in itertools.combinations(sub, 2)):
            return False
    if n == 6:
        for part_a in itertools.combinations(range(6), 3):
            part_b = [v for v in range(6) if v not in part_a]
            if all(has(a, b) for a in part_a for b in part_b):
                return False
        for x in range(6):
            branch = [v for v in range(6) if v != x]
            for a, b in itertools.combinations(branch, 2):
                others = [(u, v) for u, v in itertools.combinations(branch, 2)
                          if {u, v} != {a, b}]
                if (has(x, a) and has(x, b) and not has(a, b)
                        and all(has(u, v) for u, v in others)):
                    return False
    return True


@st.composite
def small_graphs(draw):
    n = draw(st.integers(min_value=1, max_value=6))
    all_edges = list(itertools.combinations(range(n), 2))
    mask = draw(st.lists(st.booleans(), min_size=len(all_edges),
                         max_size=len(all_edges)))
    return n, [e for e, m in zip(all_edges, mask) if m]


@settings(max_examples=300, deadline=None)
@given(small_graphs())
def test_matches_exact_checker_upto6(g):
    n, edges = g
    assert is_planar(n, edges) == exact_planar_upto6(n, edges)
