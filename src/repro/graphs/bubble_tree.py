"""Bubble tree for TMFGs, built incrementally during construction.

The paper's key structural insight (Section V-A): every TMFG vertex
insertion creates exactly one bubble (the new 4-clique) and one bubble-tree
edge (whose separating triangle is the face inserted into). Inserting into
the *outer* face re-roots the tree. The resulting rooted tree satisfies the
invariant that all descendants of an edge lie in the interior of the edge's
separating triangle, which lets edge directions (Algorithm 3) be computed
in Theta(n) total work by a bottom-up accumulation instead of the original
per-triangle BFS (Theta(n^2)).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional, Tuple

import numpy as np

Triangle = Tuple[int, int, int]


def _sorted_tri(t) -> Triangle:
    a, b, c = sorted(int(x) for x in t)
    return (a, b, c)


@dataclass
class BubbleTree:
    """Rooted undirected bubble tree, maintained during TMFG construction.

    Node ``i`` corresponds to the 4-clique created by the ``i``-th
    insertion (node 0 is the initial 4-clique). ``sep_triangle[i]`` is the
    separating triangle on the tree edge between ``i`` and ``parent[i]``.
    """

    bubbles: List[Tuple[int, int, int, int]] = field(default_factory=list)
    parent: List[int] = field(default_factory=list)
    children: List[List[int]] = field(default_factory=list)
    sep_triangle: List[Optional[Triangle]] = field(default_factory=list)
    root: int = 0
    outer_face: int = -1  # face id managed by the TMFG builder
    face_bubble: Dict[int, int] = field(default_factory=dict)
    # directions, filled by compute_directions(): for non-root b,
    # down[b] == True means the tree edge is directed parent[b] -> b.
    down: Optional[np.ndarray] = None

    # ------------------------------------------------------------------ build
    @classmethod
    def initial(cls, clique, face_ids, outer_face: int) -> "BubbleTree":
        """Tree with the starting 4-clique as its single node.

        ``face_ids`` are the ids of the four triangular faces of the
        clique; ``outer_face`` is the id chosen as the (arbitrary) outer
        face.
        """
        bt = cls()
        bt.bubbles.append(tuple(sorted(int(v) for v in clique)))
        bt.parent.append(-1)
        bt.children.append([])
        bt.sep_triangle.append(None)
        bt.root = 0
        bt.outer_face = outer_face
        for fid in face_ids:
            bt.face_bubble[fid] = 0
        return bt

    def insert(self, v: int, face_id: int, triangle, new_face_ids) -> int:
        """Algorithm 2 (UpdateBubbleTree): insert ``v`` into face ``face_id``.

        ``triangle`` is the face's corner vertices; ``new_face_ids`` are the
        ids of the three faces created by the insertion (the first one
        becomes the new outer face when inserting into the outer face).
        Returns the new bubble's node id.
        """
        tri = _sorted_tri(triangle)
        b = self.face_bubble[face_id]
        b_star = len(self.bubbles)
        self.bubbles.append(tuple(sorted((v,) + tri)))
        self.children.append([])
        if face_id == self.outer_face:
            # v lands in the outer face: the old root becomes a child of the
            # new bubble and the outer face moves to a face of the new clique.
            self.parent.append(-1)
            self.sep_triangle.append(None)
            self.parent[b] = b_star
            self.sep_triangle[b] = tri
            self.children[b_star].append(b)
            self.root = b_star
            self.outer_face = new_face_ids[0]
        else:
            self.parent.append(b)
            self.sep_triangle.append(tri)
            self.children[b].append(b_star)
        for fid in new_face_ids:
            self.face_bubble[fid] = b_star
        del self.face_bubble[face_id]
        return b_star

    # ------------------------------------------------------------ navigation
    def n_bubbles(self) -> int:
        return len(self.bubbles)

    def depths(self) -> np.ndarray:
        d = np.full(self.n_bubbles(), -1, dtype=np.int64)
        d[self.root] = 0
        stack = [self.root]
        while stack:
            b = stack.pop()
            for c in self.children[b]:
                d[c] = d[b] + 1
                stack.append(c)
        return d

    def vertex_memberships(self, n_vertices: int) -> List[List[int]]:
        """For each graph vertex, the bubbles containing it (sorted)."""
        mem: List[List[int]] = [[] for _ in range(n_vertices)]
        for b, verts in enumerate(self.bubbles):
            for v in verts:
                mem[v].append(b)
        return mem

    # ------------------------------------------------------------ directions
    def compute_directions(self, S: np.ndarray, edges: np.ndarray) -> np.ndarray:
        """Algorithm 3: direct every tree edge in Theta(n) work.

        ``S`` is the similarity matrix, ``edges`` the TMFG edge list (used
        for weighted degrees). Sets and returns ``self.down``: for each
        non-root bubble ``b``, ``down[b]`` is True iff the edge is directed
        ``parent[b] -> b`` (i.e. INVAL > OUTVAL for the separating
        triangle). Entries for the root are False and unused.
        """
        n_b = self.n_bubbles()
        deg = np.zeros(S.shape[0])
        for u, w in edges:
            deg[u] += S[u, w]
            deg[w] += S[u, w]
        # r maps (bubble -> {corner: interior weight sum}); children first.
        order = np.argsort(-self.depths(), kind="stable")  # deepest first
        r: List[Dict[int, float]] = [{} for _ in range(n_b)]
        down = np.zeros(n_b, dtype=bool)
        for b in order:
            b = int(b)
            if self.parent[b] == -1:
                continue
            tri = self.sep_triangle[b]
            v_rem = next(x for x in self.bubbles[b] if x not in tri)
            rb = {c: float(S[c, v_rem]) for c in tri}
            for c_star in self.children[b]:
                for corner, val in r[c_star].items():
                    if corner in rb:
                        rb[corner] += val
            r[b] = rb
            inval = sum(rb.values())
            vx, vy, vz = tri
            outval = (
                deg[vx] + deg[vy] + deg[vz]
                - inval
                - 2.0 * (S[vx, vy] + S[vx, vz] + S[vy, vz])
            )
            down[b] = inval > outval
        # the root consumes nothing; its children's r values feed no one else
        self.down = down
        return down

    def out_degrees(self) -> np.ndarray:
        """Out-degree of each bubble node in the directed bubble tree."""
        if self.down is None:
            raise RuntimeError("call compute_directions first")
        out = np.zeros(self.n_bubbles(), dtype=np.int64)
        for b in range(self.n_bubbles()):
            p = self.parent[b]
            if p == -1:
                continue
            if self.down[b]:
                out[p] += 1  # arrow parent -> b leaves parent
            else:
                out[b] += 1  # arrow b -> parent leaves b
        return out

    def converging_bubbles(self) -> np.ndarray:
        """Bubble ids with out-degree zero, ascending."""
        return np.flatnonzero(self.out_degrees() == 0)

    def reachable_converging(self) -> np.ndarray:
        """Boolean matrix ``R[b, k]``: bubble ``b`` can reach the ``k``-th
        converging bubble (in ``converging_bubbles()`` order) by following
        directed tree edges. Directed edges on a tree form a DAG, so a
        memoized traversal in reverse topological order suffices (this
        replaces the per-bubble BFS of Algorithm 4, same results).
        """
        if self.down is None:
            raise RuntimeError("call compute_directions first")
        n_b = self.n_bubbles()
        cvg = self.converging_bubbles()
        idx = {int(b): k for k, b in enumerate(cvg)}
        succ: List[List[int]] = [[] for _ in range(n_b)]
        for b in range(n_b):
            p = self.parent[b]
            if p == -1:
                continue
            if self.down[b]:
                succ[p].append(b)
            else:
                succ[b].append(p)
        R = np.zeros((n_b, len(cvg)), dtype=bool)
        for b, k in idx.items():
            R[b, k] = True
        # iterative post-order over the DAG
        state = np.zeros(n_b, dtype=np.int8)  # 0 unvisited, 1 on stack, 2 done
        for start in range(n_b):
            if state[start] == 2:
                continue
            stack = [start]
            while stack:
                b = stack[-1]
                if state[b] == 0:
                    state[b] = 1
                    for s in succ[b]:
                        if state[s] == 0:
                            stack.append(s)
                else:
                    stack.pop()
                    if state[b] == 2:
                        continue
                    for s in succ[b]:
                        R[b] |= R[s]
                    state[b] = 2
        return R
