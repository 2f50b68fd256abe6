"""Dendrogram structure, validation, and cluster extraction.

A dendrogram is a binary merge tree over ``n`` leaves with a height per
internal node, where a node's height is at least its children's (the
paper's validity requirement). ``cut_k`` extracts exactly ``k`` flat
clusters by repeatedly splitting the highest node — the operation used
throughout the evaluation ("cut the dendrogram such that the number of
resulting clusters is the same as the number of ground truth clusters").
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

import heapq

import numpy as np


@dataclass
class Dendrogram:
    """Binary merge tree. ``merges[r] = (left, right, height)`` creates node
    ``n_leaves + r``; leaves are ``0..n_leaves-1``. A full dendrogram has
    ``n_leaves - 1`` merges (a forest with fewer is allowed only
    transiently during assembly)."""

    n_leaves: int
    merges: np.ndarray  # (m, 3) float; node ids stored as floats in cols 0-1

    def __post_init__(self):
        self.merges = np.asarray(self.merges, dtype=np.float64).reshape(-1, 3)

    # ------------------------------------------------------------------ basic
    @property
    def n_nodes(self) -> int:
        return self.n_leaves + len(self.merges)

    def children(self, node: int) -> tuple[int, int]:
        r = node - self.n_leaves
        return int(self.merges[r, 0]), int(self.merges[r, 1])

    def height(self, node: int) -> float:
        if node < self.n_leaves:
            return 0.0
        return float(self.merges[node - self.n_leaves, 2])

    def roots(self) -> List[int]:
        has_parent = np.zeros(self.n_nodes, dtype=bool)
        for left, right, _ in self.merges:
            has_parent[int(left)] = True
            has_parent[int(right)] = True
        return [i for i in range(self.n_nodes) if not has_parent[i]]

    def leaves_under(self, node: int) -> np.ndarray:
        out = []
        stack = [node]
        while stack:
            x = stack.pop()
            if x < self.n_leaves:
                out.append(x)
            else:
                left, right = self.children(x)
                stack.append(left)
                stack.append(right)
        return np.sort(np.array(out, dtype=np.int64))

    def validate(self) -> None:
        """Raise if not a full monotone binary dendrogram."""
        if len(self.merges) != self.n_leaves - 1:
            raise ValueError(
                f"expected {self.n_leaves - 1} merges, got {len(self.merges)}"
            )
        seen = np.zeros(self.n_nodes, dtype=bool)
        for r, (left, right, h) in enumerate(self.merges):
            left, right = int(left), int(right)
            node = self.n_leaves + r
            for c in (left, right):
                if c >= node:
                    raise ValueError(f"merge {r} references later node {c}")
                if seen[c]:
                    raise ValueError(f"node {c} merged twice")
                seen[c] = True
                if self.height(c) > h + 1e-9:
                    raise ValueError(
                        f"height not monotone at merge {r}: child {c} has "
                        f"{self.height(c)} > parent {h}"
                    )
        if len(self.roots()) != 1:
            raise ValueError("dendrogram is not a single tree")

    # -------------------------------------------------------------------- cut
    def cut_k(self, k: int) -> np.ndarray:
        """Labels (0..k-1) after cutting into exactly ``k`` clusters.

        Splits the highest node first (ties: the later-created node —
        i.e. the larger id — splits first, which in DBHT corresponds to
        splitting the coarser level first). Cluster labels are renumbered
        by each cluster's smallest leaf for determinism.
        """
        if not 1 <= k <= self.n_leaves:
            raise ValueError(f"k={k} out of range [1, {self.n_leaves}]")
        # max-heap by (height, node id)
        heap = [(-self.height(r), -r) for r in self.roots()]
        heapq.heapify(heap)
        clusters: List[int] = []
        while heap and len(heap) + len(clusters) < k:
            negh, negnode = heapq.heappop(heap)
            node = -negnode
            if node < self.n_leaves:
                clusters.append(node)  # leaf: cannot split further
                continue
            left, right = self.children(node)
            heapq.heappush(heap, (-self.height(left), -left))
            heapq.heappush(heap, (-self.height(right), -right))
        clusters.extend(-neg for _, neg in heap)
        labels = np.empty(self.n_leaves, dtype=np.int64)
        reps = sorted(clusters, key=lambda c: int(self.leaves_under(c)[0]))
        for ci, node in enumerate(reps):
            labels[self.leaves_under(node)] = ci
        return labels


def from_linkage(Z: np.ndarray, n_leaves: int) -> Dendrogram:
    """Dendrogram from a linkage matrix (heights = merge distances)."""
    return Dendrogram(n_leaves, Z[:, :3].copy() if len(Z) else np.empty((0, 3)))
