"""PMFG baseline (Tumminello et al. 2005): greedy planar edge insertion.

Edges are considered in decreasing-weight order and kept iff the graph
stays planar, checked by the left-right planarity substrate
(``repro.graphs.planarity``). The loop stops once the graph is maximal
planar (``3n - 6`` edges). This is the Theta(n^2)-planarity-tests
construction the paper uses as the slow baseline; like the paper (which
reports PMFG timing out on its three largest data sets) we support a time
budget and report a timeout by returning ``None``.
"""
from __future__ import annotations

import time
from typing import List, Optional, Tuple

import numpy as np

from repro.graphs.planarity import is_planar


def pmfg(S: np.ndarray, time_budget_s: Optional[float] = None) -> Optional[np.ndarray]:
    """Edge list ``(3n-6, 2)`` of the PMFG, or ``None`` on timeout.

    Ties in edge weight break lexicographically on (i, j) so the result is
    deterministic.
    """
    S = np.asarray(S, dtype=np.float64)
    n = S.shape[0]
    if n < 3:
        raise ValueError("PMFG needs at least 3 vertices")
    iu, ju = np.triu_indices(n, k=1)
    w = S[iu, ju]
    order = np.lexsort((ju, iu, -w))  # weight desc, then (i, j) asc
    target = 3 * n - 6
    edges: List[Tuple[int, int]] = []
    deadline = None if time_budget_s is None else time.monotonic() + time_budget_s
    for idx in order:
        u, v = int(iu[idx]), int(ju[idx])
        edges.append((u, v))
        # Graphs with < 9 edges can't contain K5 or K3,3: skip the test.
        if len(edges) >= 9 and not is_planar(n, edges):
            edges.pop()
        if len(edges) == target:
            return np.array(sorted(edges), dtype=np.int64)
        if deadline is not None and time.monotonic() > deadline:
            return None
    # Fewer than 3n-6 edges can only happen for degenerate tiny inputs.
    return np.array(sorted(edges), dtype=np.int64)
