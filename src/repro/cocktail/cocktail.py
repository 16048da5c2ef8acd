"""Distance-generalized cocktail party (paper Appendix B, Problem 2).

Given query vertices Q, find a connected vertex set containing Q that
maximizes the minimum h-degree. The optimum is the connected component,
within the (k,h)-core of largest k, that contains all of Q — found by
descending k from the h-degeneracy (the paper adapts h-LB+UB's top-down
sweep; we reuse a finished decomposition, which is equivalent).
"""
from __future__ import annotations

import numpy as np

from repro.core import h_lb_ub
from repro.core.types import CoreResult
from repro.graphs.graph import Graph


def _component_of(A: np.ndarray, mask: np.ndarray, start: int) -> np.ndarray:
    """Connected component of ``start`` inside the induced subgraph."""
    frontier = np.zeros(A.shape[0], dtype=bool)
    frontier[start] = True
    seen = frontier.copy()
    while frontier.any():
        nxt = A[np.flatnonzero(frontier)].any(axis=0) & mask & ~seen
        seen |= nxt
        frontier = nxt
    return seen


def cocktail_party(
    g: Graph,
    query: list[int],
    h: int,
    decomposition: CoreResult | None = None,
) -> tuple[np.ndarray, int]:
    """Solve Problem 2; returns (solution mask, its guaranteed min h-degree k).

    Returns an empty mask with k = -1 when the query vertices are not
    connected even in the 0-core (i.e., not in one component of G).
    """
    if decomposition is None:
        decomposition = h_lb_ub(g, h)
    core = decomposition.core
    q = np.asarray(query, dtype=np.int64)
    k_max = int(core[q].min())  # Q must survive in the core, so k <= min core(Q)
    A = g.adjacency
    for k in range(k_max, -1, -1):
        mask = core >= k
        comp = _component_of(A, mask, int(q[0]))
        if mask[q].all() and comp[q].all():
            return comp, k
    return np.zeros(g.n, dtype=bool), -1
