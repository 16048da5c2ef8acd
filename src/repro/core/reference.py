"""Reference implementations used to cross-validate the paper's algorithms.

Everything here favors obviousness over speed: the brute-force decomposition
recomputes each (k,h)-core independently from the *definition* (maximal
subgraph where every vertex has h-degree >= k), so agreement with h-BZ /
h-LB / h-LB+UB is a genuine correctness check, not a tautology.
"""
from __future__ import annotations

import numpy as np

from repro.core.kernels import all_h_degrees, distance_matrix
from repro.graphs.graph import Graph


def kh_core_members(g: Graph, h: int, k: int) -> np.ndarray:
    """Boolean mask of the (k,h)-core, by definitional fix-point from V."""
    A = g.adjacency
    alive = np.ones(g.n, dtype=bool)
    while True:
        degs = all_h_degrees(A, alive, h)
        drop = alive & (degs < k)
        if not drop.any():
            return alive
        alive &= ~drop


def brute_force_cores(g: Graph, h: int) -> np.ndarray:
    """Per-vertex core index: max k such that v is in the (k,h)-core."""
    core = np.zeros(g.n, dtype=np.int64)
    k = 1
    while True:
        members = kh_core_members(g, h, k)
        if not members.any():
            return core
        core[members] = k
        k += 1


def classic_core_decomposition(g: Graph) -> np.ndarray:
    """Textbook Batagelj–Zaveršnik (h=1) with a flat degree array.

    Independent of the bucket/kernel machinery — used to check that the
    distance-generalized algorithms at h=1 reduce to the classic case.
    """
    n = g.n
    A = g.adjacency
    deg = g.degrees.copy()
    alive = np.ones(n, dtype=bool)
    core = np.zeros(n, dtype=np.int64)
    k = 0
    for _ in range(n):
        ids = np.flatnonzero(alive)
        if len(ids) == 0:
            break
        v = int(ids[np.argmin(deg[ids])])
        k = max(k, int(deg[v]))
        core[v] = k
        alive[v] = False
        deg[A[v] & alive] -= 1
    return core


def power_graph(g: Graph, h: int) -> Graph:
    """The h-power G^h: same vertices, edges between pairs at distance <= h."""
    dist = distance_matrix(g.adjacency)
    close = (dist >= 1) & (dist <= h)
    us, vs = np.nonzero(np.triu(close, k=1))
    return Graph.from_edges(g.n, np.stack([us, vs], axis=1))
