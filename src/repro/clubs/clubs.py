"""Exact maximum h-club solvers (substitutes for Gurobi-based DBC/ITDBC [45]).

An h-club is a vertex set S whose *induced* subgraph has diameter <= h
(Definition 5). h-clubs are not hereditary, so branch-and-bound works on the
complement direction: while the candidate set S has a pair u,w with
d_{G[S]}(u, w) > h, any h-club inside S excludes u or w — branch on the two
exclusions. When no far pair remains, S itself is an h-club.

``max_h_club_dbc`` runs that B&B on each whole connected component — like
DBC's single monolithic IP, it blows up on large sparse graphs (reproduced
via a node budget -> NodeBudgetExceeded, the analogue of the paper's OM/NT
cells). ``max_h_club_itdbc`` decomposes per vertex neighborhood with
incumbent pruning — like ITDBC it survives large graphs. Both are exact.
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.kernels import bounded_reach
from repro.graphs.graph import Graph


class NodeBudgetExceeded(RuntimeError):
    """B&B exceeded its node budget (reproduces the paper's NT/OM cells)."""

    def __init__(self, incumbent: np.ndarray):
        super().__init__("branch-and-bound node budget exceeded")
        self.incumbent = incumbent


def _far_pair(A: np.ndarray, mask: np.ndarray, h: int) -> tuple[int, int] | None:
    """Some pair u,w in mask with d_{G[mask]}(u,w) > h, or None (=> h-club)."""
    ids = np.flatnonzero(mask)
    for u in ids:
        reached, _ = bounded_reach(A, int(u), mask, h)
        missing = mask & ~reached
        missing[u] = False
        if missing.any():
            return int(u), int(np.flatnonzero(missing)[0])
    return None


def is_h_club(A: np.ndarray, mask: np.ndarray, h: int) -> bool:
    """True iff the induced subgraph of ``mask`` has diameter <= h."""
    if int(mask.sum()) <= 1:
        return True
    return _far_pair(A, mask, h) is None


def _far_counts(A: np.ndarray, mask: np.ndarray, h: int) -> np.ndarray:
    """Per-vertex count of >h-distant partners inside the induced subgraph."""
    n = A.shape[0]
    cnt = np.zeros(n, dtype=np.int64)
    size = int(mask.sum())
    for u in np.flatnonzero(mask):
        reached, _ = bounded_reach(A, int(u), mask, h)
        cnt[u] = size - 1 - int((reached & mask).sum())
    return cnt


def drop_heuristic(
    A: np.ndarray, mask: np.ndarray, h: int, max_iter: int | None = None
) -> np.ndarray:
    """Feasible h-club by repeatedly dropping the vertex with most far pairs.

    Classic DROP heuristic (Bourjolly et al.). Each iteration costs |S|
    h-BFS traversals, so callers cap ``max_iter`` on large sets; if the cap
    is hit the (always feasible) star incumbent is returned instead.
    """
    cur = mask.copy()
    iters = 0
    while int(cur.sum()) > 1:
        cnt = _far_counts(A, cur, h)
        cnt[~cur] = -1
        worst = int(np.argmax(cnt))
        if cnt[worst] <= 0:
            return cur
        cur[worst] = False
        iters += 1
        if max_iter is not None and iters >= max_iter:
            return star_incumbent(A, mask, h)
    return cur


def star_incumbent(A: np.ndarray, mask: np.ndarray, h: int) -> np.ndarray:
    """The best *star* inside ``mask``: a max-degree vertex plus its alive
    neighbors. For h >= 2 a star is always an h-club (any two leaves meet
    through the center), and for h = 2 it is often optimal in hub-skewed
    graphs — the paper's h=2 club sizes are ~ max degree + 1.
    """
    n = A.shape[0]
    out = np.zeros(n, dtype=bool)
    ids = np.flatnonzero(mask)
    if len(ids) == 0:
        return out
    if h < 2:
        # h=1 club = clique; a single edge is the safe incumbent.
        for u in ids:
            nb = np.flatnonzero(A[u] & mask)
            if len(nb):
                out[u] = out[int(nb[0])] = True
                return out
        out[int(ids[0])] = True
        return out
    deg_in = (A[ids][:, mask]).sum(axis=1)
    center = int(ids[int(np.argmax(deg_in))])
    out[center] = True
    out |= A[center] & mask
    return out


def _components(A: np.ndarray, mask: np.ndarray) -> list[np.ndarray]:
    """Connected components of the induced subgraph, as boolean masks."""
    comps = []
    todo = mask.copy()
    while todo.any():
        v = int(np.flatnonzero(todo)[0])
        frontier = np.zeros(A.shape[0], dtype=bool)
        frontier[v] = True
        seen = frontier.copy()
        while frontier.any():
            nxt = A[np.flatnonzero(frontier)].any(axis=0) & todo & ~seen
            seen |= nxt
            frontier = nxt
        comps.append(seen)
        todo &= ~seen
    return comps


def _kernelize(
    A: np.ndarray, S: np.ndarray, h: int, lower: int
) -> tuple[np.ndarray, np.ndarray]:
    """Peel S down to vertices that could belong to a club larger than the
    incumbent (Theorem-3-style pruning, applied at every B&B node).

    Every member of an h-club of size > ``lower`` has >= ``lower``
    h-neighbors inside the club, hence inside S. Peeling uses the sound
    decrement approximation (a deletion decrements its h-neighbors by one,
    an *upper bound* on their true h-degree — if even the upper bound falls
    below ``lower`` the vertex certainly cannot participate).

    Returns the peeled mask and the (approximate) h-degrees within it.
    """
    S = S.copy()
    degs = np.zeros(A.shape[0], dtype=np.int64)
    ids = np.flatnonzero(S)
    neigh: dict[int, np.ndarray] = {}
    for v in ids:
        reached, _ = bounded_reach(A, int(v), S, h)
        neigh[int(v)] = reached
        degs[v] = int(reached.sum())
    stack = [int(v) for v in ids if degs[v] < lower]
    queued = set(stack)
    while stack:
        v = stack.pop()
        if not S[v]:
            continue
        S[v] = False
        for u in np.flatnonzero(neigh[v] & S):
            u = int(u)
            degs[u] -= 1
            if degs[u] < lower and u not in queued:
                queued.add(u)
                stack.append(u)
    return S, degs


def _far_pair_from_degs(
    A: np.ndarray, S: np.ndarray, h: int, degs: np.ndarray
) -> tuple[int, int] | None:
    """Far pair scan, trying the smallest-h-degree vertices first (they are
    the most likely to have a >h-distant partner, so the scan exits early)."""
    ids = np.flatnonzero(S)
    for u in ids[np.argsort(degs[ids])]:
        reached, _ = bounded_reach(A, int(u), S, h)
        missing = S & ~reached
        missing[u] = False
        if missing.any():
            return int(u), int(np.flatnonzero(missing)[0])
    return None


def _bnb(
    A: np.ndarray,
    start: np.ndarray,
    h: int,
    best: np.ndarray,
    budget: list[int],
    deadline: float | None = None,
) -> np.ndarray:
    """Depth-first far-pair branch-and-bound with per-node kernelization.

    ``budget`` is a single-element mutable node counter shared across calls;
    raising NodeBudgetExceeded carries the incumbent for NT reporting.
    ``deadline`` (absolute ``time.monotonic()``) is the wall-clock analogue.
    """
    stack = [start]
    while stack:
        S = stack.pop()
        if int(S.sum()) <= int(best.sum()):
            continue  # cannot beat the incumbent
        budget[0] -= 1
        if budget[0] < 0:
            raise NodeBudgetExceeded(best)
        if deadline is not None and time.monotonic() > deadline:
            raise NodeBudgetExceeded(best)
        S, degs = _kernelize(A, S, h, lower=int(best.sum()))
        if int(S.sum()) <= int(best.sum()):
            continue
        pair = _far_pair_from_degs(A, S, h, degs)
        if pair is None:
            best = S
            continue
        u, w = pair
        s1 = S.copy()
        s1[u] = False
        s2 = S.copy()
        s2[w] = False
        stack.append(s1)
        stack.append(s2)
    return best


def max_h_club_dbc(
    g: Graph,
    h: int,
    mask: np.ndarray | None = None,
    node_budget: int = 2_000_000,
    incumbent: np.ndarray | None = None,
    deadline: float | None = None,
) -> np.ndarray:
    """Exact maximum h-club by whole-component branch-and-bound (DBC analogue).

    Returns the boolean membership mask of a maximum h-club within ``mask``
    (default: the full graph). Raises NodeBudgetExceeded on blow-up.
    """
    A = g.adjacency
    full = np.ones(g.n, dtype=bool) if mask is None else mask.copy()
    best = incumbent.copy() if incumbent is not None else np.zeros(g.n, dtype=bool)
    if not best.any() and full.any():
        best = np.zeros(g.n, dtype=bool)
        best[int(np.flatnonzero(full)[0])] = True
    budget = [node_budget]
    comps = sorted(_components(A, full), key=lambda c: -int(c.sum()))
    for comp in comps:
        if int(comp.sum()) <= int(best.sum()):
            break
        seed = star_incumbent(A, comp, h)
        if int(seed.sum()) > int(best.sum()):
            best = seed
        if int(comp.sum()) <= 64:
            seed = drop_heuristic(A, comp, h, max_iter=64)
            if int(seed.sum()) > int(best.sum()):
                best = seed
        best = _bnb(A, comp, h, best, budget, deadline)
    return best


def max_h_club_itdbc(
    g: Graph,
    h: int,
    mask: np.ndarray | None = None,
    node_budget: int = 2_000_000,
    incumbent: np.ndarray | None = None,
    deadline: float | None = None,
) -> np.ndarray:
    """Exact maximum h-club by per-vertex decomposition (ITDBC analogue).

    Any h-club containing v lies inside v's closed h-neighborhood N_h[v]
    (induced distance >= graph distance). Iterate vertices by decreasing
    h-degree, solve the B&B restricted to N_h[v] with the global incumbent
    for pruning, and stop as soon as no remaining neighborhood can beat it.
    """
    A = g.adjacency
    full = np.ones(g.n, dtype=bool) if mask is None else mask.copy()
    best = incumbent.copy() if incumbent is not None else np.zeros(g.n, dtype=bool)
    ids = np.flatnonzero(full)
    if len(ids) == 0:
        return best
    if not best.any():
        best = star_incumbent(A, full, h)
    hdeg = np.zeros(g.n, dtype=np.int64)
    neigh: dict[int, np.ndarray] = {}
    for v in ids:
        reached, _ = bounded_reach(A, int(v), full, h)
        neigh[int(v)] = reached
        hdeg[v] = int(reached.sum())
    order = ids[np.argsort(-hdeg[ids])]
    budget = [node_budget]
    for v in order:
        v = int(v)
        if hdeg[v] + 1 <= int(best.sum()):
            break  # sorted descending: nothing below can beat the incumbent
        if deadline is not None and time.monotonic() > deadline:
            raise NodeBudgetExceeded(best)
        cand = neigh[v].copy()
        cand[v] = True
        cand &= full
        if int(cand.sum()) <= 64:
            seed = drop_heuristic(A, cand, h, max_iter=64)
            if int(seed.sum()) > int(best.sum()):
                best = seed
        best = _bnb(A, cand, h, best, budget, deadline)
    return best
