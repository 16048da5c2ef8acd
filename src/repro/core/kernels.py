"""Instrumented h-bounded BFS kernels.

The paper's efficiency metric (Table 3) is "the total number of computed
point-to-point distances (i.e., the total number of possibly repeated
vertices visited in all h-bfs)". Every kernel here charges that count to a
:class:`Counter`, which can also enforce a visit budget and a wall-clock
deadline so that the paper's "NT" (did-not-terminate) cells can be
reproduced deterministically instead of waiting 20 hours.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np


class BudgetExceeded(RuntimeError):
    """Raised by :class:`Counter` when a visit budget or deadline is hit."""


@dataclass
class Counter:
    """Accumulates BFS work; optionally enforces budgets.

    Attributes:
        visits: total (possibly repeated) alive vertices scanned across all
            h-BFS traversals — the paper's "point-to-point distances".
        bfs_calls: number of h-BFS traversals executed.
        visit_budget: raise :class:`BudgetExceeded` once ``visits`` passes this.
        deadline: absolute ``time.monotonic()`` deadline, checked per BFS.
    """

    visits: int = 0
    bfs_calls: int = 0
    visit_budget: int | None = None
    deadline: float | None = None

    def charge(self, visits: int) -> None:
        """Record one BFS traversal that scanned ``visits`` vertices."""
        self.visits += int(visits)
        self.bfs_calls += 1
        if self.visit_budget is not None and self.visits > self.visit_budget:
            raise BudgetExceeded(f"visit budget exceeded: {self.visits}")
        if self.deadline is not None and time.monotonic() > self.deadline:
            raise BudgetExceeded("wall-clock budget exceeded")

    def merge_batch(self, visits: int, bfs_calls: int) -> None:
        """Fold in work done remotely (e.g. by Spark tasks)."""
        self.visits += int(visits)
        self.bfs_calls += int(bfs_calls)
        if self.visit_budget is not None and self.visits > self.visit_budget:
            raise BudgetExceeded(f"visit budget exceeded: {self.visits}")
        if self.deadline is not None and time.monotonic() > self.deadline:
            raise BudgetExceeded("wall-clock budget exceeded")


def bounded_reach(
    A: np.ndarray,
    v: int,
    alive: np.ndarray,
    h: int,
    counter: Counter | None = None,
) -> tuple[np.ndarray, np.ndarray]:
    """h-bounded BFS from ``v`` over the subgraph induced by ``alive``.

    Args:
        A: dense boolean adjacency matrix.
        v: source vertex (its own ``alive`` flag is irrelevant: it is the
           source, never an intermediate of its own shortest paths).
        alive: boolean mask of vertices that may be reached / traversed.
        h: distance threshold (h >= 0).
        counter: optional instrumentation.

    Returns:
        ``(reached, at_h)``: boolean masks of the vertices ``u != v`` with
        ``d(v, u) <= h``, and of those with ``d(v, u) == h`` exactly. The
        ``at_h`` mask backs Algorithm 3's line-17 optimization (a neighbor at
        distance exactly ``h`` loses exactly 1 from its h-degree when ``v``
        is deleted, because ``v`` cannot be interior to any of its <=h paths).
    """
    n = A.shape[0]
    if h <= 0:
        empty = np.zeros(n, dtype=bool)
        if counter is not None:
            counter.charge(0)
        return empty, empty.copy()
    frontier = A[v] & alive
    frontier[v] = False
    visits = int(frontier.sum())
    reached = frontier.copy()
    level = 1
    while level < h and frontier.any():
        rows = A[np.flatnonzero(frontier)]
        scan = rows & alive
        visits += int(scan.sum())
        nxt = scan.any(axis=0)
        nxt &= ~reached
        nxt[v] = False
        reached |= nxt
        frontier = nxt
        level += 1
    if counter is not None:
        counter.charge(visits)
    at_h = frontier if level == h else np.zeros(n, dtype=bool)
    return reached, at_h


def h_degree(
    A: np.ndarray, v: int, alive: np.ndarray, h: int, counter: Counter | None = None
) -> int:
    """Size of the h-neighborhood of ``v`` in the alive-induced subgraph."""
    reached, _ = bounded_reach(A, v, alive, h, counter)
    return int(reached.sum())


def all_h_degrees(
    A: np.ndarray,
    alive: np.ndarray,
    h: int,
    counter: Counter | None = None,
    vertices: np.ndarray | None = None,
) -> np.ndarray:
    """h-degrees of ``vertices`` (default: every alive vertex).

    Returns a full-length int64 array; entries for vertices not computed
    are 0. This is the batch the paper parallelizes in §4.6 — the Spark
    fan-out lives in :mod:`repro.pregel.hdegree` and produces identical
    values (tested).
    """
    n = A.shape[0]
    out = np.zeros(n, dtype=np.int64)
    vs = np.flatnonzero(alive) if vertices is None else np.asarray(vertices)
    for v in vs:
        out[v] = h_degree(A, int(v), alive, h, counter)
    return out


def distance_matrix(A: np.ndarray, alive: np.ndarray | None = None) -> np.ndarray:
    """All-pairs shortest-path distances over the alive-induced subgraph.

    Returns an ``(n, n)`` int32 matrix with -1 for unreachable pairs and for
    any pair involving a dead vertex; diagonal is 0 for alive vertices.
    Intended for the small graphs used in tests, metrics, clubs and landmarks.
    """
    n = A.shape[0]
    if alive is None:
        alive = np.ones(n, dtype=bool)
    dist = np.full((n, n), -1, dtype=np.int32)
    for v in np.flatnonzero(alive):
        dist[v, v] = 0
        frontier = A[v] & alive
        d = 1
        reached = frontier.copy()
        reached[v] = True
        while frontier.any():
            dist[v, frontier] = d
            rows = A[np.flatnonzero(frontier)]
            nxt = (rows & alive).any(axis=0) & ~reached
            reached |= nxt
            frontier = nxt
            d += 1
    return dist


def timed_deadline(seconds: float | None) -> float | None:
    """Absolute monotonic deadline ``seconds`` from now (None passes through)."""
    return None if seconds is None else time.monotonic() + seconds
