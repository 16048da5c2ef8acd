"""Lower and upper bounds on the (k,h)-core index (paper §4.2, §4.4).

    LB1(v) = deg^{⌊h/2⌋}(v)                                  (Observation 1)
    LB2(v) = max(LB1(u) : d(u,v) <= ⌈h/2⌉) ∪ {LB1(v)}        (Observation 2)
    UB(v)  = classic core index of the implicit power graph G^h (Algorithm 5)

All bounds are computed on the full graph G[V]. ``batch_h_degrees`` is the
block the paper multithreads (§4.6); passing a SparkSession fans the h-BFS
batch out over the cluster via mapInPandas (see repro.pregel.hdegree).
"""
from __future__ import annotations

import numpy as np

from repro.core.buckets import Buckets
from repro.core.kernels import Counter, all_h_degrees, bounded_reach


def batch_h_degrees(
    A: np.ndarray,
    alive: np.ndarray,
    h: int,
    counter: Counter | None = None,
    spark=None,
) -> np.ndarray:
    """h-degrees of every alive vertex; Spark-parallel when a session is given."""
    if spark is not None:
        from repro.pregel.hdegree import h_degrees_spark

        degs, visits, calls = h_degrees_spark(spark, A, alive, h)
        if counter is not None:
            counter.merge_batch(visits, calls)
        return degs
    return all_h_degrees(A, alive, h, counter)


def lower_bounds(
    A: np.ndarray,
    h: int,
    counter: Counter | None = None,
    spark=None,
) -> tuple[np.ndarray, np.ndarray]:
    """Compute (LB1, LB2) for every vertex on the full graph.

    For h=1 both bounds degenerate to 0 (⌊1/2⌋ = 0): h-LB then behaves like
    h-BZ with one extra recomputation per vertex, matching the paper's scope
    (its bounds target h > 1).
    """
    n = A.shape[0]
    alive = np.ones(n, dtype=bool)
    h_lo = h // 2
    h_hi = (h + 1) // 2
    if h_lo == 0:
        lb1 = np.zeros(n, dtype=np.int64)
    else:
        lb1 = batch_h_degrees(A, alive, h_lo, counter, spark)
    lb2 = lb1.copy()
    for v in range(n):
        reached, _ = bounded_reach(A, v, alive, h_hi, counter)
        if reached.any():
            lb2[v] = max(lb1[v], int(lb1[reached].max()))
    return lb1, lb2


def upper_bound(
    A: np.ndarray,
    h: int,
    counter: Counter | None = None,
    init_h_degrees: np.ndarray | None = None,
    spark=None,
) -> np.ndarray:
    """Algorithm 5: UB(v) = core index of v in the (implicit) power graph G^h.

    The power graph is never materialized: each deletion re-runs one h-BFS
    to find the neighbors whose approximated h-degree drops by exactly 1.
    Since a real deletion can drop h-degrees by more than 1, the result is an
    upper bound on the true (k,h)-core index, not the core index itself.

    Args:
        init_h_degrees: optional precomputed deg^h on the full graph (reused
            by h-LB+UB so the batch is not paid twice).
    """
    n = A.shape[0]
    alive = np.ones(n, dtype=bool)
    if init_h_degrees is None:
        ubdeg = batch_h_degrees(A, alive, h, counter, spark).copy()
    else:
        ubdeg = np.asarray(init_h_degrees, dtype=np.int64).copy()
    bk = Buckets(n)
    for v in range(n):
        bk.add(v, int(ubdeg[v]))
    ub = np.zeros(n, dtype=np.int64)
    for k in range(n + 1):
        while bk.nonempty(k):
            v = bk.pop(k)
            ub[v] = k
            reached, _ = bounded_reach(A, v, alive, h, counter)
            alive[v] = False
            for u in np.flatnonzero(reached):
                ubdeg[u] -= 1
                bk.move(int(u), max(int(ubdeg[u]), k))
    return ub


def h_degree_as_ub(
    A: np.ndarray, h: int, counter: Counter | None = None, spark=None
) -> np.ndarray:
    """The baseline upper bound of §6.3: a vertex's h-degree in G."""
    n = A.shape[0]
    return batch_h_degrees(A, np.ones(n, dtype=bool), h, counter, spark)
