"""Algorithm 2 — h-LB: peeling with per-vertex lower bounds.

Each vertex starts bucketed at a lower bound on its core index (LB2 by
default, LB1 or none for the Table 5 ablations); its h-degree is computed
lazily, only when the peel front reaches the bound. This skips the h-degree
re-computations that dominate h-BZ.
"""
from __future__ import annotations

import time
from typing import Literal

import numpy as np

from repro.core.buckets import Buckets
from repro.core.bounds import batch_h_degrees, lower_bounds
from repro.core.decomp import core_decomp
from repro.core.kernels import Counter
from repro.core.types import CoreResult
from repro.graphs.graph import Graph

LowerBoundKind = Literal["lb2", "lb1", "none"]


def h_lb(
    g: Graph,
    h: int,
    counter: Counter | None = None,
    spark=None,
    lb: LowerBoundKind = "lb2",
) -> CoreResult:
    """Exact (k,h)-core decomposition with lower-bound lazy bucketing.

    Args:
        lb: which lower bound seeds the buckets — "lb2" (the paper's h-LB),
            "lb1" (Table 5 ablation), or "none" (every vertex starts at 0;
            degenerates to h-BZ plus one lazy recomputation per vertex).
    """
    t0 = time.monotonic()
    counter = counter if counter is not None else Counter()
    A = g.adjacency
    n = g.n
    if lb == "none":
        lb_vec = np.zeros(n, dtype=np.int64)
    else:
        lb1, lb2 = lower_bounds(A, h, counter, spark)
        lb_vec = lb2 if lb == "lb2" else lb1
    bk = Buckets(n)
    setlb = np.ones(n, dtype=bool)
    for v in range(n):
        bk.add(v, int(lb_vec[v]))
    alive = np.ones(n, dtype=bool)
    core = np.zeros(n, dtype=np.int64)
    assigned = np.zeros(n, dtype=bool)
    deg = np.zeros(n, dtype=np.int64)
    order: list[int] = []
    core_decomp(
        A, h, kmin=0, kmax=n, bk=bk, setlb=setlb, alive=alive,
        core=core, assigned=assigned, deg=deg, counter=counter, order=order,
    )
    return CoreResult(
        core=core,
        h=h,
        algo=f"h-LB[{lb}]" if lb != "lb2" else "h-LB",
        visits=counter.visits,
        bfs_calls=counter.bfs_calls,
        runtime_s=time.monotonic() - t0,
        order=order,
        extra={"lb": lb_vec},
    )
