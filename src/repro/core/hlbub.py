"""Algorithms 4–6 — h-LB+UB: upper-bound partitioned, top-down decomposition.

An upper bound UB(v) (classic core index of the implicit power graph G^h,
Algorithm 5) splits the computation into totally independent sub-computations
over contiguous core-index intervals. Intervals are visited top-down so that
the expensive high-core vertices are finished early; inside each interval a
tighter lower bound LB3 (Algorithm 6, via Property 3) plus a cheap
decrement-based cleaning pass shrink the work further.

Two execution modes reproduce the paper's §4.6 multithreading options:

- ``parallel="hdegree"`` (paper's shipped choice): the batch h-degree
  computations fan out over Spark via mapInPandas; the interval sweep stays
  sequential and top-down, keeping the knowledge-reuse benefits.
- ``parallel="intervals"`` (paper's option 1): each interval runs as an
  independent Spark task (applyInPandas over the interval DataFrame); the
  top-down knowledge (already-assigned cores, accumulated LB3) is forfeited,
  which is exactly the trade-off the paper describes.
"""
from __future__ import annotations

import time
from typing import Literal

import numpy as np

from repro.core.buckets import Buckets
from repro.core.bounds import batch_h_degrees, lower_bounds, upper_bound
from repro.core.decomp import core_decomp
from repro.core.kernels import Counter, bounded_reach
from repro.core.types import CoreResult
from repro.graphs.graph import Graph, pack_adjacency, unpack_adjacency

ParallelMode = Literal["none", "hdegree", "intervals"]


def build_intervals(ub: np.ndarray, lb2: np.ndarray, s: int) -> list[tuple[int, int]]:
    """Partition [min LB2, max UB] into intervals of S contiguous UB values.

    Follows Algorithm 4 lines 8–11 and reproduces Example 4:
    U = {5,10,15,20,25,30}, lb0 = 3, S = 2 -> [(21,30), (11,20), (3,10)].

    Returns (kmin, kmax) pairs in top-down (descending) order.
    """
    lb0 = int(lb2.min()) if len(lb2) else 0
    u_vals = sorted(set(int(x) for x in ub) | {lb0 - 1}, reverse=True)
    intervals: list[tuple[int, int]] = []
    for i in range(0, len(u_vals) - 1, max(1, s)):
        kmax = u_vals[i]
        kmin = u_vals[min(i + max(1, s), len(u_vals) - 1)] + 1
        intervals.append((kmin, kmax))
    if not intervals:  # single UB value equal to lb0-1 cannot happen (UB>=LB2>lb0-1)
        intervals = [(max(0, lb0), int(ub.max()) if len(ub) else 0)]
    return intervals


def improve_lb(
    A: np.ndarray,
    h: int,
    vk: np.ndarray,
    kmin: int,
    lb2: np.ndarray,
    counter: Counter | None = None,
    spark=None,
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Algorithm 6 — ImproveLB: clean V[k] and tighten the lower bound.

    Computes h-degrees on G[V[k]]; LB3(v) = max(LB2(v), min h-degree over
    V[k]) by Property 3 (computed before cleaning, as in the paper); then
    iteratively drops vertices whose *decrement-approximated* h-degree falls
    below kmin — each deletion only decrements its h-neighbors by 1, giving
    an upper bound on their true h-degree, so any vertex dropping below kmin
    certainly does not belong to the partition.

    Returns ``(vk, lb3, degs)``: the cleaned mask, per-vertex LB3 (0 outside
    V[k]), and the (approximate, post-cleaning) h-degree scratch array.
    """
    n = A.shape[0]
    vk = vk.copy()
    degs = batch_h_degrees(A, vk, h, counter, spark)
    lb3 = np.zeros(n, dtype=np.int64)
    ids = np.flatnonzero(vk)
    if len(ids) == 0:
        return vk, lb3, degs
    min_deg = int(degs[ids].min())
    lb3[ids] = np.maximum(lb2[ids], min_deg)
    stack = [int(v) for v in ids if degs[v] < kmin]
    queued = np.zeros(n, dtype=bool)
    queued[[v for v in stack]] = True
    while stack:
        v = stack.pop()
        if not vk[v]:
            continue
        vk[v] = False
        reached, _ = bounded_reach(A, v, vk, h, counter)
        for u in np.flatnonzero(reached):
            u = int(u)
            degs[u] -= 1
            if degs[u] < kmin and vk[u] and not queued[u]:
                queued[u] = True
                stack.append(u)
    return vk, lb3, degs


def _run_interval(
    A: np.ndarray,
    h: int,
    kmin: int,
    kmax: int,
    ub: np.ndarray,
    lb2: np.ndarray,
    core: np.ndarray,
    assigned: np.ndarray,
    lb3_acc: np.ndarray,
    counter: Counter | None,
    spark=None,
) -> None:
    """Process one partition (Algorithm 4 lines 12–18); mutates core/assigned."""
    n = A.shape[0]
    vk = ub >= kmin
    vk, lb3_star, _ = improve_lb(A, h, vk, kmin, lb2, counter, spark)
    ids = np.flatnonzero(vk)
    if len(ids) == 0:
        return
    lb3_acc[ids] = np.maximum(lb3_acc[ids], lb3_star[ids])
    bk = Buckets(n)
    setlb = np.ones(n, dtype=bool)
    for v in ids:
        v = int(v)
        base = int(core[v]) if assigned[v] else 0
        bk.add(v, max(base, int(lb3_acc[v]), kmin - 1, 0))
    alive = vk.copy()
    deg = np.zeros(n, dtype=np.int64)
    core_decomp(
        A, h, kmin=kmin, kmax=kmax, bk=bk, setlb=setlb, alive=alive,
        core=core, assigned=assigned, deg=deg, counter=counter,
    )


def h_lb_ub(
    g: Graph,
    h: int,
    s: int | None = None,
    counter: Counter | None = None,
    spark=None,
    parallel: ParallelMode = "none",
    ub_kind: Literal["ub", "hdegree"] = "ub",
) -> CoreResult:
    """Exact (k,h)-core decomposition with lower+upper bounds (Algorithm 4).

    Args:
        s: partition size S — how many contiguous upper-bound values each
           interval covers. ``None`` (default) picks S adaptively so the
           sweep has ~12 partitions: the paper leaves S as an input
           parameter, and a fixed small S degenerates on graphs with many
           distinct upper-bound values (each partition pays an ImproveLB
           batch scan of its subgraph).
        parallel: "none" (pure driver), "hdegree" (Spark fans out the batch
           h-degree computations; requires ``spark``), or "intervals"
           (independent interval sub-computations as Spark tasks).
        ub_kind: "ub" = Algorithm 5's power-graph bound (the paper's h-LB+UB);
           "hdegree" = the plain h-degree baseline bound (Table 5 ablation).
    """
    t0 = time.monotonic()
    counter = counter if counter is not None else Counter()
    A = g.adjacency
    n = g.n
    spark_for_batches = spark if parallel == "hdegree" else None
    deg0 = batch_h_degrees(A, np.ones(n, dtype=bool), h, counter, spark_for_batches)
    _, lb2 = lower_bounds(A, h, counter, spark_for_batches)
    if ub_kind == "ub":
        ub = upper_bound(A, h, counter, init_h_degrees=deg0, spark=spark_for_batches)
    else:
        ub = deg0.copy()
    if s is None:
        n_ub_values = len(set(int(x) for x in ub))
        s = max(1, -(-n_ub_values // 12))  # ceil division: ~12 partitions
    intervals = build_intervals(ub, lb2, s)

    if parallel == "intervals":
        if spark is None:
            raise ValueError("parallel='intervals' requires a SparkSession")
        core, n_tasks = _run_intervals_spark(spark, g, h, intervals, ub, lb2)
        return CoreResult(
            core=core, h=h, algo="h-LB+UB[spark-intervals]",
            visits=counter.visits, bfs_calls=counter.bfs_calls,
            runtime_s=time.monotonic() - t0,
            extra={"intervals": intervals, "tasks": n_tasks, "ub": ub, "lb2": lb2},
        )

    core = np.zeros(n, dtype=np.int64)
    assigned = np.zeros(n, dtype=bool)
    lb3_acc = np.zeros(n, dtype=np.int64)
    for kmin, kmax in intervals:
        _run_interval(
            A, h, kmin, kmax, ub, lb2, core, assigned, lb3_acc, counter,
            spark_for_batches,
        )
    name = "h-LB+UB" if ub_kind == "ub" else "h-LB+UB[hdeg]"
    if parallel == "hdegree":
        name += "[spark-hdeg]"
    return CoreResult(
        core=core, h=h, algo=name,
        visits=counter.visits, bfs_calls=counter.bfs_calls,
        runtime_s=time.monotonic() - t0,
        extra={"intervals": intervals, "ub": ub, "lb2": lb2},
    )


def _run_intervals_spark(
    spark, g: Graph, h: int, intervals: list[tuple[int, int]],
    ub: np.ndarray, lb2: np.ndarray,
) -> tuple[np.ndarray, int]:
    """Paper §4.6 option 1: run each interval as an independent Spark task.

    Each task re-derives its V[kmin] from the broadcast UB vector, runs
    ImproveLB + CoreDecomp on the induced subgraph, and emits (vertex, core)
    rows for the vertices whose core index falls inside its interval;
    vertices with higher core indexes keep being re-bucketed above kmax and
    are simply left for the task owning their interval. The union over tasks
    is the full decomposition (tested equal to the sequential mode).
    """
    import pandas as pd

    n = g.n
    sc = spark.sparkContext
    b_adj = sc.broadcast(pack_adjacency(g.adjacency))
    b_ub = sc.broadcast(ub.tolist())
    b_lb2 = sc.broadcast(lb2.tolist())

    idf = spark.createDataFrame(
        pd.DataFrame(
            {
                "iid": np.arange(len(intervals), dtype=np.int64),
                "kmin": [kmin for kmin, _ in intervals],
                "kmax": [kmax for _, kmax in intervals],
            }
        )
    ).repartition(len(intervals), "iid")

    def run_one(pdf: pd.DataFrame) -> pd.DataFrame:
        A_task = unpack_adjacency(b_adj.value, n)
        ub_t = np.asarray(b_ub.value, dtype=np.int64)
        lb2_t = np.asarray(b_lb2.value, dtype=np.int64)
        out_v: list[int] = []
        out_c: list[int] = []
        for row in pdf.itertuples(index=False):
            kmin, kmax = int(row.kmin), int(row.kmax)
            core_t = np.zeros(n, dtype=np.int64)
            assigned_t = np.zeros(n, dtype=bool)
            lb3_t = np.zeros(n, dtype=np.int64)
            _run_interval(
                A_task, h, kmin, kmax, ub_t, lb2_t, core_t, assigned_t,
                lb3_t, counter=None,
            )
            for v in np.flatnonzero(assigned_t):
                out_v.append(int(v))
                out_c.append(int(core_t[v]))
        return pd.DataFrame({"v": pd.Series(out_v, dtype="int64"),
                             "core": pd.Series(out_c, dtype="int64")})

    rows = (
        idf.groupBy("iid")
        .applyInPandas(run_one, schema="v long, core long")
        .toPandas()
    )
    core = np.zeros(n, dtype=np.int64)
    if len(rows):
        core[rows["v"].to_numpy()] = rows["core"].to_numpy()
    return core, len(intervals)
