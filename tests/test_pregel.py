"""Distributed dataflow layer: DataFrame h-degrees (vs kernel and vs DuckDB
oracle), mapInPandas fan-out, BSP decomposition, Spark-parallel h-LB+UB."""
import numpy as np
import pytest

from repro.core import h_bz, h_lb_ub
from repro.core.kernels import all_h_degrees
from repro.core.reference import brute_force_cores
from repro.graphs.generators import barabasi_albert, erdos_renyi
from repro.graphs.spark_graph import edges_to_df, edges_to_pandas
from repro.oracle import assert_equivalent
from repro.pregel import h_degrees_dataframe, h_degrees_spark, kh_core_bsp


@pytest.mark.parametrize("h", [1, 2, 3])
@pytest.mark.parametrize("seed", [0, 1])
def test_h_degrees_dataframe_matches_kernel(spark, h, seed):
    g = erdos_renyi(30, 0.12, seed=seed)
    expect = all_h_degrees(g.adjacency, np.ones(g.n, dtype=bool), h)
    got = {r.v: r.hdeg for r in h_degrees_dataframe(edges_to_df(spark, g), h).collect()}
    for v in range(g.n):
        assert got.get(v, 0) == expect[v], (v, h, seed)


def test_h_degrees_dataframe_oracle_h2(spark):
    """The two-hop expansion as Catalyst sees it vs plain SQL in DuckDB."""
    g = erdos_renyi(40, 0.1, seed=4)
    got = h_degrees_dataframe(edges_to_df(spark, g), 2)
    assert_equivalent(
        got,
        """
        SELECT src AS v, count(*) AS hdeg FROM (
            SELECT src, dst FROM edges
            UNION
            SELECT e1.src, e2.dst
            FROM edges e1 JOIN edges e2 ON e1.dst = e2.src
            WHERE e1.src <> e2.dst
        ) GROUP BY src
        """,
        edges=edges_to_pandas(g),
    )


def test_h_degrees_dataframe_rejects_h0(spark):
    g = erdos_renyi(5, 0.5, seed=0)
    with pytest.raises(ValueError):
        h_degrees_dataframe(edges_to_df(spark, g), 0)


@pytest.mark.parametrize("h", [1, 2, 3])
def test_h_degrees_spark_matches_kernel(spark, h):
    g = barabasi_albert(80, 2, seed=2)
    alive = np.ones(g.n, dtype=bool)
    alive[::7] = False
    expect = all_h_degrees(g.adjacency, alive, h)
    got, visits, calls = h_degrees_spark(spark, g.adjacency, alive, h)
    assert np.array_equal(got, expect)
    assert calls == int(alive.sum())
    assert visits > 0


def test_h_degrees_spark_visits_match_local():
    """Remote visit accounting must equal the driver kernel's accounting."""
    from repro.core.kernels import Counter

    g = erdos_renyi(25, 0.15, seed=3)
    alive = np.ones(g.n, dtype=bool)
    c = Counter()
    all_h_degrees(g.adjacency, alive, 2, c)
    # Recompute per-vertex and sum — same arithmetic the executor does.
    total = 0
    for v in range(g.n):
        c2 = Counter()
        from repro.core.kernels import bounded_reach

        bounded_reach(g.adjacency, v, alive, 2, c2)
        total += c2.visits
    assert total == c.visits


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("h", [1, 2, 3])
def test_bsp_matches_sequential(seed, h):
    g = erdos_renyi(26, 0.14, seed=seed)
    assert np.array_equal(kh_core_bsp(g, h).core, h_bz(g, h).core)


def test_bsp_with_spark_matches(spark):
    g = erdos_renyi(20, 0.18, seed=5)
    local = kh_core_bsp(g, 2)
    dist = kh_core_bsp(g, 2, spark=spark)
    assert np.array_equal(local.core, dist.core)
    assert dist.extra["supersteps"] == local.extra["supersteps"]


def test_hlbub_spark_intervals_matches(spark):
    g = barabasi_albert(40, 2, seed=6)
    for h in (2, 3):
        ref = brute_force_cores(g, h)
        res = h_lb_ub(g, h, s=2, spark=spark, parallel="intervals")
        assert np.array_equal(res.core, ref), h
        assert res.extra["tasks"] >= 1


def test_hlbub_spark_hdegree_matches(spark):
    g = erdos_renyi(30, 0.15, seed=7)
    ref = brute_force_cores(g, 2)
    res = h_lb_ub(g, 2, spark=spark, parallel="hdegree")
    assert np.array_equal(res.core, ref)


def test_hlbub_parallel_intervals_requires_spark():
    g = erdos_renyi(10, 0.3, seed=0)
    with pytest.raises(ValueError):
        h_lb_ub(g, 2, parallel="intervals")
