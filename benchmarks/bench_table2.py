"""Benchmark for Table 2: full (k,h)-core characterization of one dataset."""
from repro.core import h_lb_ub


def test_bench_table2_jazz_h2(benchmark, jazz):
    res = benchmark.pedantic(h_lb_ub, args=(jazz, 2), rounds=3, iterations=1)
    assert res.degeneracy > 0


def test_bench_table2_jazz_h3(benchmark, jazz):
    res = benchmark.pedantic(h_lb_ub, args=(jazz, 3), rounds=2, iterations=1)
    assert res.degeneracy > 0
