"""Benchmark for Table 3: the three decomposition algorithms on one cell.

The relative ordering (h-BZ slowest; bounds pay off) is asserted in the
test suite; here we record the absolute numbers per algorithm.
"""
from repro.core import h_bz, h_lb, h_lb_ub


def test_bench_table3_hbz_coli_h3(benchmark, coli):
    res = benchmark.pedantic(h_bz, args=(coli, 3), rounds=2, iterations=1)
    assert res.visits > 0


def test_bench_table3_hlb_coli_h3(benchmark, coli):
    res = benchmark.pedantic(h_lb, args=(coli, 3), rounds=3, iterations=1)
    assert res.visits > 0


def test_bench_table3_hlbub_coli_h3(benchmark, coli):
    res = benchmark.pedantic(h_lb_ub, args=(coli, 3), rounds=3, iterations=1)
    assert res.visits > 0


def test_bench_table3_road_hlb_h2(benchmark, rnpa):
    res = benchmark.pedantic(h_lb, args=(rnpa, 2), rounds=2, iterations=1)
    assert res.visits > 0
