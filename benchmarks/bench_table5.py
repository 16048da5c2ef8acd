"""Benchmark for Table 5: bound ablations on the same instance."""
from repro.core import h_bz, h_lb, h_lb_ub


def test_bench_table5_no_lb(benchmark, coli):
    benchmark.pedantic(h_bz, args=(coli, 2), rounds=3, iterations=1)


def test_bench_table5_lb1(benchmark, coli):
    benchmark.pedantic(
        lambda: h_lb(coli, 2, lb="lb1"), rounds=3, iterations=1
    )


def test_bench_table5_lb2(benchmark, coli):
    benchmark.pedantic(
        lambda: h_lb(coli, 2, lb="lb2"), rounds=3, iterations=1
    )


def test_bench_table5_ub_hdegree(benchmark, coli):
    benchmark.pedantic(
        lambda: h_lb_ub(coli, 2, ub_kind="hdegree"), rounds=3, iterations=1
    )


def test_bench_table5_ub(benchmark, coli):
    benchmark.pedantic(
        lambda: h_lb_ub(coli, 2, ub_kind="ub"), rounds=3, iterations=1
    )
