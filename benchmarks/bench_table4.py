"""Benchmark for Table 4: computing the lower and upper bounds."""
import numpy as np

from repro.core.bounds import batch_h_degrees, lower_bounds, upper_bound


def test_bench_table4_lower_bounds(benchmark, cele):
    lb1, lb2 = benchmark.pedantic(
        lower_bounds, args=(cele.adjacency, 2), rounds=3, iterations=1
    )
    assert (lb2 >= lb1).all()


def test_bench_table4_upper_bound(benchmark, cele):
    ub = benchmark.pedantic(
        upper_bound, args=(cele.adjacency, 2), rounds=2, iterations=1
    )
    assert ub.max() > 0


def test_bench_table4_batch_h_degrees(benchmark, cele):
    alive = np.ones(cele.n, dtype=bool)
    degs = benchmark(batch_h_degrees, cele.adjacency, alive, 2)
    assert degs.max() > 0
