"""Benchmark for Table 7: landmark selection + error estimation."""
from repro.core import h_lb_ub
from repro.core.kernels import distance_matrix
from repro.landmarks import estimate_error, select_landmarks


def test_bench_table7_core_landmarks(benchmark, cele):
    dist = distance_matrix(cele.adjacency)
    core = h_lb_ub(cele, 2).core

    def run():
        lm = select_landmarks(cele, "core", ell=20, h=2, core=core, seed=0,
                              dist=dist)
        return estimate_error(cele, lm, n_pairs=200, seed=0, dist=dist)

    err = benchmark(run)
    assert 0 <= err < 1.5


def test_bench_table7_betweenness(benchmark, cele):
    from repro.landmarks import betweenness_centrality

    bc = benchmark.pedantic(
        betweenness_centrality, args=(cele,), rounds=2, iterations=1
    )
    assert bc.max() > 0
