"""Benchmark for Table 1: dataset statistics (local + Spark SQL degrees)."""
from repro.graphs.metrics import degree_stats_spark, graph_stats


def test_bench_table1_stats_local(benchmark, jazz):
    s = benchmark(graph_stats, jazz)
    assert s.n == jazz.n


def test_bench_table1_degrees_spark(benchmark, spark, jazz):
    avg, mx = benchmark.pedantic(
        degree_stats_spark, args=(spark, jazz), rounds=3, iterations=1
    )
    assert mx == int(jazz.degrees.max())
