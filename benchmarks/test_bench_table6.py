"""Benchmark: Table 6 pipeline (pattern matching, 4 scenarios x 7 algos)."""
from repro.tables import table6


def test_bench_table6(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table6.run(spark, scale=0.001, n_queries=8),
        rounds=1, iterations=1)
    assert len(df) == 28
