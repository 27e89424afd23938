"""Benchmark: Table 5 pipeline (NELL-like, 4 variants x 3 label fns)."""
from repro.tables import table5


def test_bench_table5(benchmark, spark):
    df = benchmark.pedantic(lambda: table5.run(spark, scale=0.0008),
                            rounds=1, iterations=1)
    assert len(df) == 12
