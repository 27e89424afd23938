"""Benchmark: Table 4 pipeline (all eight dataset generators + stats)."""
from repro.tables import table4


def test_bench_table4(benchmark, spark):
    df = benchmark.pedantic(lambda: table4.run(spark, scale=0.005),
                            rounds=1, iterations=1)
    assert len(df) == 8
