"""Benchmark: Table 9 pipeline (alignment, 8 algorithms x 2 graph pairs)."""
from repro.tables import table9


def test_bench_table9(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table9.run(spark, n_nodes=200, n_edges=440),
        rounds=1, iterations=1)
    assert len(df) == 16
