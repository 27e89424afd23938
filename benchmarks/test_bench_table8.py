"""Benchmark: Table 8 pipeline (DBIS nDCG over subject venues)."""
from repro.tables import table8


def test_bench_table8(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table8.run(spark, n_venues=32, n_papers=140, n_authors=100),
        rounds=1, iterations=1)
    assert len(df) == 6
