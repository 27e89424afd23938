"""Benchmark: Table 7 pipeline (DBIS top-5 venue rankings, 6 algos)."""
from repro.tables import table7


def test_bench_table7(benchmark, spark):
    df = benchmark.pedantic(
        lambda: table7.run(spark, n_venues=32, n_papers=140, n_authors=100),
        rounds=1, iterations=1)
    assert len(df) == 5
