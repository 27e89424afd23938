"""Benchmark: Table 2 pipeline (toy FSim, all four variants + verdicts)."""
from repro.tables import table2


def test_bench_table2(benchmark, spark):
    df = benchmark.pedantic(lambda: table2.run(spark, eps=1e-2),
                            rounds=1, iterations=1)
    assert (df.our_verdict == df.paper_verdict).all()
