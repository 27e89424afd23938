"""Benchmark: one FSim iteration bundle (3 iters) per variant on a mid-size graph —
the kernel the paper's Figure-7/8 efficiency study times."""
import pytest

from repro.core.fsim import fsim_spark
from repro.core.reference import FSimConfig
from repro.graphs.generators import dataset


@pytest.fixture(scope="module")
def nell(spark):
    return dataset(spark, "NELL", scale=0.002, label_style="words")


@pytest.mark.parametrize("variant", ["s", "dp", "b", "bj"])
def test_bench_fsim_variant(benchmark, spark, nell, variant):
    cfg = FSimConfig(variant=variant, theta=1.0, exact_iters=3)
    df = benchmark.pedantic(
        lambda: fsim_spark(spark, nell, nell, cfg).count(),
        rounds=1, iterations=1)
    assert df > 0
