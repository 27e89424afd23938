"""The provided TPC-H-lite generators + DuckDB oracle wiring (kept from
the scaffold): exercises shuffle joins/aggregations at SF=0.01 and the
result-equality oracle itself."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002)


class TestOracle:
    def test_groupby_agg(self, spark, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"),
            F.count("*").alias("cnt"),
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS cnt "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_shuffle_join(self, spark, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS cnt FROM li "
            "JOIN orders ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li, orders=orders,
        )

    def test_oracle_catches_wrong_result(self, spark, li):
        # 1% error: beyond assert_frame_equal's default rtol, unlike +1
        # on a ~1e5 sum which hides inside the tolerance
        wrong = li.groupBy("l_returnflag").agg(
            (F.sum("l_quantity") * 1.01).alias("qty"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, sum(l_quantity) AS qty FROM li "
                "GROUP BY l_returnflag",
                li=li,
            )

    def test_key_generators(self, spark):
        z = synth_data.zipf_keys(spark, n=2000, n_keys=100)
        u = synth_data.uniform_keys(spark, n=2000, n_keys=100)
        zc = z.groupBy("k").count().orderBy(F.desc("count")).first()["count"]
        uc = u.groupBy("k").count().orderBy(F.desc("count")).first()["count"]
        assert zc > uc  # zipf is skewed, uniform is not
