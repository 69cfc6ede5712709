"""Tests for the provided TPC-H-lite generators (kept as the repo's
general-purpose synthetic-data substrate) and the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001)


class TestGenerators:
    def test_lineitem_size(self, li):
        assert li.count() == 6000

    def test_orders_keys_unique(self, orders):
        assert orders.select("o_orderkey").distinct().count() == orders.count()

    def test_customer_columns(self, spark):
        c = synth_data.customer(spark, sf=0.001)
        assert "c_mktsegment" in c.columns

    def test_part_deterministic(self, spark):
        a = synth_data.part(spark, sf=0.001).toPandas()
        b = synth_data.part(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        z = synth_data.zipf_keys(spark, n=20_000, n_keys=1000).toPandas()
        top = z.k.value_counts().iloc[0]
        assert top > 20_000 / 1000 * 5  # heavy head

    def test_uniform_keys_range(self, spark):
        u = synth_data.uniform_keys(spark, n=5000, n_keys=100).toPandas()
        assert u.k.between(1, 100).all()


class TestOracle:
    def test_aggregation_equivalence(self, li):
        agg = (li.groupBy("l_returnflag")
               .agg(F.sum("l_quantity").alias("qty"),
                    F.count("*").alias("cnt")))
        assert_equivalent(
            agg,
            """SELECT l_returnflag, SUM(l_quantity) AS qty, COUNT(*) AS cnt
               FROM lineitem GROUP BY l_returnflag""",
            lineitem=li,
        )

    def test_join_equivalence(self, spark, li, orders):
        j = (li.join(orders, li.l_orderkey == orders.o_orderkey)
             .groupBy("o_orderpriority")
             .agg(F.count("*").alias("n")))
        assert_equivalent(
            j,
            """SELECT o_orderpriority, COUNT(*) AS n
               FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
               GROUP BY o_orderpriority""",
            lineitem=li, orders=orders,
        )

    def test_detects_wrong_result(self, li):
        bad = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("cnt"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                bad,
                "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_detects_column_mismatch(self, li):
        agg = li.groupBy("l_returnflag").agg(F.count("*").alias("wrong_name"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                agg,
                "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
