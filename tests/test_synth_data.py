"""Tests for the provided TPC-H-lite generators (+ oracle plumbing)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0).cache()


@pytest.fixture(scope="module")
def o(spark):
    return synth_data.orders(spark, sf=0.002, seed=1).cache()


class TestGenerators:
    def test_lineitem_rows(self, li):
        assert li.count() == int(6_000_000 * 0.002)

    def test_orders_keys_dense(self, o):
        n = o.count()
        assert o.select(F.max("o_orderkey")).collect()[0][0] == n

    def test_deterministic(self, spark):
        a = synth_data.customer(spark, sf=0.002, seed=2).toPandas()
        b = synth_data.customer(spark, sf=0.002, seed=2).toPandas()
        assert a.equals(b)

    def test_part_and_customer_sizes(self, spark):
        assert synth_data.part(spark, sf=0.002).count() == 400
        assert synth_data.customer(spark, sf=0.002).count() == 300


class TestOracle:
    def test_aggregate_equivalence(self, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"), F.count("*").alias("n")
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS n "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_equivalence(self, li, o):
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n FROM li JOIN o "
            "ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li,
            o=o,
        )

    def test_mismatch_detected(self, li):
        wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_zipf_uniform_keys(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=1)
        u = synth_data.uniform_keys(spark, n=5000, n_keys=100, seed=2)
        zc = z.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
        uc = u.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
        assert zc > uc * 2  # zipf much more skewed than uniform
