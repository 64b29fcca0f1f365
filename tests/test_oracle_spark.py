"""Smoke tests wiring the provided TPC-H-lite generators and DuckDB oracle
through Spark SQL — guards the oracle harness itself."""
import pytest
import pyspark.sql.functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tpch(spark):
    li = synth_data.lineitem(spark, sf=0.001).cache()
    o = synth_data.orders(spark, sf=0.001).cache()
    li.count(), o.count()
    return li, o


class TestOracle:
    def test_count(self, spark, tpch):
        li, _ = tpch
        got = li.agg(F.count("*").alias("n"))
        assert_equivalent(got, "SELECT count(*) AS n FROM li", li=li)

    def test_group_agg(self, spark, tpch):
        li, _ = tpch
        got = (li.groupBy("l_returnflag")
               .agg(F.round(F.sum("l_quantity"), 2).alias("qty"))
               .select("l_returnflag", "qty"))
        assert_equivalent(
            got,
            "SELECT l_returnflag, round(sum(l_quantity), 2) AS qty "
            "FROM li GROUP BY l_returnflag",
            li=li)

    def test_join(self, spark, tpch):
        li, o = tpch
        got = (li.join(o, li.l_orderkey == o.o_orderkey)
               .groupBy("o_orderpriority")
               .agg(F.count("*").alias("n")))
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n FROM li "
            "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li, o=o)

    def test_catches_wrong_result(self, spark, tpch):
        li, _ = tpch
        wrong = li.agg((F.count("*") + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(wrong, "SELECT count(*) AS n FROM li", li=li)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
        top = (df.groupBy("k").count().orderBy(F.desc("count")).limit(1)
               .collect()[0]["count"])
        assert top > 5000 / 100 * 3  # head key far above uniform share
