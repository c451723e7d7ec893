"""Coverage for the provided TPC-H-lite scaffold + DuckDB oracle.

The paper's workload is per-series time series (see repro.datasets), but
the scaffold's generators and the oracle contract are exercised here:
Spark SQL aggregations/joins over the synthetic OLAP tables must match
DuckDB exactly (broadcast joins are disabled session-wide, so the join
goes through the shuffle path).
"""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.01


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


class TestGenerators:
    def test_lineitem_rowcount_scales(self, li):
        assert li.count() == int(6_000_000 * SF)

    def test_deterministic_in_seed(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=5).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=5).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[len(counts) // 2]


class TestOracleEquivalence:
    def test_groupby_aggregation(self, spark, li):
        li.createOrReplaceTempView("li")
        q = """SELECT l_returnflag, l_linestatus,
                      SUM(l_quantity) AS sum_qty,
                      ROUND(AVG(l_extendedprice), 4) AS avg_price,
                      COUNT(*) AS n
               FROM {t} GROUP BY l_returnflag, l_linestatus"""
        res = spark.sql(q.format(t="li"))
        assert_equivalent(res, q.format(t="li"), li=li)

    def test_shuffle_join(self, spark, li, orders):
        li.createOrReplaceTempView("li")
        orders.createOrReplaceTempView("o")
        q = """SELECT o.o_orderpriority,
                      COUNT(*) AS n,
                      ROUND(SUM(li.l_extendedprice * (1 - li.l_discount)), 2)
                          AS revenue
               FROM li JOIN o ON li.l_orderkey = o.o_orderkey
               WHERE o.o_orderstatus = 'O'
               GROUP BY o.o_orderpriority"""
        res = spark.sql(q)
        assert_equivalent(res, q, li=li, o=orders)
