"""Provided TPC-H-lite generators + DuckDB oracle smoke coverage.

The paper's workload is graphs, not OLAP tables, but the repo's
correctness discipline (Spark result == DuckDB result) is exercised here
on the provided generators and on the graph edge DataFrames.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


class TestTPCHLite:
    def test_lineitem_schema(self, li):
        assert {"l_orderkey", "l_quantity", "l_extendedprice"} <= set(li.columns)

    def test_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        assert a.equals(b)

    def test_agg_oracle(self, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt
            FROM li GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_join_oracle(self, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS cnt
            FROM li JOIN o ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li,
            o=orders,
        )


class TestKeyGenerators:
    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=0)
        top = df.groupBy("k").count().orderBy(F.col("count").desc()).first()
        assert top["k"] == 1  # rank-1 key dominates under zipf

    def test_uniform_coverage(self, spark):
        df = synth_data.uniform_keys(spark, n=5000, n_keys=10, seed=0)
        assert df.select("k").distinct().count() == 10


class TestGraphEdgesWrapper:
    @pytest.mark.parametrize("family", ["ba", "ws", "er", "road", "grid", "karate"])
    def test_families(self, spark, family):
        df = synth_data.graph_edges(spark, family=family, n=100, density=3, seed=1)
        assert df.columns == ["src", "dst"]
        assert df.count() > 0

    def test_canonical_oracle(self, spark):
        df = synth_data.graph_edges(spark, family="ba", n=80, density=3, seed=2)
        pdf = df.toPandas()
        assert_equivalent(
            df.select("src", "dst"),
            "SELECT src, dst FROM e WHERE src < dst",
            e=pdf,
        )

    def test_unknown_family(self, spark):
        with pytest.raises(ValueError):
            synth_data.graph_edges(spark, family="nope")
