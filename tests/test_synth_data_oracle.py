"""Provided TPC-H-lite substrate + DuckDB oracle integration tests.

These exercise the shipped ``repro.synth_data`` generators (and the
paper-schema bridge added for CMDL) through the oracle, proving the
Spark relational substrate used throughout the reproduction computes
the same answers as DuckDB.
"""
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


class TestTpchLite:
    def test_aggregation_matches_duckdb(self, li):
        got = (li.groupBy("l_returnflag")
               .agg(F.sum("l_quantity").alias("qty"),
                    F.count("*").alias("cnt")))
        assert_equivalent(
            got,
            """SELECT l_returnflag, sum(l_quantity) AS qty,
                      count(*) AS cnt
               FROM li GROUP BY l_returnflag""",
            li=li,
        )

    def test_join_matches_duckdb(self, spark, li, orders):
        got = (li.join(orders, li.l_orderkey == orders.o_orderkey)
               .groupBy("o_orderpriority")
               .agg(F.count("*").alias("cnt")))
        assert_equivalent(
            got,
            """SELECT o_orderpriority, count(*) AS cnt
               FROM li JOIN o ON l_orderkey = o_orderkey
               GROUP BY o_orderpriority""",
            li=li, o=orders,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert df["k"].between(1, 50).all()


class TestDataLakeBridge:
    def test_bridge_returns_frames(self, spark):
        lake, values_df, docs_df = synth_data.data_lake(spark, "mlopen")
        assert values_df.count() == len(lake.string_values)
        assert docs_df.count() == len(lake.docs)

    def test_bridge_distinct_counts_oracle(self, spark):
        lake, values_df, _ = synth_data.data_lake(spark, "mlopen")
        got = values_df.groupBy("col_id").agg(
            F.countDistinct("value").alias("n_distinct"))
        assert_equivalent(
            got,
            """SELECT col_id, count(DISTINCT value) AS n_distinct
               FROM vals GROUP BY col_id""",
            vals=lake.string_values,
        )
