"""Tests for the provided repro.oracle DuckDB equality checker."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data as SD
from repro.oracle import assert_equivalent


class TestAssertEquivalent:
    def test_accepts_matching_aggregate(self, spark):
        li = SD.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"), F.count("*").alias("cnt")
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS cnt
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_accepts_pandas_input_tables(self, spark):
        pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
        got = spark.createDataFrame(pdf).groupBy("k").agg(F.sum("v").alias("s"))
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_wrong_result(self, spark):
        pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
        got = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "s": [99.0, 2.0]}))
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT k, v AS s FROM t", t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": [1]})
        got = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT k FROM t", t=pdf)

    def test_column_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"a": [1], "b": [2]})
        got = spark.createDataFrame(pd.DataFrame({"b": [2], "a": [1]}))[["b", "a"]]
        assert_equivalent(got, "SELECT a, b FROM t", t=pdf)

    def test_join_equivalence_on_synth_tables(self, spark):
        li = SD.lineitem(spark, sf=0.001)
        o = SD.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS cnt
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=o,
        )
