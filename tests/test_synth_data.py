"""Tests for the provided repro.synth_data generators (used by oracle tests)."""
import pytest

from repro import synth_data as SD


class TestLineitem:
    def test_row_count_scales(self, spark):
        assert SD.lineitem(spark, sf=0.001).count() == 6_000

    def test_deterministic_in_seed(self, spark):
        a = SD.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = SD.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_schema_columns(self, spark):
        cols = SD.lineitem(spark, sf=0.0005).columns
        assert {"l_orderkey", "l_quantity", "l_shipdate"} <= set(cols)


class TestOrders:
    def test_orderkeys_dense(self, spark):
        df = SD.orders(spark, sf=0.001).toPandas()
        assert sorted(df["o_orderkey"]) == list(range(1, len(df) + 1))

    def test_custkeys_in_range(self, spark):
        df = SD.orders(spark, sf=0.001).toPandas()
        assert df["o_custkey"].between(1, 150).all()


class TestKeyGenerators:
    def test_zipf_skew(self, spark):
        df = SD.zipf_keys(spark, n=20_000, n_keys=1_000, alpha=1.2).toPandas()
        top = df["k"].value_counts(normalize=True).iloc[0]
        assert top > 0.05  # the hottest key dominates under zipf

    def test_uniform_no_heavy_hitter(self, spark):
        df = SD.uniform_keys(spark, n=20_000, n_keys=1_000).toPandas()
        top = df["k"].value_counts(normalize=True).iloc[0]
        assert top < 0.01

    @pytest.mark.parametrize("gen", [SD.zipf_keys, SD.uniform_keys])
    def test_key_range(self, spark, gen):
        df = gen(spark, n=1_000, n_keys=50).toPandas()
        assert df["k"].between(1, 50).all()
