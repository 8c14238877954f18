"""Tests for repro.explore.attributes — nullRatio and equalRatio (§4.5.2-3)."""
import pandas as pd
import pytest

from repro.explore import attributes as A


@pytest.fixture
def dataset(spark):
    rows = [
        ("r1", "alice", "berlin"),
        ("r2", "alice", None),
        ("r3", "bob", "berlin"),
        ("r4", None, "hamburg"),
    ]
    return spark.createDataFrame(pd.DataFrame(rows, columns=["rid", "name", "city"]))


def _pairs(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["id1", "id2"]))


class TestNullCounts:
    def test_closed_form(self, spark, dataset):
        # name: r4 null -> pairs with r4: 3 of C(4,2)=6.
        assert A.null_counts(dataset, "name") == 3
        # city: r2 null -> 3 pairs.
        assert A.null_counts(dataset, "city") == 3

    def test_no_nulls(self, spark):
        ds = spark.createDataFrame(
            pd.DataFrame([("a", "x"), ("b", "y")], columns=["rid", "v"])
        )
        assert A.null_counts(ds, "v") == 0

    def test_all_null(self, spark):
        ds = spark.createDataFrame(
            pd.DataFrame([("a", None), ("b", None), ("c", None)], columns=["rid", "v"])
        )
        assert A.null_counts(ds, "v") == 3


class TestEqualCounts:
    def test_value_groups(self, spark, dataset):
        # name: alice x2 -> 1 pair; city: berlin x2 -> 1 pair.
        assert A.equal_counts(dataset, "name") == 1
        assert A.equal_counts(dataset, "city") == 1

    def test_nulls_not_equal(self, spark):
        ds = spark.createDataFrame(
            pd.DataFrame([("a", None), ("b", None)], columns=["rid", "v"])
        )
        assert A.equal_counts(ds, "v") == 0

    def test_triple_group(self, spark):
        ds = spark.createDataFrame(
            pd.DataFrame([("a", "x"), ("b", "x"), ("c", "x")], columns=["rid", "v"])
        )
        assert A.equal_counts(ds, "v") == 3


class TestFalseCountsAndRatios:
    def test_false_null_count(self, spark, dataset):
        mis = _pairs(spark, [("r1", "r4"), ("r1", "r3")])
        # (r1,r4): r4 name is null -> counts; (r1,r3): both non-null.
        assert A.false_null_count(mis, dataset, "name") == 1

    def test_false_equal_count(self, spark, dataset):
        mis = _pairs(spark, [("r1", "r2"), ("r1", "r3")])
        # (r1,r2): names equal -> counts; (r1,r3): alice vs bob.
        assert A.false_equal_count(mis, dataset, "name") == 1

    def test_null_ratio(self, spark, dataset):
        mis = _pairs(spark, [("r1", "r4")])
        assert A.null_ratio(mis, dataset, "name") == pytest.approx(1 / 3)

    def test_equal_ratio(self, spark, dataset):
        mis = _pairs(spark, [("r1", "r2")])
        assert A.equal_ratio(mis, dataset, "name") == pytest.approx(1.0)

    def test_zero_denominator_gives_zero(self, spark):
        ds = spark.createDataFrame(
            pd.DataFrame([("a", "x"), ("b", "y")], columns=["rid", "v"])
        )
        mis = _pairs(spark, [("a", "b")])
        assert A.null_ratio(mis, ds, "v") == 0.0
        assert A.equal_ratio(mis, ds, "v") == 0.0


class TestInfluenceReport:
    def test_report_shape_and_values(self, spark, dataset):
        mis = _pairs(spark, [("r1", "r2"), ("r1", "r4")])
        rep = A.attribute_influence_report(mis, dataset)
        assert list(rep["attribute"]) == ["name", "city"]
        name_row = rep[rep.attribute == "name"].iloc[0]
        assert name_row["nullCount"] == 3
        assert name_row["falseNullCount"] == 1  # (r1, r4)
        assert name_row["equalCount"] == 1
        assert name_row["falseEqualCount"] == 1  # (r1, r2)

    def test_explicit_attribute_list(self, spark, dataset):
        mis = _pairs(spark, [("r1", "r2")])
        rep = A.attribute_influence_report(mis, dataset, ["city"])
        assert list(rep["attribute"]) == ["city"]

    def test_oracle_cross_check_false_equal(self, spark, dataset):
        # DuckDB reference for falseEqualCount on a larger random instance.
        import numpy as np

        rng = np.random.default_rng(3)
        values = ["x", "y", "z", None]
        rows = [
            (f"r{i}", values[int(rng.integers(0, 4))]) for i in range(30)
        ]
        ds = spark.createDataFrame(pd.DataFrame(rows, columns=["rid", "v"]))
        mis_rows = []
        for _ in range(40):
            i, j = rng.choice(30, 2, replace=False)
            a, b = f"r{min(i, j)}", f"r{max(i, j)}"
            mis_rows.append((a, b))
        mis = _pairs(spark, list(set(mis_rows)))
        got = A.false_equal_count(mis, ds, "v")
        import duckdb

        con = duckdb.connect()
        con.register("ds", ds.toPandas())
        con.register("mis", mis.toPandas())
        expected = con.execute(
            """
            SELECT count(*) FROM mis m
            JOIN ds a ON m.id1 = a.rid JOIN ds b ON m.id2 = b.rid
            WHERE a.v IS NOT NULL AND a.v = b.v
            """
        ).fetchone()[0]
        con.close()
        assert got == expected
