"""Tests for repro.core.pairs — canonical pair sets and conversions."""
import pandas as pd
import pytest

from repro.core import pairs as P
from repro.oracle import assert_equivalent


def _pairs_df(spark, rows, cols=("id1", "id2")):
    return spark.createDataFrame(pd.DataFrame(rows, columns=list(cols)))


class TestCanonicalize:
    def test_orders_ids(self, spark):
        df = _pairs_df(spark, [("b", "a")])
        assert df.transform(P.canonicalize).collect()[0].asDict() == {
            "id1": "a",
            "id2": "b",
        }

    def test_drops_self_pairs(self, spark):
        df = _pairs_df(spark, [("a", "a"), ("a", "b")])
        assert P.canonicalize(df).count() == 1

    def test_dedups_mirrored_pairs(self, spark):
        df = _pairs_df(spark, [("a", "b"), ("b", "a"), ("a", "b")])
        assert P.canonicalize(df).count() == 1

    def test_keeps_max_similarity_on_duplicates(self, spark):
        df = _pairs_df(
            spark,
            [("a", "b", 0.3), ("b", "a", 0.9)],
            cols=("id1", "id2", "similarity"),
        )
        row = P.canonicalize(df).collect()[0]
        assert row["similarity"] == pytest.approx(0.9)

    def test_custom_column_names(self, spark):
        df = _pairs_df(spark, [("y", "x")], cols=("left", "right"))
        out = P.canonicalize(df, id1="left", id2="right").collect()[0]
        assert (out["id1"], out["id2"]) == ("x", "y")

    def test_empty_input(self, spark):
        df = spark.createDataFrame([], "id1 string, id2 string")
        assert P.canonicalize(df).count() == 0


class TestPairsFromClustering:
    def test_cluster_of_three_gives_three_pairs(self, spark):
        cl = _pairs_df(
            spark, [("a", 1), ("b", 1), ("c", 1), ("d", 2)], cols=("rid", "cluster")
        )
        got = P.pairs_from_clustering(cl)
        assert sorted(tuple(r) for r in got.collect()) == [
            ("a", "b"),
            ("a", "c"),
            ("b", "c"),
        ]

    def test_matches_duckdb_self_join(self, spark):
        cl = _pairs_df(
            spark,
            [(f"r{i}", i % 3) for i in range(12)],
            cols=("rid", "cluster"),
        )
        got = P.pairs_from_clustering(cl)
        assert_equivalent(
            got,
            """
            SELECT a.rid AS id1, b.rid AS id2
            FROM clustering a JOIN clustering b
              ON a.cluster = b.cluster AND a.rid < b.rid
            """,
            clustering=cl,
        )

    def test_singletons_give_no_pairs(self, spark):
        cl = _pairs_df(spark, [("a", 1), ("b", 2)], cols=("rid", "cluster"))
        assert P.pairs_from_clustering(cl).count() == 0


class TestClusteringFromPairs:
    def test_transitive_closure(self, spark):
        prs = _pairs_df(spark, [("a", "b"), ("b", "c")])
        recs = _pairs_df(spark, [("a",), ("b",), ("c",), ("d",)], cols=("rid",))
        cl = P.clustering_from_pairs(prs, recs)
        m = {r["rid"]: r["cluster"] for r in cl.collect()}
        assert m["a"] == m["b"] == m["c"]
        assert m["d"] != m["a"]

    def test_all_records_present(self, spark):
        prs = _pairs_df(spark, [("a", "b")])
        recs = _pairs_df(spark, [("a",), ("b",), ("z",)], cols=("rid",))
        assert P.clustering_from_pairs(prs, recs).count() == 3


class TestClosureMissingPairs:
    def test_triangle_missing_one_edge(self, spark):
        prs = _pairs_df(spark, [("a", "b"), ("b", "c")])
        recs = _pairs_df(spark, [("a",), ("b",), ("c",)], cols=("rid",))
        missing = P.closure_missing_pairs(prs, recs).collect()
        assert [tuple(r) for r in missing] == [("a", "c")]

    def test_closed_set_has_none_missing(self, spark):
        prs = _pairs_df(spark, [("a", "b"), ("b", "c"), ("a", "c")])
        recs = _pairs_df(spark, [("a",), ("b",), ("c",)], cols=("rid",))
        assert P.closure_missing_pairs(prs, recs).count() == 0


class TestPairCountOfClustering:
    @pytest.mark.parametrize(
        "sizes,expected", [([1], 0), ([2], 1), ([3], 3), ([3, 2, 1], 4), ([5, 5], 20)]
    )
    def test_sum_of_binomials(self, spark, sizes, expected):
        rows, rid = [], 0
        for c, n in enumerate(sizes):
            for _ in range(n):
                rows.append((f"r{rid}", c))
                rid += 1
        cl = _pairs_df(spark, rows, cols=("rid", "cluster"))
        assert P.pair_count_of_clustering(cl) == expected


class TestWithNumericIds:
    def test_dense_and_unique(self, spark):
        ds = _pairs_df(spark, [("c", 1), ("a", 2), ("b", 3)], cols=("rid", "x"))
        out = P.with_numeric_ids(ds).collect()
        nids = sorted(r["nid"] for r in out)
        assert nids == [0, 1, 2]

    def test_order_follows_rid(self, spark):
        ds = _pairs_df(spark, [("c", 1), ("a", 2)], cols=("rid", "x"))
        m = {r["rid"]: r["nid"] for r in P.with_numeric_ids(ds).collect()}
        assert m["a"] < m["c"]
