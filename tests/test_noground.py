"""Tests for repro.core.noground — ground-truth-free quality estimation."""
import pandas as pd
import pytest

from repro.core import noground as NG


def _pairs(spark, rows, cols=("id1", "id2")):
    return spark.createDataFrame(pd.DataFrame(rows, columns=list(cols)))


def _recs(spark, ids):
    return spark.createDataFrame(pd.DataFrame({"rid": list(ids)}))


class TestClosureViolations:
    def test_closed_set_has_zero(self, spark):
        prs = _pairs(spark, [("a", "b"), ("b", "c"), ("a", "c")])
        assert NG.closure_violation_count(prs, _recs(spark, "abcd")) == 0

    def test_open_triangle_has_one(self, spark):
        prs = _pairs(spark, [("a", "b"), ("b", "c")])
        assert NG.closure_violation_count(prs, _recs(spark, "abc")) == 1

    def test_chain_of_four(self, spark):
        prs = _pairs(spark, [("a", "b"), ("b", "c"), ("c", "d")])
        # closure has 6 pairs, 3 present -> 3 missing
        assert NG.closure_violation_count(prs, _recs(spark, "abcd")) == 3


class TestLinkRedundancy:
    def test_clique_is_fully_redundant(self, spark):
        prs = _pairs(spark, [("a", "b"), ("b", "c"), ("a", "c")])
        assert NG.link_redundancy(prs, _recs(spark, "abc")) == pytest.approx(1.0)

    def test_tree_has_zero_redundancy(self, spark):
        prs = _pairs(spark, [("a", "b"), ("b", "c"), ("c", "d")])
        assert NG.link_redundancy(prs, _recs(spark, "abcd")) == pytest.approx(0.0)

    def test_size_two_components_ignored(self, spark):
        prs = _pairs(spark, [("a", "b"), ("c", "d")])
        assert NG.link_redundancy(prs, _recs(spark, "abcd")) == 0.0

    def test_partial_redundancy(self, spark):
        # 4-cycle: 4 edges, n=4 -> extra=1 of possible C(4,2)-3=3.
        prs = _pairs(spark, [("a", "b"), ("b", "c"), ("c", "d"), ("a", "d")])
        assert NG.link_redundancy(prs, _recs(spark, "abcd")) == pytest.approx(1 / 3)


class TestMajorityVote:
    def test_majority_kept(self, spark):
        e1 = _pairs(spark, [("a", "b"), ("c", "d")])
        e2 = _pairs(spark, [("a", "b")])
        e3 = _pairs(spark, [("a", "b"), ("e", "f")])
        got = sorted(map(tuple, NG.majority_vote([e1, e2, e3]).collect()))
        assert got == [("a", "b")]

    def test_strict_majority_required(self, spark):
        e1 = _pairs(spark, [("a", "b")])
        e2 = _pairs(spark, [("c", "d")])
        assert NG.majority_vote([e1, e2]).count() == 0


class TestConsensusDeviations:
    def test_agreeing_experiment_scores_zero(self, spark):
        e = _pairs(spark, [("a", "b")])
        devs = NG.consensus_deviations([e, e, e])
        assert devs == [0, 0, 0]

    def test_outlier_scores_higher(self, spark):
        e1 = _pairs(spark, [("a", "b"), ("c", "d")])
        e2 = _pairs(spark, [("a", "b"), ("c", "d")])
        e3 = _pairs(spark, [("x", "y")])
        devs = NG.consensus_deviations([e1, e2, e3])
        assert devs[0] == devs[1] == 0
        assert devs[2] == 3  # misses both consensus pairs, adds one


class TestCompactnessSparsity:
    def test_separation(self, spark):
        matches = _pairs(
            spark, [("a", "b", 0.9), ("c", "d", 0.8)], cols=("id1", "id2", "similarity")
        )
        near = _pairs(
            spark, [("a", "c", 0.3), ("b", "d", 0.1)], cols=("id1", "id2", "similarity")
        )
        out = NG.compactness_sparsity(matches, near)
        assert out["compactness"] == pytest.approx(0.85)
        assert out["neighbour_similarity"] == pytest.approx(0.2)
        assert out["separation"] == pytest.approx(0.65)

    def test_empty_inputs(self, spark):
        empty = spark.createDataFrame([], "id1 string, id2 string, similarity double")
        out = NG.compactness_sparsity(empty, empty)
        assert out == {"compactness": 0.0, "neighbour_similarity": 0.0, "separation": 0.0}
