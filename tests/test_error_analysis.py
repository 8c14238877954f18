"""Tests for repro.explore.error_analysis — nearest correct pair (§4.4)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.explore.error_analysis import nearest_correct_pairs, token_jaccard_sim


def _pairs(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["id1", "id2"]))


def _ds(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["rid", "name"]))


class TestTokenJaccardSim:
    def _sim(self, spark, a, b):
        df = spark.createDataFrame(pd.DataFrame([(a, b)], columns=["a", "b"]))
        return df.select(token_jaccard_sim(F.col("a"), F.col("b")).alias("s")).first()["s"]

    def test_identical(self, spark):
        assert self._sim(spark, "x y z", "x y z") == pytest.approx(1.0)

    def test_disjoint(self, spark):
        assert self._sim(spark, "a b", "c d") == pytest.approx(0.0)

    def test_half_overlap(self, spark):
        assert self._sim(spark, "a b", "b c") == pytest.approx(1 / 3)

    def test_null_is_zero(self, spark):
        assert self._sim(spark, None, "x") == pytest.approx(0.0)


class TestNearestCorrectPairs:
    @pytest.fixture
    def dataset(self, spark):
        return _ds(
            spark,
            [
                ("f1", "apple pie recipe"),
                ("f2", "apple pie recipes"),
                ("t1", "apple pie recipe"),  # near-identical to f1
                ("t2", "apple pie recipes"),  # near-identical to f2
                ("u1", "completely different thing"),
                ("u2", "another unrelated text"),
            ],
        )

    def test_picks_most_similar_correct_pair(self, spark, dataset):
        mis = _pairs(spark, [("f1", "f2")])
        correct = _pairs(spark, [("t1", "t2"), ("u1", "u2")])
        out = nearest_correct_pairs(mis, correct, dataset, ["name"]).collect()
        assert len(out) == 1
        assert (out[0]["t_id1"], out[0]["t_id2"]) == ("t1", "t2")

    def test_score_max_for_identical_records(self, spark, dataset):
        mis = _pairs(spark, [("f1", "f2")])
        correct = _pairs(spark, [("t1", "t2")])
        out = nearest_correct_pairs(mis, correct, dataset, ["name"], q=2.0).collect()[0]
        # sim(f1,t1)=1, sim(f2,t2)=1 -> distance = sqrt(2)
        assert out["score"] == pytest.approx(2 ** 0.5)

    def test_cross_orientation_considered(self, spark):
        ds = _ds(
            spark,
            [
                ("f1", "aaa bbb"),
                ("f2", "ccc ddd"),
                ("t1", "ccc ddd"),  # matches f2
                ("t2", "aaa bbb"),  # matches f1
            ],
        )
        mis = _pairs(spark, [("f1", "f2")])
        correct = _pairs(spark, [("t1", "t2")])
        out = nearest_correct_pairs(mis, correct, ds, ["name"], q=1.0).collect()[0]
        # direct orientation scores 0, cross orientation scores 1+1=2
        assert out["score"] == pytest.approx(2.0)

    def test_manhattan_vs_euclidean(self, spark, dataset):
        mis = _pairs(spark, [("f1", "f2")])
        correct = _pairs(spark, [("t1", "t2")])
        s1 = nearest_correct_pairs(mis, correct, dataset, ["name"], q=1.0).collect()[0]["score"]
        s2 = nearest_correct_pairs(mis, correct, dataset, ["name"], q=2.0).collect()[0]["score"]
        assert s1 == pytest.approx(2.0)
        assert s2 == pytest.approx(2 ** 0.5)

    def test_invalid_q_raises(self, spark, dataset):
        mis = _pairs(spark, [("f1", "f2")])
        with pytest.raises(ValueError):
            nearest_correct_pairs(mis, mis, dataset, ["name"], q=3.0)

    def test_one_row_per_misclassified_pair(self, spark, dataset):
        mis = _pairs(spark, [("f1", "f2"), ("u1", "u2")])
        correct = _pairs(spark, [("t1", "t2")])
        out = nearest_correct_pairs(mis, correct, dataset, ["name"])
        assert out.count() == 2
