"""Tests for repro.core.cluster_metrics — ccF1, VI, GMD."""
import math

import pandas as pd
import pytest

from repro.core import cluster_metrics as CM


def _cl(spark, assignment: dict):
    rows = [(r, c) for r, c in assignment.items()]
    return spark.createDataFrame(pd.DataFrame(rows, columns=["rid", "cluster"]))


@pytest.fixture
def identical(spark):
    a = {"a": 1, "b": 1, "c": 2, "d": 2, "e": 3}
    return _cl(spark, a), _cl(spark, a)


class TestClosestClusterF1:
    def test_identical_clusterings_score_one(self, identical):
        out = CM.closest_cluster_f1(*identical)
        assert out["cc_precision"] == pytest.approx(1.0)
        assert out["cc_recall"] == pytest.approx(1.0)
        assert out["cc_f1"] == pytest.approx(1.0)

    def test_all_singletons_vs_one_cluster(self, spark):
        exp = _cl(spark, {"a": "a", "b": "b", "c": "c"})
        truth = _cl(spark, {"a": 1, "b": 1, "c": 1})
        out = CM.closest_cluster_f1(exp, truth)
        # Every singleton has Jaccard 1/3 with the one gold cluster.
        assert out["cc_precision"] == pytest.approx(1 / 3)
        assert out["cc_recall"] == pytest.approx(1 / 3)

    def test_hand_computed_mixed_case(self, spark):
        exp = _cl(spark, {"a": 1, "b": 1, "c": 2, "d": 2})
        truth = _cl(spark, {"a": 1, "b": 1, "c": 1, "d": 2})
        # exp cluster {a,b}: best J = 2/3 (vs {a,b,c}); {c,d}: J = 1/2 (vs {d})
        # truth {a,b,c}: best J = 2/3; {d}: J = 1/2
        out = CM.closest_cluster_f1(exp, truth)
        assert out["cc_precision"] == pytest.approx((2 / 3 + 1 / 2) / 2)
        assert out["cc_recall"] == pytest.approx((2 / 3 + 1 / 2) / 2)


class TestVariationOfInformation:
    def test_identical_is_zero(self, identical):
        assert CM.variation_of_information(*identical) == pytest.approx(0.0)

    def test_symmetry(self, spark):
        exp = _cl(spark, {"a": 1, "b": 1, "c": 2, "d": 3})
        truth = _cl(spark, {"a": 1, "b": 2, "c": 2, "d": 2})
        assert CM.variation_of_information(exp, truth) == pytest.approx(
            CM.variation_of_information(truth, exp)
        )

    def test_known_value_two_halves(self, spark):
        # One cluster vs two equal halves of 4 records: VI = log 2.
        exp = _cl(spark, {"a": 1, "b": 1, "c": 1, "d": 1})
        truth = _cl(spark, {"a": 1, "b": 1, "c": 2, "d": 2})
        assert CM.variation_of_information(exp, truth) == pytest.approx(math.log(2))

    def test_bounded_by_log_n(self, spark):
        exp = _cl(spark, {f"r{i}": i for i in range(6)})
        truth = _cl(spark, {f"r{i}": 0 for i in range(6)})
        assert CM.variation_of_information(exp, truth) <= math.log(6) + 1e-9


class TestGeneralizedMergeDistance:
    def test_identical_costs_zero(self, identical):
        assert CM.generalized_merge_distance(*identical) == 0.0

    def test_unit_cost_single_merge(self, spark):
        exp = _cl(spark, {"a": 1, "b": 2})
        truth = _cl(spark, {"a": 1, "b": 1})
        assert CM.generalized_merge_distance(exp, truth) == 1.0

    def test_unit_cost_single_split(self, spark):
        exp = _cl(spark, {"a": 1, "b": 1})
        truth = _cl(spark, {"a": 1, "b": 2})
        assert CM.generalized_merge_distance(exp, truth) == 1.0

    def test_unit_cost_mixed(self, spark):
        # {a,b,c} + {d} -> {a,b} + {c,d}: one split + one merge.
        exp = _cl(spark, {"a": 1, "b": 1, "c": 1, "d": 2})
        truth = _cl(spark, {"a": 1, "b": 1, "c": 2, "d": 2})
        assert CM.generalized_merge_distance(exp, truth) == 2.0

    def test_singletons_to_one_cluster_needs_n_minus_1_merges(self, spark):
        exp = _cl(spark, {f"r{i}": i for i in range(5)})
        truth = _cl(spark, {f"r{i}": 0 for i in range(5)})
        assert CM.generalized_merge_distance(exp, truth) == 4.0


class TestPairwiseFromGMD:
    def test_identical_is_perfect(self, identical):
        out = CM.pairwise_from_gmd(*identical)
        assert out["pw_precision"] == pytest.approx(1.0)
        assert out["pw_recall"] == pytest.approx(1.0)

    def test_matches_pair_based_metrics(self, spark):
        from repro.core.confusion import confusion_counts
        from repro.core.metrics import precision, recall
        from repro.core.pairs import pairs_from_clustering

        exp = _cl(spark, {"a": 1, "b": 1, "c": 1, "d": 2, "e": 2})
        truth = _cl(spark, {"a": 1, "b": 1, "c": 2, "d": 2, "e": 2})
        out = CM.pairwise_from_gmd(exp, truth)
        c = confusion_counts(
            pairs_from_clustering(exp), pairs_from_clustering(truth), n_records=5
        )
        assert out["pw_precision"] == pytest.approx(precision(c))
        assert out["pw_recall"] == pytest.approx(recall(c))
