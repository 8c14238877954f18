"""Tests for repro.explore.selection — pair selection strategies (§4.2)."""
import pandas as pd
import pytest

from repro.explore import selection as SEL


@pytest.fixture
def scored(spark):
    # 10 scored pairs, correct flag: high-similarity ones mostly correct.
    rows = [
        ("a", "b", 0.95, 1),
        ("c", "d", 0.90, 1),
        ("e", "f", 0.85, 0),
        ("g", "h", 0.70, 1),
        ("i", "j", 0.60, 0),
        ("k", "l", 0.55, 1),
        ("m", "n", 0.40, 1),
        ("o", "p", 0.30, 0),
        ("q", "r", 0.20, 1),
        ("s", "t", 0.10, 1),
    ]
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["id1", "id2", "similarity", "correct"])
    )


class TestAroundThreshold:
    def test_half_half(self, scored):
        out = SEL.around_threshold(scored, threshold=0.5, k=4).collect()
        sims = sorted(r["similarity"] for r in out)
        # two nearest >= 0.5: 0.55, 0.60; two nearest < 0.5: 0.40, 0.30
        assert sims == [0.30, 0.40, 0.55, 0.60]

    def test_above_fraction(self, scored):
        out = SEL.around_threshold(scored, 0.5, k=4, above_fraction=0.75).collect()
        sims = sorted(r["similarity"] for r in out)
        assert sims == [0.40, 0.55, 0.60, 0.70]

    def test_k_larger_than_data(self, scored):
        assert len(SEL.around_threshold(scored, 0.5, k=100).collect()) == 10


class TestIncorrectOutliers:
    def test_furthest_wrong_pairs(self, scored):
        out = SEL.incorrect_outliers(scored, threshold=0.5, k=2).collect()
        got = sorted((r["id1"], r["similarity"]) for r in out)
        # wrong pairs: 0.85, 0.60, 0.30; furthest from 0.5: 0.85 then 0.30
        assert got == [("e", 0.85), ("o", 0.30)]

    def test_only_incorrect_returned(self, scored):
        out = SEL.incorrect_outliers(scored, 0.5, k=10).collect()
        assert all(r["correct"] == 0 for r in out)
        assert len(out) == 3


class TestPartitionSummaries:
    def test_partition_count_and_sizes(self, scored):
        out = SEL.partition_summaries(scored, k=5).collect()
        assert len(out) == 5
        assert all(r["pairs"] == 2 for r in out)

    def test_error_rates(self, scored):
        rows = {r["partition"]: r for r in SEL.partition_summaries(scored, 5).collect()}
        assert rows[0]["error_rate"] == pytest.approx(0.0)  # 0.95, 0.90
        assert rows[1]["error_rate"] == pytest.approx(0.5)  # 0.85, 0.70
        assert rows[4]["error_rate"] == pytest.approx(0.0)  # 0.20, 0.10

    def test_similarity_ranges_ordered(self, scored):
        rows = SEL.partition_summaries(scored, 5).collect()
        for earlier, later in zip(rows, rows[1:]):
            assert earlier["min_similarity"] >= later["max_similarity"]


class TestRepresentatives:
    def test_quantile_picks_extremes(self, scored):
        out = SEL.representatives(scored, k=2, b=2, strategy="quantile").collect()
        by_part = {}
        for r in out:
            by_part.setdefault(r["partition"], []).append(r["similarity"])
        # partition 0 holds sims .95...60; quantile b=2 -> min and max
        assert sorted(by_part[0]) == [0.60, 0.95]
        assert sorted(by_part[1]) == [0.10, 0.55]

    def test_random_returns_b_per_partition(self, scored):
        out = SEL.representatives(scored, k=2, b=3, strategy="random", seed=1)
        counts = (
            out.groupBy("partition").count().orderBy("partition").collect()
        )
        assert [r["count"] for r in counts] == [3, 3]

    def test_random_is_deterministic_in_seed(self, scored):
        a = sorted(map(tuple, SEL.representatives(scored, 2, 2, "random", seed=5)
                       .select("id1", "id2").collect()))
        b = sorted(map(tuple, SEL.representatives(scored, 2, 2, "random", seed=5)
                       .select("id1", "id2").collect()))
        assert a == b

    def test_class_based_respects_quota(self, scored):
        out = SEL.representatives(scored, k=1, b=5, strategy="class_based", seed=0)
        rows = out.collect()
        n_correct = sum(r["correct"] for r in rows)
        # 7 of 10 correct -> quota round(5*0.7)=4 correct (and 1 incorrect)
        assert n_correct == 4
        assert len(rows) == 5

    def test_unknown_strategy_raises(self, scored):
        with pytest.raises(ValueError):
            SEL.representatives(scored, 2, 2, strategy="bogus")


class TestPlainResultPairs:
    def test_hides_closure_added(self, spark, scored):
        added = spark.createDataFrame(
            pd.DataFrame([("a", "b"), ("q", "r")], columns=["id1", "id2"])
        )
        out = SEL.plain_result_pairs(scored, added)
        assert out.count() == 8
        remaining = {(r["id1"], r["id2"]) for r in out.collect()}
        assert ("a", "b") not in remaining and ("q", "r") not in remaining
