"""Tests for repro.matchgen.generator — dirty datasets and Table-1 workloads."""
import pytest

from repro.matchgen.generator import clustered_dataset, diagram_workload


class TestClusteredDataset:
    def test_gold_covers_all_records(self, spark):
        ds, gold = clustered_dataset(spark, n_entities=30, seed=1)
        assert ds.count() == gold.count()
        assert ds.select("rid").distinct().count() == ds.count()

    def test_some_duplicates_exist(self, spark):
        _, gold = clustered_dataset(spark, n_entities=50, dup_fraction=0.5, seed=2)
        max_cluster = (
            gold.groupBy("cluster").count().agg({"count": "max"}).first()[0]
        )
        assert max_cluster >= 2

    def test_deterministic(self, spark):
        a, _ = clustered_dataset(spark, n_entities=10, seed=3)
        b, _ = clustered_dataset(spark, n_entities=10, seed=3)
        assert sorted(map(tuple, a.collect())) == sorted(map(tuple, b.collect()))

    def test_no_duplicates_when_fraction_zero(self, spark):
        _, gold = clustered_dataset(spark, n_entities=20, dup_fraction=0.0, seed=4)
        assert gold.groupBy("cluster").count().agg({"count": "max"}).first()[0] == 1


class TestDiagramWorkload:
    def test_exact_counts(self):
        w = diagram_workload(n_records=500, n_matches=300, seed=0)
        assert w.n_records == 500
        assert len(w.truth_labels) == 500
        assert len(w.matches) == 300

    def test_pairs_are_canonical_and_unique(self):
        w = diagram_workload(n_records=200, n_matches=150, seed=1)
        seen = set()
        for _, a, b in w.matches:
            assert 0 <= a < b < 200
            assert (a, b) not in seen
            seen.add((a, b))

    def test_fp_rate_respected(self):
        w = diagram_workload(n_records=1000, n_matches=600, fp_rate=0.25, seed=2)
        fp = sum(1 for _, a, b in w.matches if w.truth_labels[a] != w.truth_labels[b])
        assert fp == pytest.approx(0.25 * 600, abs=1)

    def test_true_matches_score_higher_on_average(self):
        w = diagram_workload(n_records=1000, n_matches=600, seed=3)
        true_scores = [
            s for s, a, b in w.matches if w.truth_labels[a] == w.truth_labels[b]
        ]
        false_scores = [
            s for s, a, b in w.matches if w.truth_labels[a] != w.truth_labels[b]
        ]
        assert sum(true_scores) / len(true_scores) > sum(false_scores) / len(false_scores)

    def test_deterministic(self):
        a = diagram_workload(n_records=100, n_matches=60, seed=9)
        b = diagram_workload(n_records=100, n_matches=60, seed=9)
        assert a == b

    def test_small_workload_147_matches_9763_records(self):
        # The FreeDB-CDs-like shape of Table 1: many records, few matches.
        w = diagram_workload(n_records=9763, n_matches=147, seed=5)
        assert len(w.matches) == 147
        assert len(w.truth_labels) == 9763

    def test_runs_through_incremental_engine(self):
        from repro.core.incremental import confusion_series, naive_confusion_series

        w = diagram_workload(n_records=300, n_matches=200, seed=6)
        fast = confusion_series(w.n_records, w.truth_labels, w.matches, s=11)
        slow = naive_confusion_series(w.n_records, w.truth_labels, w.matches, s=11)
        assert fast == slow
        assert len(fast) == 11
