"""Tests for repro.core.confusion — Fig. 2 confusion matrix over pair sets."""
import pandas as pd
import pytest

from repro.core.confusion import (
    ConfusionCounts,
    confusion_counts,
    confusion_sets,
    pair_universe_size,
)
from repro.oracle import assert_equivalent


def _pairs(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["id1", "id2"]))


class TestUniverse:
    @pytest.mark.parametrize("n,expected", [(0, 0), (1, 0), (2, 1), (4, 6), (10, 45)])
    def test_universe_size(self, n, expected):
        assert pair_universe_size(n) == expected


class TestConfusionSets:
    def test_partition(self, spark):
        exp = _pairs(spark, [("a", "b"), ("a", "c"), ("d", "e")])
        gold = _pairs(spark, [("a", "b"), ("d", "e"), ("f", "g")])
        tp, fp, fn = confusion_sets(exp, gold)
        assert sorted(map(tuple, tp.collect())) == [("a", "b"), ("d", "e")]
        assert sorted(map(tuple, fp.collect())) == [("a", "c")]
        assert sorted(map(tuple, fn.collect())) == [("f", "g")]

    def test_fp_matches_duckdb(self, spark):
        exp = _pairs(spark, [("a", "b"), ("a", "c"), ("b", "c"), ("x", "y")])
        gold = _pairs(spark, [("a", "b"), ("b", "c")])
        _, fp, _ = confusion_sets(exp, gold)
        assert_equivalent(
            fp,
            """
            SELECT e.id1, e.id2 FROM exp e
            ANTI JOIN gold g ON e.id1 = g.id1 AND e.id2 = g.id2
            """,
            exp=exp,
            gold=gold,
        )

    def test_fn_matches_duckdb(self, spark):
        exp = _pairs(spark, [("a", "b")])
        gold = _pairs(spark, [("a", "b"), ("b", "c"), ("c", "d")])
        _, _, fn = confusion_sets(exp, gold)
        assert_equivalent(
            fn,
            """
            SELECT g.id1, g.id2 FROM gold g
            ANTI JOIN exp e ON e.id1 = g.id1 AND e.id2 = g.id2
            """,
            exp=exp,
            gold=gold,
        )

    def test_extra_columns_survive_on_tp_and_fp(self, spark):
        exp = spark.createDataFrame(
            pd.DataFrame(
                [("a", "b", 0.9), ("a", "c", 0.4)],
                columns=["id1", "id2", "similarity"],
            )
        )
        gold = _pairs(spark, [("a", "b")])
        tp, fp, _ = confusion_sets(exp, gold)
        assert "similarity" in tp.columns and "similarity" in fp.columns


class TestConfusionCounts:
    def test_counts_with_n_records(self, spark):
        exp = _pairs(spark, [("a", "b"), ("a", "c")])
        gold = _pairs(spark, [("a", "b"), ("d", "e")])
        c = confusion_counts(exp, gold, n_records=5)
        assert (c.tp, c.fp, c.fn) == (1, 1, 1)
        assert c.tn == 10 - 3
        assert c.total == 10

    def test_counts_with_universe_size(self, spark):
        exp = _pairs(spark, [("a", "b")])
        gold = _pairs(spark, [("a", "b"), ("c", "d")])
        c = confusion_counts(exp, gold, universe_size=50)
        assert (c.tp, c.fp, c.fn, c.tn) == (1, 0, 1, 48)

    def test_requires_exactly_one_universe(self, spark):
        exp = _pairs(spark, [("a", "b")])
        with pytest.raises(ValueError):
            confusion_counts(exp, exp, n_records=3, universe_size=3)
        with pytest.raises(ValueError):
            confusion_counts(exp, exp)

    def test_rejects_too_small_universe(self, spark):
        exp = _pairs(spark, [("a", "b"), ("c", "d")])
        gold = _pairs(spark, [("e", "f")])
        with pytest.raises(ValueError):
            confusion_counts(exp, gold, universe_size=2)

    def test_properties(self):
        c = ConfusionCounts(tp=3, fp=2, fn=1, tn=4)
        assert c.positives == 4
        assert c.predicted == 5
        assert c.total == 10

    def test_perfect_experiment(self, spark):
        gold = _pairs(spark, [("a", "b"), ("b", "c"), ("a", "c")])
        c = confusion_counts(gold, gold, n_records=4)
        assert (c.tp, c.fp, c.fn, c.tn) == (3, 0, 0, 3)

    def test_empty_experiment(self, spark):
        exp = spark.createDataFrame([], "id1 string, id2 string")
        gold = _pairs(spark, [("a", "b")])
        c = confusion_counts(exp, gold, n_records=3)
        assert (c.tp, c.fp, c.fn, c.tn) == (0, 0, 1, 2)
