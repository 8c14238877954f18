"""Tests for repro.core.incremental — Appendix D algorithm, incl. Fig. 10."""
import random

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.incremental import (
    Confusion,
    DynamicIntersection,
    UnionFind,
    confusion_series,
    naive_confusion_series,
)


class TestUnionFind:
    def test_initial_state(self):
        uf = UnionFind(4)
        assert uf.pair_count == 0
        assert [uf.find(i) for i in range(4)] == [0, 1, 2, 3]

    def test_union_updates_pair_count(self):
        uf = UnionFind(5)
        uf.union(0, 1)
        assert uf.pair_count == 1
        uf.union(2, 3)
        assert uf.pair_count == 2
        uf.union(0, 2)  # merge size-2 clusters: +4 pairs
        assert uf.pair_count == 6

    def test_idempotent_union(self):
        uf = UnionFind(3)
        uf.union(0, 1)
        uf.union(1, 0)
        assert uf.pair_count == 1

    def test_pair_count_matches_binomial(self):
        uf = UnionFind(10)
        for i in range(9):
            uf.union(i, i + 1)
        assert uf.pair_count == 45

    def test_tracked_union_reports_merges(self):
        # Paper D.1 example: {{a},{b},{c,d}} + pairs {a,b},{b,c} -> one merge
        # with three sources.
        uf = UnionFind(4)
        uf.union(2, 3)  # {c, d}
        merges = uf.tracked_union([(0, 1), (1, 2)])
        assert len(merges) == 1
        target, sources = merges[0]
        assert uf.find(0) == target
        assert len(sources) == 3

    def test_tracked_union_skips_internal_pairs(self):
        uf = UnionFind(4)
        uf.union(0, 1)
        merges = uf.tracked_union([(0, 1)])  # already same cluster
        assert merges == []

    def test_tracked_union_multiple_groups(self):
        uf = UnionFind(6)
        merges = uf.tracked_union([(0, 1), (2, 3)])
        assert len(merges) == 2
        assert sorted(len(s) for _, s in merges) == [2, 2]


class TestDynamicIntersection:
    def test_initial_tp_zero(self):
        di = DynamicIntersection(["g0", "g0", "g1", "g1"])
        assert di.tp_pairs == 0

    def test_merge_within_truth_cluster_adds_tp(self):
        di = DynamicIntersection(["g0", "g0"])
        uf = UnionFind(2)
        di.apply_merges(uf.tracked_union([(0, 1)]))
        assert di.tp_pairs == 1

    def test_merge_across_truth_clusters_adds_nothing(self):
        di = DynamicIntersection(["g0", "g1"])
        uf = UnionFind(2)
        di.apply_merges(uf.tracked_union([(0, 1)]))
        assert di.tp_pairs == 0

    def test_side_effect_merge_figure9(self):
        # Paper Fig. 9: truth {a,b},{c}; matches {b,c} then {a,c}. The first
        # merge changes nothing; the second brings a and b together.
        di = DynamicIntersection(["g0", "g0", "g1"])  # a=0, b=1, c=2
        uf = UnionFind(3)
        di.apply_merges(uf.tracked_union([(1, 2)]))
        assert di.tp_pairs == 0
        di.apply_merges(uf.tracked_union([(0, 2)]))
        assert di.tp_pairs == 1  # {a, b} now intersect-clustered


class TestFigure10Example:
    """Exact reproduction of the paper's worked example (Fig. 10)."""

    def test_all_four_steps(self):
        # Dataset {a,b,c,d}; truth g0:{a,b}, g1:{c,d};
        # matches {a,c}, {b,d}, {a,b} in descending-score order; s = 4.
        truth = ["g0", "g0", "g1", "g1"]  # a=0 b=1 c=2 d=3
        matches = [(3.0, 0, 2), (2.0, 1, 3), (1.0, 0, 1)]
        out = confusion_series(4, truth, matches, s=4)
        cells = [(c.tp, c.fp, c.fn, c.tn) for c in out]
        assert cells == [
            (0, 0, 2, 4),  # step 0
            (0, 1, 2, 3),  # after {a,c}
            (0, 2, 2, 2),  # after {b,d}
            (2, 4, 0, 0),  # after {a,b} — transitive closure fills all pairs
        ]

    def test_naive_agrees_on_figure10(self):
        truth = ["g0", "g0", "g1", "g1"]
        matches = [(3.0, 0, 2), (2.0, 1, 3), (1.0, 0, 1)]
        assert naive_confusion_series(4, truth, matches, s=4) == confusion_series(
            4, truth, matches, s=4
        )


class TestSeriesShape:
    def test_first_point_is_empty_experiment(self):
        out = confusion_series(3, [0, 0, 1], [(1.0, 0, 1)], s=2)
        assert out[0] == Confusion(float("inf"), 0, 0, 1, 2)

    def test_number_of_points_is_s(self):
        matches = [(1.0 - i / 10, i, i + 1) for i in range(9)]
        out = confusion_series(10, list(range(10)), matches, s=5)
        assert len(out) == 5

    def test_no_matches(self):
        out = confusion_series(4, [0, 0, 1, 1], [], s=3)
        assert all((c.tp, c.fp) == (0, 0) for c in out)

    def test_tp_monotone_nondecreasing(self):
        rng = random.Random(0)
        n = 30
        truth = [rng.randrange(8) for _ in range(n)]
        matches = [
            (rng.random(), *sorted(rng.sample(range(n), 2))) for _ in range(40)
        ]
        out = confusion_series(n, truth, matches, s=9)
        tps = [c.tp for c in out]
        assert tps == sorted(tps)

    def test_cells_always_sum_to_universe(self):
        rng = random.Random(1)
        n = 25
        truth = [rng.randrange(6) for _ in range(n)]
        matches = [
            (rng.random(), *sorted(rng.sample(range(n), 2))) for _ in range(30)
        ]
        total = n * (n - 1) // 2
        for c in confusion_series(n, truth, matches, s=7):
            assert c.tp + c.fp + c.fn + c.tn == total
            assert min(c.tp, c.fp, c.fn, c.tn) >= 0


@st.composite
def _instances(draw):
    n = draw(st.integers(2, 20))
    truth = [draw(st.integers(0, 5)) for _ in range(n)]
    n_matches = draw(st.integers(0, 30))
    matches = []
    for _ in range(n_matches):
        a = draw(st.integers(0, n - 1))
        b = draw(st.integers(0, n - 1))
        if a == b:
            continue
        matches.append((draw(st.floats(0, 1, allow_nan=False)), min(a, b), max(a, b)))
    s = draw(st.integers(2, 8))
    return n, truth, matches, s


class TestIncrementalEqualsNaive:
    @settings(max_examples=150, deadline=None)
    @given(_instances())
    def test_equivalence(self, inst):
        n, truth, matches, s = inst
        fast = confusion_series(n, truth, matches, s)
        slow = naive_confusion_series(n, truth, matches, s)
        assert [(c.tp, c.fp, c.fn, c.tn) for c in fast] == [
            (c.tp, c.fp, c.fn, c.tn) for c in slow
        ]

    def test_equivalence_large_random(self):
        rng = random.Random(42)
        n = 500
        truth = [rng.randrange(120) for _ in range(n)]
        matches = [
            (rng.random(), *sorted(rng.sample(range(n), 2))) for _ in range(800)
        ]
        fast = confusion_series(n, truth, matches, s=21)
        slow = naive_confusion_series(n, truth, matches, s=21)
        assert fast == slow
