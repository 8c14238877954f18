"""Tests for repro.experiments.table1 — diagram-runtime benchmark harness."""
import pytest

from repro.experiments.table1 import (
    N_THRESHOLDS,
    PAPER_SECONDS,
    WORKLOADS,
    build_workload,
    time_algorithms,
)
from repro.matchgen.generator import diagram_workload


class TestWorkloadTable:
    def test_all_paper_rows_present(self):
        assert set(WORKLOADS) == set(PAPER_SECONDS)
        assert len(WORKLOADS) == 5

    def test_small_rows_match_paper_exactly(self):
        assert WORKLOADS["Altosight X4"][:2] == (835, 4_005)
        assert WORKLOADS["HPI Cora"][:2] == (1_879, 5_067)
        assert WORKLOADS["FreeDB CDs"][:2] == (9_763, 147)

    def test_scaled_rows_keep_match_ratio(self):
        for name in ("Songs 100k (scaled 1/5)", "Magellan Songs (scaled 1/10)"):
            ours_r, ours_m, paper_r, paper_m = WORKLOADS[name]
            assert ours_m / ours_r == pytest.approx(paper_m / paper_r, rel=0.02)

    def test_threshold_count_matches_paper(self):
        assert N_THRESHOLDS == 100


class TestBuildWorkload:
    @pytest.mark.parametrize("name", ["Altosight X4", "FreeDB CDs"])
    def test_counts_faithful(self, name):
        w = build_workload(name)
        assert w.n_records == WORKLOADS[name][0]
        assert len(w.matches) == WORKLOADS[name][1]

    def test_deterministic(self):
        assert build_workload("HPI Cora") == build_workload("HPI Cora")


class TestTimeAlgorithms:
    def test_returns_positive_times_and_verifies(self):
        w = diagram_workload(n_records=2_000, n_matches=1_000, seed=1)
        custom_s, naive_s = time_algorithms(w, s=20)
        assert custom_s > 0 and naive_s > 0

    def test_custom_beats_naive_at_moderate_size(self):
        # At 20k records / 50 thresholds the naïve recompute must already
        # lose clearly — the Table-1 claim at CI-sized inputs.
        w = diagram_workload(n_records=20_000, n_matches=9_000, seed=2)
        custom_s, naive_s = time_algorithms(w, s=50)
        assert naive_s > 2 * custom_s
