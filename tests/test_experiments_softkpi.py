"""Tests for repro.experiments.softkpi_study — §5.5 effort study fixture."""
from repro.experiments.softkpi_study import EFFORT_TRACKS, run_softkpi_study


class TestSoftKpiStudy:
    def test_three_solutions_tracked(self):
        assert set(EFFORT_TRACKS) == {"rule-based", "ml", "hybrid"}

    def test_curves_plateau_after_14_hours(self):
        # Figure 6 shape: only minor improvement after the ~14 h barrier.
        for points in EFFORT_TRACKS.values():
            at_14 = max(v for h, v in points if h <= 14)
            final = max(v for _, v in points)
            assert final - at_14 < 0.03

    def test_breakthrough_exists(self):
        # Each curve has a jump of >= 0.2 between consecutive points.
        for points in EFFORT_TRACKS.values():
            deltas = [b[1] - a[1] for a, b in zip(points, points[1:])]
            assert max(deltas) >= 0.2

    def test_run_outputs(self):
        out = run_softkpi_study()
        assert set(out) == {"diagram", "decision_matrix", "reach"}
        assert len(out["decision_matrix"]) == 3
        assert out["diagram"].groupby("solution")["best_metric"].is_monotonic_increasing.all()

    def test_reach_query(self):
        out = run_softkpi_study()
        reach = out["reach"].set_index("solution")
        assert reach.loc["ml", "hours_to_f1_0.8"] == 8.0
        assert reach.loc["rule-based", "hours_to_f1_0.8"] is None or (
            reach.loc["rule-based", "plateau_f1"] < 0.8
        )
