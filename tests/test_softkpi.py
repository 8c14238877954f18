"""Tests for repro.kpis.softkpi — effort, cost, decision matrix (§3.3)."""
import pytest

from repro.kpis import softkpi as K


class TestEffort:
    def test_cost_interpolation(self):
        assert K.Effort(10, 0).cost(base_rate=30, top_rate=150) == 300.0
        assert K.Effort(10, 100).cost(base_rate=30, top_rate=150) == 1500.0
        assert K.Effort(10, 50).cost(base_rate=30, top_rate=150) == 900.0

    def test_zero_hours(self):
        assert K.Effort(0, 80).cost() == 0.0

    def test_validation(self):
        with pytest.raises(ValueError):
            K.Effort(-1, 50)
        with pytest.raises(ValueError):
            K.Effort(1, 101)


class TestSolutionKPIs:
    def test_total_cost_sums_components(self):
        s = K.SolutionKPIs(
            name="s",
            general_costs=1000.0,
            integration_effort=K.Effort(10, 0),  # 300
            domain_config_effort=K.Effort(5, 100),  # 750
            technique_config_effort=K.Effort(0, 0),
        )
        assert s.total_cost(30, 150) == pytest.approx(1000 + 300 + 750)

    def test_defaults_are_free(self):
        assert K.SolutionKPIs(name="s").total_cost() == 0.0


class TestDecisionMatrix:
    def _solutions(self):
        return [
            K.SolutionKPIs(
                name="rules",
                general_costs=0,
                technique_config_effort=K.Effort(20, 80),
                deployment_types=("on-premise",),
                techniques=("rule-based",),
            ),
            K.SolutionKPIs(
                name="ml",
                general_costs=5000,
                domain_config_effort=K.Effort(40, 60),
                deployment_types=("cloud",),
                techniques=("supervised-ml",),
            ),
        ]

    def test_one_row_per_solution(self):
        m = K.decision_matrix(self._solutions())
        assert list(m["solution"]) == ["rules", "ml"]

    def test_quality_metrics_joined(self):
        m = K.decision_matrix(
            self._solutions(), quality={"rules": {"f1": 0.8}, "ml": {"f1": 0.9}}
        )
        assert list(m["f1"]) == [0.8, 0.9]

    def test_categoricals_rendered(self):
        m = K.decision_matrix(self._solutions())
        assert m.loc[0, "techniques"] == "rule-based"

    def test_aggregate_sorts_by_strategy(self):
        out = K.aggregate(self._solutions(), lambda s: s.total_cost())
        assert list(out["solution"]) == ["rules", "ml"]  # rules cheaper


class TestEffortLog:
    def test_chronological_enforced(self):
        log = K.EffortLog("s")
        log.record(1.0, 0.5)
        with pytest.raises(ValueError):
            log.record(0.5, 0.6)

    def test_diagram_running_max(self):
        log = K.EffortLog("s")
        for h, v in [(1, 0.3), (2, 0.6), (3, 0.5), (4, 0.8)]:
            log.record(h, v)
        d = K.effort_metric_diagram([log])
        assert list(d["best_metric"]) == [0.3, 0.6, 0.6, 0.8]

    def test_effort_to_reach(self):
        log = K.EffortLog("s")
        for h, v in [(1, 0.3), (5, 0.7), (10, 0.9)]:
            log.record(h, v)
        d = K.effort_metric_diagram([log])
        assert K.effort_to_reach(d, "s", 0.7) == 5.0
        assert K.effort_to_reach(d, "s", 0.95) is None

    def test_multiple_solutions(self):
        a, b = K.EffortLog("a"), K.EffortLog("b")
        a.record(1, 0.9)
        b.record(1, 0.2)
        d = K.effort_metric_diagram([a, b])
        assert set(d["solution"]) == {"a", "b"}
