"""§5.5 soft-KPI study — effort vs f1 (Figure 6 data, DESIGN.md substitution 5).

The paper manually optimised three solutions (rule-based → ML) on the
SIGMOD D4 task and tracked f1 against hours spent: each solution shows a
breakthrough, then a plateau at ~14 h. Human hours cannot be re-measured,
so a deterministic effort-log fixture replays that curve shape; what is
being reproduced is the KPI machinery — effort→cost conversion, the
running-max effort/metric diagram, and "effort to reach X" queries.
"""
from __future__ import annotations

import pandas as pd

from repro.kpis.softkpi import (
    Effort,
    EffortLog,
    SolutionKPIs,
    decision_matrix,
    effort_metric_diagram,
    effort_to_reach,
)

#: (hours, f1) tracking points per solution — breakthrough then ~14 h plateau.
EFFORT_TRACKS: dict[str, list[tuple[float, float]]] = {
    "rule-based": [
        (1, 0.12), (3, 0.25), (5, 0.31), (7, 0.62), (9, 0.71),
        (11, 0.74), (14, 0.78), (17, 0.79), (20, 0.79),
    ],
    "ml": [
        (1, 0.05), (3, 0.10), (6, 0.55), (8, 0.80), (10, 0.86),
        (12, 0.88), (14, 0.90), (18, 0.905), (22, 0.91),
    ],
    "hybrid": [
        (1, 0.20), (4, 0.35), (6, 0.40), (9, 0.75), (11, 0.82),
        (14, 0.85), (16, 0.86), (20, 0.86),
    ],
}

#: soft KPIs of the three solutions for the decision matrix.
SOLUTION_KPIS = [
    SolutionKPIs(
        name="rule-based",
        general_costs=0.0,
        technique_config_effort=Effort(20, 80),
        deployment_types=("on-premise",),
        interfaces=("CLI",),
        techniques=("rule-based",),
    ),
    SolutionKPIs(
        name="ml",
        general_costs=4000.0,
        domain_config_effort=Effort(22, 60),  # labeling training data
        deployment_types=("cloud",),
        interfaces=("API",),
        techniques=("supervised-ml",),
    ),
    SolutionKPIs(
        name="hybrid",
        general_costs=1500.0,
        domain_config_effort=Effort(10, 60),
        technique_config_effort=Effort(10, 80),
        deployment_types=("on-premise", "cloud"),
        interfaces=("GUI", "API"),
        techniques=("rule-based", "supervised-ml"),
    ),
]


def run_softkpi_study() -> dict[str, pd.DataFrame]:
    """Effort/metric diagram data + decision matrix + reach queries."""
    logs = []
    for name, points in EFFORT_TRACKS.items():
        log = EffortLog(name)
        for h, v in points:
            log.record(h, v)
        logs.append(log)
    diagram = effort_metric_diagram(logs)
    quality = {
        name: {"final_f1": points[-1][1]} for name, points in EFFORT_TRACKS.items()
    }
    matrix = decision_matrix(SOLUTION_KPIS, quality=quality)
    reach = pd.DataFrame(
        [
            {
                "solution": name,
                "hours_to_f1_0.8": effort_to_reach(diagram, name, 0.8),
                "plateau_f1": points[-1][1],
            }
            for name, points in EFFORT_TRACKS.items()
        ]
    )
    return {"diagram": diagram, "decision_matrix": matrix, "reach": reach}
