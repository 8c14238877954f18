"""Entrypoint for the §5.5 soft-KPI study (Figure 6 data + decision matrix)."""
import sys

from repro.experiments.softkpi_study import run_softkpi_study


def main() -> None:
    out = run_softkpi_study()
    print("\nEffort/metric diagram data (running max f1 per solution):")
    print(out["diagram"].to_string(index=False))
    print("\nDecision matrix (soft KPIs + quality):")
    print(out["decision_matrix"].to_string(index=False))
    print("\nEffort to reach f1 >= 0.8:")
    print(out["reach"].to_string(index=False))


if __name__ == "__main__":
    sys.exit(main())
