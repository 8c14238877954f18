"""spark-submit entrypoint for Table 1 (metric/metric diagram runtimes).

Usage: spark-submit jobs/table1_diagram_runtime.py  (or plain python).
The timed algorithms are driver-side (see Appendix D / DESIGN.md §2); Spark
is only needed here for consistency of the job harness.
"""
import sys

from repro.experiments.table1 import run_table1


def main() -> None:
    df = run_table1()
    print("\nTable 1 — runtime of metric/metric diagrams (s = 100 thresholds)")
    print(df.to_string(index=False))


if __name__ == "__main__":
    sys.exit(main())
