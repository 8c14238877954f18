"""Benchmark for paper Table 2 — the profiling pipeline on the full-scale
synthetic SIGMOD splits (SP/TX/TC/PR per split + VS per dataset).

The assertion block re-checks the Table-2 shape at full scale; the measured
values are recorded in EXPERIMENTS.md.
"""
from repro.experiments.table2 import run_table2


def test_table2_profiling(spark, benchmark):
    result = benchmark.pedantic(run_table2, args=(spark,), rounds=1, iterations=1)
    t = result.set_index("split")
    # Full-scale shape checks against the paper's Table 2.
    assert abs(t.loc["X2", "SP"] - 0.111) < 0.03
    assert abs(t.loc["X3", "SP"] - 0.501) < 0.03
    assert abs(t.loc["X2", "TX"] - 27.99) < 1.5
    assert abs(t.loc["X3", "TX"] - 15.53) < 1.5
    assert abs(t.loc["X2", "PR"] - 0.022) < 0.004
    assert abs(t.loc["Z3", "PR"] - 0.121) < 0.02
    assert t.loc["X2", "VS"] > t.loc["X3", "VS"]
    print("\n" + result.to_string(index=False))
