"""Benchmark for paper Table 3 — the full cross-dataset evaluation grid.

Develops 3 matchers per training split and evaluates all of them on every
split with the Frost metrics pipeline (24 evaluations). The averaged grid
is the paper's Table 3; measured values go to EXPERIMENTS.md. Shape
assertions encode the paper's key finding: dense-trained solutions collapse
on sparse data, sparse-trained solutions transfer.
"""
from repro.experiments.table3 import run_table3, table3_matrix


def test_table3_cross_dataset(spark, benchmark):
    tidy = benchmark.pedantic(run_table3, args=(spark,), rounds=1, iterations=1)
    avg = tidy[tidy["matcher"] == "average"].set_index(
        ["developed_on", "applied_to"]
    )

    def cell(dev, applied):
        return float(avg.loc[(dev, applied), "f1"])

    assert cell("X2", "X2") > 0.85  # paper 99.8%
    assert cell("X2", "Z2") > 0.7  # paper 97.4%
    assert cell("X2", "X3") < 0.6  # paper 35.7%
    assert cell("X2", "Z3") < 0.6  # paper 47.0%
    assert cell("X3", "Z3") > 0.85  # paper 98.2%
    # Transfer asymmetry: sparse-trained transfers, dense-trained collapses.
    assert cell("X3", "X2") - cell("X2", "X3") > 0.2
    print("\n" + table3_matrix(tidy).round(3).to_string())
