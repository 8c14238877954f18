"""Benchmark for paper Table 1 — metric/metric diagram runtime, custom vs naïve.

One pytest-benchmark entry per (dataset, algorithm): five datasets x two
algorithms at s = 100 thresholds, exactly the paper's sweep. Workloads are
count-faithful synthetic stand-ins (DESIGN.md substitution 2); the two
largest datasets are scaled down so the naïve baseline terminates in CI
time. The resulting rows (and speedups) are recorded in EXPERIMENTS.md.
"""
import pytest

from repro.core.incremental import confusion_series, naive_confusion_series
from repro.experiments.table1 import N_THRESHOLDS, WORKLOADS, build_workload

_CACHE = {}


def _workload(name):
    if name not in _CACHE:
        _CACHE[name] = build_workload(name)
    return _CACHE[name]


@pytest.mark.parametrize("name", list(WORKLOADS))
def test_table1_custom(benchmark, name):
    """Snowman's incremental algorithm (Appendix D)."""
    w = _workload(name)
    result = benchmark.pedantic(
        confusion_series,
        args=(w.n_records, w.truth_labels, w.matches, N_THRESHOLDS),
        rounds=1,
        iterations=1,
    )
    assert len(result) == N_THRESHOLDS
    benchmark.extra_info["records"] = w.n_records
    benchmark.extra_info["matches"] = len(w.matches)


@pytest.mark.parametrize("name", list(WORKLOADS))
def test_table1_naive(benchmark, name):
    """The naïve per-threshold recompute the paper compares against."""
    w = _workload(name)
    result = benchmark.pedantic(
        naive_confusion_series,
        args=(w.n_records, w.truth_labels, w.matches, N_THRESHOLDS),
        rounds=1,
        iterations=1,
    )
    assert len(result) == N_THRESHOLDS
    benchmark.extra_info["records"] = w.n_records
    benchmark.extra_info["matches"] = len(w.matches)
