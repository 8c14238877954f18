"""Synthetic benchmark generators (substrate for §3.1 benchmark datasets).

Two kinds of workloads:

- :func:`clustered_dataset` — a dirty dataset with a gold-standard
  clustering: clean entities are expanded into 1..k corrupted records
  (GeCo-style, see :mod:`repro.matchgen.corrupt`). Used by exploration and
  matcher tests.
- :func:`diagram_workload` — the *structural* workload of Table 1: a ground
  truth clustering plus a scored match list with exact record/match counts.
  The runtimes of both Appendix-D algorithms depend only on |D|, |Matches|,
  s and cluster structure — not on attribute content — so Table 1 uses these
  count-faithful synthetic inputs in place of the original datasets
  (DESIGN.md substitution 2).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.matchgen.corrupt import corrupt_value

_WORDS = [
    # compact word pool for generic (non-SIGMOD) synthetic datasets
    "alpha", "bravo", "charlie", "delta", "echo", "foxtrot", "golf",
    "hotel", "india", "juliett", "kilo", "lima", "mike", "november",
    "oscar", "papa", "quebec", "romeo", "sierra", "tango", "uniform",
    "victor", "whiskey", "xray", "yankee", "zulu",
]


def clustered_dataset(
    spark: SparkSession,
    *,
    n_entities: int = 100,
    max_cluster: int = 4,
    dup_fraction: float = 0.4,
    errors_per_dup: int = 2,
    null_prob: float = 0.1,
    seed: int = 0,
) -> tuple[DataFrame, DataFrame]:
    """A dirty dataset + gold clustering.

    Returns ``(dataset, gold_clustering)`` where the dataset has columns
    ``rid, name, city, code`` and the clustering is ``(rid, cluster)`` with
    ``cluster`` = entity id. A ``dup_fraction`` of entities receive 1 to
    ``max_cluster - 1`` corrupted duplicate records.
    """
    rng = np.random.default_rng(seed)
    rows, gold = [], []
    rid = 0
    for ent in range(n_entities):
        name = " ".join(rng.choice(_WORDS, size=3))
        city = str(rng.choice(_WORDS))
        code = f"{rng.integers(10_000, 99_999)}"
        n_dups = (
            int(rng.integers(1, max_cluster)) if rng.random() < dup_fraction else 0
        )
        for i in range(1 + n_dups):
            if i == 0:
                rows.append((f"r{rid}", name, city, code))
            else:
                rows.append(
                    (
                        f"r{rid}",
                        corrupt_value(name, rng, errors_per_dup, null_prob),
                        corrupt_value(city, rng, 1, null_prob),
                        corrupt_value(code, rng, 1, null_prob),
                    )
                )
            gold.append((f"r{rid}", f"e{ent}"))
            rid += 1
    dataset = spark.createDataFrame(
        pd.DataFrame(rows, columns=["rid", "name", "city", "code"])
    )
    clustering = spark.createDataFrame(
        pd.DataFrame(gold, columns=["rid", "cluster"])
    )
    return dataset, clustering


@dataclass(frozen=True)
class DiagramWorkload:
    """Input for the Appendix-D engines: |D| records, gold labels, scored matches."""

    n_records: int
    truth_labels: list[int]
    matches: list[tuple[float, int, int]]


def diagram_workload(
    *,
    n_records: int,
    n_matches: int,
    mean_cluster: float = 3.0,
    fp_rate: float = 0.2,
    seed: int = 0,
) -> DiagramWorkload:
    """Count-faithful Table-1 workload.

    Builds a ground-truth clustering whose duplicate clusters (geometric-ish
    sizes, mean ``mean_cluster``) supply enough intra-cluster pairs, then
    draws exactly ``n_matches`` matches: ``1 - fp_rate`` true pairs with
    high similarity scores (Beta(5, 2)) and ``fp_rate`` random cross-cluster
    pairs with low scores (Beta(2, 5)) — an experiment that looks like an
    industry-grade matcher's output, as in the paper's setup.
    """
    rng = np.random.default_rng(seed)
    want_true = int(n_matches * (1 - fp_rate))
    labels = [0] * n_records
    true_pairs: list[tuple[int, int]] = []
    cluster, r = 0, 0
    # Grow duplicate clusters until the true-pair budget is met (or records run out).
    pair_budget = want_true
    while r < n_records and pair_budget > 0:
        size = 2 + int(rng.geometric(1.0 / max(mean_cluster - 1.0, 1.0)))
        size = min(size, n_records - r, 8)
        if size < 2:
            break
        members = list(range(r, r + size))
        for m in members:
            labels[m] = cluster
        for i, a in enumerate(members):
            for b in members[i + 1 :]:
                true_pairs.append((a, b))
        pair_budget -= size * (size - 1) // 2
        r += size
        cluster += 1
    # Remaining records are singletons with unique labels.
    for m in range(r, n_records):
        labels[m] = cluster
        cluster += 1
    rng.shuffle(true_pairs)
    chosen_true = true_pairs[:want_true]
    matches: list[tuple[float, int, int]] = [
        (float(rng.beta(5, 2)), a, b) for a, b in chosen_true
    ]
    seen = set(chosen_true)
    while len(matches) < n_matches:
        a, b = int(rng.integers(0, n_records)), int(rng.integers(0, n_records))
        if a == b:
            continue
        a, b = min(a, b), max(a, b)
        if (a, b) in seen or labels[a] == labels[b]:
            continue
        seen.add((a, b))
        matches.append((float(rng.beta(2, 5)), a, b))
    return DiagramWorkload(n_records=n_records, truth_labels=labels, matches=matches)
