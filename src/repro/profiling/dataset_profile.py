"""Dataset profiling for benchmark-dataset selection (paper §3.1.3, App. C.1).

Practitioners must pick a benchmark dataset that resembles their use-case
dataset; these metrics quantify the resemblance. The five Table-2 metrics:

- **Sparsity (SP)** — fraction of missing attribute values over the relevant
  attributes [Primpeli & Bizer 2020].
- **Textuality (TX)** — average number of whitespace words per non-null
  attribute value [Primpeli & Bizer 2020].
- **Tuple count (TC)** — record count; dataset size shifts the optimal
  similarity threshold [Draisbach & Naumann 2013].
- **Positive ratio (PR)** — true-duplicate pairs / all labeled pairs. The
  SIGMOD-contest benchmarks ship labeled candidate-pair lists, so the
  denominator is that labeled universe (documented interpretation; with no
  labeled list, C(n,2) is used).
- **Vocabulary similarity (VS)** — Jaccard of the whitespace-token
  vocabularies of two datasets.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _attr_cols(dataset: DataFrame, attributes: list[str] | None) -> list[str]:
    return attributes or [c for c in dataset.columns if c != "rid"]


def sparsity(dataset: DataFrame, attributes: list[str] | None = None) -> float:
    """SP: missing attribute values / all attribute values, in [0, 1]."""
    attrs = _attr_cols(dataset, attributes)
    n = dataset.count()
    if not n or not attrs:
        return 0.0
    nulls = dataset.select(
        [F.sum(F.col(a).isNull().cast("int")).alias(a) for a in attrs]
    ).first()
    return sum(nulls[a] for a in attrs) / (n * len(attrs))


def textuality(dataset: DataFrame, attributes: list[str] | None = None) -> float:
    """TX: average word count of non-null attribute values."""
    attrs = _attr_cols(dataset, attributes)
    counts = []
    for a in attrs:
        words = F.size(
            F.filter(
                F.split(F.trim(F.col(a).cast("string")), r"\s+"),
                lambda t: t != "",
            )
        )
        counts.append(
            dataset.filter(F.col(a).isNotNull()).select(
                F.sum(words).alias("w"), F.count("*").alias("n")
            )
        )
    from functools import reduce

    total = reduce(lambda x, y: x.unionByName(y), counts).agg(
        F.sum("w").alias("w"), F.sum("n").alias("n")
    ).first()
    return float(total["w"]) / float(total["n"]) if total["n"] else 0.0


def tuple_count(dataset: DataFrame) -> int:
    """TC: number of records."""
    return dataset.count()


def positive_ratio(
    gold_pairs: DataFrame,
    labeled_pairs: DataFrame | None = None,
    n_records: int | None = None,
) -> float:
    """PR: true duplicate pairs / labeled universe (or C(n,2) without one)."""
    pos = gold_pairs.count()
    if labeled_pairs is not None:
        denom = labeled_pairs.count()
    elif n_records is not None:
        denom = n_records * (n_records - 1) // 2
    else:
        raise ValueError("pass labeled_pairs or n_records")
    return pos / denom if denom else 0.0


def vocabulary(dataset: DataFrame, attributes: list[str] | None = None) -> DataFrame:
    """The whitespace-token vocabulary set of a dataset, as a 1-column DF."""
    attrs = _attr_cols(dataset, attributes)
    text = F.concat_ws(
        " ", *[F.coalesce(F.col(a).cast("string"), F.lit("")) for a in attrs]
    )
    return (
        dataset.select(
            F.explode(F.filter(F.split(text, r"\s+"), lambda t: t != "")).alias(
                "token"
            )
        )
        .distinct()
    )


def vocabulary_similarity(
    d1: DataFrame,
    d2: DataFrame,
    attributes1: list[str] | None = None,
    attributes2: list[str] | None = None,
) -> float:
    """VS(D1, D2): Jaccard coefficient of the two vocabularies (§3.1.3)."""
    v1 = vocabulary(d1, attributes1).cache()
    v2 = vocabulary(d2, attributes2).cache()
    inter = v1.join(v2, "token").count()
    union = v1.count() + v2.count() - inter
    v1.unpersist(), v2.unpersist()
    return inter / union if union else 0.0


def profile_dataset(
    dataset: DataFrame,
    gold_pairs: DataFrame | None = None,
    labeled_pairs: DataFrame | None = None,
    attributes: list[str] | None = None,
) -> dict[str, float]:
    """SP/TX/TC(/PR) of one dataset — one Table-2 column."""
    out: dict[str, float] = {
        "SP": sparsity(dataset, attributes),
        "TX": textuality(dataset, attributes),
        "TC": float(tuple_count(dataset)),
    }
    if gold_pairs is not None:
        out["PR"] = positive_ratio(
            gold_pairs,
            labeled_pairs=labeled_pairs,
            n_records=None if labeled_pairs is not None else tuple_count(dataset),
        )
    return out


def decision_matrix(profiles: dict[str, dict[str, float]]) -> pd.DataFrame:
    """Side-by-side profile comparison (§3.1.3 decision matrices).

    ``profiles`` maps dataset name -> profile dict; rows are metrics,
    columns datasets — the layout of paper Table 2.
    """
    return pd.DataFrame(profiles)
