"""Attribute sparsity and attribute equality influence (paper §4.5.2–4.5.3).

Which attributes drove the matcher's mistakes?

- ``nullRatio(a) = falseNullCount(a) / nullCount(a)`` — among the pairs with
  a null in attribute ``a``, the fraction that were misclassified. High
  values flag attributes whose *absence* correlates with errors (semantic
  or material mismatch, see the paper's discussion).
- ``equalRatio(a) = falseEqualCount(a) / equalCount(a)`` — among the pairs
  *equal* in ``a``, the fraction misclassified; high values mean the matcher
  mis-weighted the matching sufficiency of ``a``.

``nullCount``/``equalCount`` range over all of [D]^2, which is quadratic —
both are computed in closed form from per-record/per-value counts instead of
materialising pairs. Only the misclassified pair set (FP ∪ FN), which is
small, is joined against record attributes.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def null_counts(dataset: DataFrame, attribute: str) -> int:
    """nullCount(a): pairs of [D]^2 with >=1 record null in ``a`` (closed form).

    C(n, 2) − C(n_nonnull, 2).
    """
    n = dataset.count()
    nn = dataset.filter(F.col(attribute).isNotNull()).count()
    return n * (n - 1) // 2 - nn * (nn - 1) // 2


def equal_counts(dataset: DataFrame, attribute: str) -> int:
    """equalCount(a): pairs of [D]^2 with both records equal (non-null) in ``a``.

    Σ over attribute values v of C(count(v), 2).
    """
    row = (
        dataset.filter(F.col(attribute).isNotNull())
        .groupBy(attribute)
        .agg(F.count("*").alias("c"))
        .agg(F.sum(F.col("c") * (F.col("c") - 1) / 2))
        .first()
    )
    return int(row[0] or 0)


def _pair_attrs(pairs: DataFrame, dataset: DataFrame, attribute: str) -> DataFrame:
    a = dataset.select(F.col("rid").alias("id1"), F.col(attribute).alias("_a1"))
    b = dataset.select(F.col("rid").alias("id2"), F.col(attribute).alias("_a2"))
    return pairs.select("id1", "id2").join(a, "id1").join(b, "id2")


def false_null_count(
    misclassified: DataFrame, dataset: DataFrame, attribute: str
) -> int:
    """falseNullCount(a): misclassified pairs with >=1 null in ``a``."""
    pa = _pair_attrs(misclassified, dataset, attribute)
    return pa.filter(F.col("_a1").isNull() | F.col("_a2").isNull()).count()


def false_equal_count(
    misclassified: DataFrame, dataset: DataFrame, attribute: str
) -> int:
    """falseEqualCount(a): misclassified pairs equal (non-null) in ``a``."""
    pa = _pair_attrs(misclassified, dataset, attribute)
    return pa.filter(
        F.col("_a1").isNotNull() & (F.col("_a1") == F.col("_a2"))
    ).count()


def null_ratio(misclassified: DataFrame, dataset: DataFrame, attribute: str) -> float:
    nc = null_counts(dataset, attribute)
    return false_null_count(misclassified, dataset, attribute) / nc if nc else 0.0


def equal_ratio(misclassified: DataFrame, dataset: DataFrame, attribute: str) -> float:
    ec = equal_counts(dataset, attribute)
    return false_equal_count(misclassified, dataset, attribute) / ec if ec else 0.0


def attribute_influence_report(
    misclassified: DataFrame, dataset: DataFrame, attributes: list[str] | None = None
) -> pd.DataFrame:
    """The §4.5.2/4.5.3 bar-chart data: one row per attribute.

    ``misclassified`` is FP ∪ FN as a canonical pair set. Columns:
    nullCount, falseNullCount, nullRatio, equalCount, falseEqualCount,
    equalRatio. Attributes default to every non-``rid`` column.
    """
    attributes = attributes or [c for c in dataset.columns if c != "rid"]
    rows = []
    for a in attributes:
        nc = null_counts(dataset, a)
        fnc = false_null_count(misclassified, dataset, a)
        ec = equal_counts(dataset, a)
        fec = false_equal_count(misclassified, dataset, a)
        rows.append(
            {
                "attribute": a,
                "nullCount": nc,
                "falseNullCount": fnc,
                "nullRatio": fnc / nc if nc else 0.0,
                "equalCount": ec,
                "falseEqualCount": fec,
                "equalRatio": fec / ec if ec else 0.0,
            }
        )
    return pd.DataFrame(rows)
