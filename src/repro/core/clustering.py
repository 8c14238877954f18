"""Connected components over DataFrames — the duplicate-clustering substrate.

Frost requires experiments to be transitively closed (§1.2, §4.2.4); real
matchers output raw match pairs, so the platform needs a clustering step.
This is the classic min-label propagation: every record starts with its own
label, and each iteration every record adopts the smallest label in its
neighbourhood, until a fixpoint. Runs entirely in the DataFrame API; the
iteration count is bounded by the largest cluster diameter, which is small
for dedup workloads (clusters are near-cliques).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def connected_components(
    pairs: DataFrame, records: DataFrame, max_iterations: int = 50
) -> DataFrame:
    """Cluster ``records`` (a DataFrame with column ``rid``) by ``pairs``.

    ``pairs`` is a canonical pair set ``(id1, id2)``. Returns a clustering
    ``(rid, cluster)`` where ``cluster`` is the minimum ``rid`` of the
    component (a stable, content-derived cluster id). Records that appear in
    no pair form singleton clusters.
    """
    edges = (
        pairs.select(F.col("id1").alias("src"), F.col("id2").alias("dst"))
        .union(pairs.select(F.col("id2").alias("src"), F.col("id1").alias("dst")))
        .distinct()
    )
    labels = records.select("rid", F.col("rid").alias("cluster")).localCheckpoint()
    for _ in range(max_iterations):
        neighbor_min = (
            edges.join(labels, edges.dst == labels.rid)
            .groupBy("src")
            .agg(F.min("cluster").alias("nmin"))
        )
        new_labels = (
            labels.join(neighbor_min, labels.rid == neighbor_min.src, "left")
            .select(
                "rid",
                F.least(
                    F.col("cluster"), F.coalesce(F.col("nmin"), F.col("cluster"))
                ).alias("cluster"),
            )
            .localCheckpoint()
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "rid")
            .filter(F.col("n.cluster") != F.col("o.cluster"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            break
    return labels
