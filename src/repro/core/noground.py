"""Quality estimation without a ground truth (paper §3.2.3).

Real-world use cases usually have no gold standard — that is why a matcher
is being run at all. Frost therefore estimates result quality from inherent
properties of the result and from agreement with other solutions:

- :func:`closure_violation_count` — the minimum number of pairs to add for
  transitive closedness; large values mean inconsistent matches.
- :func:`link_redundancy` — redundancy of the identity link network
  [Idrissou et al. 2018]: within a cluster of size n, n-1 edges are the
  minimum to connect it; every additional edge re-confirms the identity
  links. High redundancy correlates with high matching quality.
- :func:`consensus_deviations` — deviations of each experiment from the
  per-pair majority vote over several experiments [Vogel et al. 2014]; the
  consensus is a good indicator of correctness.
- :func:`compactness_sparsity` — Chaudhuri-style cluster compactness (mean
  similarity of matches) vs neighbourhood sparsity (mean similarity of close
  non-matches); duplicates should be closer to each other than to others.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.clustering import connected_components
from repro.core.pairs import pairs_from_clustering


def closure_violation_count(pairs: DataFrame, records: DataFrame) -> int:
    """Number of pairs missing for the match set to be transitively closed."""
    clustering = connected_components(pairs, records.select("rid"))
    closed_count = (
        clustering.groupBy("cluster")
        .agg(F.count("*").alias("n"))
        .agg(F.sum(F.col("n") * (F.col("n") - 1) / 2))
        .first()[0]
    )
    return int(closed_count or 0) - pairs.select("id1", "id2").distinct().count()


def link_redundancy(pairs: DataFrame, records: DataFrame) -> float:
    """Redundancy of the identity link network, in [0, 1].

    For each non-singleton component with n nodes and e edges, the redundant
    edges are e - (n - 1) out of a possible C(n,2) - (n - 1). We report the
    edge-weighted average over components (components of size 2 contribute
    ratio 0 of 0 and are skipped). 1.0 means every cluster is a full clique.
    """
    clustering = connected_components(pairs, records.select("rid"))
    edge_clusters = (
        pairs.join(
            clustering.withColumnRenamed("rid", "id1"), on="id1"
        )
        .groupBy("cluster")
        .agg(F.count("*").alias("e"))
    )
    sizes = clustering.groupBy("cluster").agg(F.count("*").alias("n"))
    per = (
        sizes.join(edge_clusters, "cluster", "inner")
        .filter(F.col("n") > 2)
        .withColumn("extra", F.col("e") - (F.col("n") - 1))
        .withColumn(
            "possible", F.col("n") * (F.col("n") - 1) / 2 - (F.col("n") - 1)
        )
    )
    row = per.agg(
        F.sum("extra").alias("extra"), F.sum("possible").alias("possible")
    ).first()
    if not row or not row["possible"]:
        return 0.0
    return float(row["extra"]) / float(row["possible"])


def majority_vote(experiments: list[DataFrame]) -> DataFrame:
    """Per-pair majority vote over experiments (pair sets).

    A pair is in the consensus iff more than half of the experiments contain
    it. Returns the consensus pair set — usable as an "experimental ground
    truth" (§4.1, [Vogel et al. 2014]).
    """
    n = len(experiments)
    union = None
    for e in experiments:
        tagged = e.select("id1", "id2")
        union = tagged if union is None else union.unionByName(tagged)
    votes = union.groupBy("id1", "id2").agg(F.count("*").alias("votes"))
    return votes.filter(F.col("votes") * 2 > n).select("id1", "id2")


def consensus_deviations(experiments: list[DataFrame]) -> list[int]:
    """For each experiment, |E Δ consensus| — lower is (estimated) better."""
    consensus = majority_vote(experiments).cache()
    out = []
    for e in experiments:
        pairs = e.select("id1", "id2")
        missing = consensus.join(pairs, ["id1", "id2"], "left_anti").count()
        extra = pairs.join(consensus, ["id1", "id2"], "left_anti").count()
        out.append(missing + extra)
    consensus.unpersist()
    return out


def compactness_sparsity(
    scored_matches: DataFrame, scored_non_matches: DataFrame
) -> dict[str, float]:
    """Compactness (mean match similarity) and neighbourhood sparsity gap.

    ``scored_non_matches`` should be the *close* non-matches (e.g. candidate
    pairs below the threshold) — the matcher must expose scores for both
    (§3.2.3). The returned ``separation`` (compactness − neighbour mean) is
    the quality proxy: well-separated clusters score high.
    """
    comp = scored_matches.agg(F.avg("similarity")).first()[0]
    spars = scored_non_matches.agg(F.avg("similarity")).first()[0]
    comp = float(comp) if comp is not None else 0.0
    spars = float(spars) if spars is not None else 0.0
    return {
        "compactness": comp,
        "neighbour_similarity": spars,
        "separation": comp - spars,
    }
