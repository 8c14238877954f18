"""Snowman's incremental metric/metric-diagram engine (paper Appendix D).

Computes a sequence of confusion matrices for ``s`` similarity thresholds
over a scored match list, in O(|D| + |Matches|·s) instead of the naïve
O(s·(|D| + |Matches|)):

- :class:`UnionFind` tracks cluster sizes and the total intra-cluster pair
  count, and supports ``tracked_union`` (the paper's ``trackedUnion``): a
  batched union that reports which pre-batch clusters merged into which
  post-batch cluster.
- :class:`DynamicIntersection` maintains the intersection clustering of the
  (growing) experiment clustering with the fixed ground-truth clustering
  (paper Algorithm 2). The number of true-positive pairs at any point equals
  the pair count of the intersection clustering (Fig. 10).
- :func:`confusion_series` is paper Algorithm 1. :func:`naive_confusion_series`
  is the paper's "slightly more advanced naïve" baseline — rebuild clustering
  and intersection from scratch at every threshold — which Table 1 compares
  against.

This engine is deliberately a driver-side data structure: the algorithm is a
sequential fold over matches sorted by similarity (each step depends on all
previous unions), which is exactly why the paper built a bespoke structure
rather than re-running a dataflow per threshold. The Spark-side counterpart
for pair-level (non-closure) sweeps lives in :mod:`repro.core.diagrams`.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Hashable, Iterable, Sequence


@dataclass(frozen=True)
class Confusion:
    """One diagram data point: confusion cells at a similarity threshold."""

    threshold: float
    tp: int
    fp: int
    fn: int
    tn: int


class UnionFind:
    """Union-find with union-by-size, path compression, and pair counting.

    ``pair_count`` is Σ C(size(c), 2) over all clusters — the number of
    intra-cluster pairs — maintained in O(1) per union [Tarjan 1972 for the
    asymptotics of find/union].
    """

    def __init__(self, n: int) -> None:
        self.parent = list(range(n))
        self.size = [1] * n
        self.pair_count = 0

    def find(self, x: int) -> int:
        root = x
        while self.parent[root] != root:
            root = self.parent[root]
        while self.parent[x] != root:  # path compression
            self.parent[x], x = root, self.parent[x]
        return root

    def union(self, a: int, b: int) -> int:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return ra
        if self.size[ra] < self.size[rb]:
            ra, rb = rb, ra
        self.parent[rb] = ra
        self.pair_count += self.size[ra] * self.size[rb]
        self.size[ra] += self.size[rb]
        return ra

    def tracked_union(
        self, pairs: Iterable[tuple[int, int]]
    ) -> list[tuple[int, list[int]]]:
        """Batched union returning the paper's ``Merges`` list.

        Each entry is ``(target, sources)``: the id of a post-batch cluster
        together with the pre-batch cluster ids that now constitute it.
        Entries are only produced for clusters that actually changed
        (``len(sources) >= 2``). Cluster ids are union-find roots; the target
        root may coincide with one of its sources, matching the paper's
        "newly created cluster" bookkeeping without minting fresh ids.
        """
        touched: dict[int, int] = {}  # pre-batch root -> marker
        for a, b in pairs:
            for x in (a, b):
                r = self.find(x)
                touched.setdefault(r, r)
        for a, b in pairs:
            self.union(a, b)
        groups: dict[int, list[int]] = {}
        for old_root in touched:
            groups.setdefault(self.find(old_root), []).append(old_root)
        return [(tgt, srcs) for tgt, srcs in groups.items() if len(srcs) >= 2]


class DynamicIntersection:
    """Intersection clustering of experiment × ground truth (Algorithm 2).

    Stored exactly as in the paper: a union-find over records whose clusters
    are the nonempty intersections (for pair counting), plus a two-level map
    ``experiment cluster -> {truth cluster -> intersection root}`` to find
    the clusters affected by an experiment merge in time linear in the
    number of involved intersection clusters.
    """

    def __init__(self, truth_labels: Sequence[Hashable]) -> None:
        n = len(truth_labels)
        self.truth = list(truth_labels)
        self.uf = UnionFind(n)
        # Initially every record is its own experiment cluster and its own
        # intersection cluster (paper Fig. 10 step 0).
        self.by_exp: dict[int, dict[Hashable, int]] = {
            r: {truth_labels[r]: r} for r in range(n)
        }

    @property
    def tp_pairs(self) -> int:
        """TP count = number of pairs inside intersection clusters."""
        return self.uf.pair_count

    def apply_merges(self, merges: list[tuple[int, list[int]]]) -> None:
        """Fold a ``tracked_union`` result into the intersection clustering."""
        for target, sources in merges:
            # Collect every intersection cluster belonging to a source
            # experiment cluster, grouped by ground-truth cluster.
            by_truth: dict[Hashable, list[int]] = {}
            for src in sources:
                for tcluster, icluster in self.by_exp.pop(src, {}).items():
                    by_truth.setdefault(tcluster, []).append(icluster)
            new_map: dict[Hashable, int] = {}
            for tcluster, iclusters in by_truth.items():
                root = iclusters[0]
                for other in iclusters[1:]:
                    root = self.uf.union(root, other)
                new_map[tcluster] = self.uf.find(root)
            self.by_exp[target] = new_map


def _split_ranges(n_matches: int, s: int) -> list[tuple[int, int]]:
    """Split ``n_matches`` sorted matches into ``s - 1`` contiguous ranges.

    The paper samples diagram points every ``|Matches| / (s-1)`` matches (not
    at equidistant thresholds) to avoid empty segments; we use the same
    policy, rounding range borders when |Matches| is not divisible.
    """
    if s < 2:
        return []
    borders = [round(i * n_matches / (s - 1)) for i in range(s)]
    return [(borders[i], borders[i + 1]) for i in range(s - 1)]


def _prepare(
    matches: Sequence[tuple[float, int, int]]
) -> list[tuple[float, int, int]]:
    return sorted(matches, key=lambda m: -m[0])


def confusion_series(
    n_records: int,
    truth_labels: Sequence[Hashable],
    matches: Sequence[tuple[float, int, int]],
    s: int,
) -> list[Confusion]:
    """Paper Algorithm 1: ``s`` confusion matrices over descending thresholds.

    ``matches`` are ``(similarity, record_a, record_b)`` with records as
    dense integer ids in ``[0, n_records)``; ``truth_labels[r]`` is the gold
    cluster of record ``r``. Point 0 is the empty experiment (threshold ∞);
    point ``i`` includes the ``i·|Matches|/(s-1)`` highest-similarity matches,
    transitively closed.
    """
    exp = UnionFind(n_records)
    inter = DynamicIntersection(truth_labels)
    counts: dict[Hashable, int] = {}
    for t in truth_labels:
        counts[t] = counts.get(t, 0) + 1
    gold_pairs = sum(c * (c - 1) // 2 for c in counts.values())
    total = n_records * (n_records - 1) // 2

    def snapshot(threshold: float) -> Confusion:
        tp = inter.tp_pairs
        fp = exp.pair_count - tp
        fn = gold_pairs - tp
        return Confusion(threshold, tp, fp, fn, total - tp - fp - fn)

    ordered = _prepare(matches)
    out = [snapshot(float("inf"))]
    for start, stop in _split_ranges(len(ordered), s):
        batch = ordered[start:stop]
        merges = exp.tracked_union([(a, b) for _, a, b in batch])
        inter.apply_merges(merges)
        out.append(snapshot(ordered[stop - 1][0] if stop > start else out[-1].threshold))
    return out


def naive_confusion_series(
    n_records: int,
    truth_labels: Sequence[Hashable],
    matches: Sequence[tuple[float, int, int]],
    s: int,
) -> list[Confusion]:
    """Naïve baseline (paper Appendix D): recompute everything per threshold.

    For each of the ``s`` thresholds, build the experiment clustering from
    scratch with a fresh union-find, then compute the intersection pair count
    by grouping records on (experiment root, truth cluster). Linear per
    threshold — this is the stronger of the two naïve variants the paper
    describes, and the one timed in Table 1.
    """
    counts: dict[Hashable, int] = {}
    for t in truth_labels:
        counts[t] = counts.get(t, 0) + 1
    gold_pairs = sum(c * (c - 1) // 2 for c in counts.values())
    total = n_records * (n_records - 1) // 2
    ordered = _prepare(matches)
    prefixes = [0] + [stop for _, stop in _split_ranges(len(ordered), s)]
    out: list[Confusion] = []
    for k in prefixes:
        uf = UnionFind(n_records)
        for _, a, b in ordered[:k]:
            uf.union(a, b)
        isizes: dict[tuple[int, Hashable], int] = {}
        for r in range(n_records):
            key = (uf.find(r), truth_labels[r])
            isizes[key] = isizes.get(key, 0) + 1
        tp = sum(c * (c - 1) // 2 for c in isizes.values())
        fp = uf.pair_count - tp
        fn = gold_pairs - tp
        thr = ordered[k - 1][0] if k else float("inf")
        out.append(Confusion(thr, tp, fp, fn, total - tp - fp - fn))
    return out
