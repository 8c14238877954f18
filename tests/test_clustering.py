"""Tests for repro.core.clustering — connected components substrate."""
import pandas as pd

from repro.core.clustering import connected_components


def _df(spark, rows, cols):
    if not rows:
        return spark.createDataFrame([], ", ".join(f"{c} string" for c in cols))
    return spark.createDataFrame(pd.DataFrame(rows, columns=list(cols)))


def _canon_comps(sets):
    """Canonical, totally ordered list of components (frozenset < is partial)."""
    return sorted((len(s), tuple(sorted(s))) for s in sets)


def _components(spark, edges, nodes):
    e = _df(spark, edges, ("id1", "id2"))
    n = _df(spark, [(x,) for x in nodes], ("rid",))
    out = connected_components(e, n).collect()
    comp: dict = {}
    for r in out:
        comp.setdefault(r["cluster"], set()).add(r["rid"])
    return _canon_comps(comp.values()), {r["rid"]: r["cluster"] for r in out}


class TestConnectedComponents:
    def test_single_edge(self, spark):
        comps, _ = _components(spark, [("a", "b")], ["a", "b"])
        assert comps == [(2, ("a", "b"))]

    def test_chain_is_one_component(self, spark):
        comps, _ = _components(
            spark, [("a", "b"), ("b", "c"), ("c", "d")], list("abcd")
        )
        assert comps == [(4, ("a", "b", "c", "d"))]

    def test_two_components_and_singleton(self, spark):
        comps, _ = _components(
            spark, [("a", "b"), ("c", "d")], list("abcde")
        )
        assert comps == [(1, ("e",)), (2, ("a", "b")), (2, ("c", "d"))]

    def test_long_path_converges(self, spark):
        # Path of 12 nodes exercises multiple propagation rounds.
        nodes = [f"n{i:02d}" for i in range(12)]
        edges = [(nodes[i], nodes[i + 1]) for i in range(11)]
        comps, _ = _components(spark, edges, nodes)
        assert comps == [(12, tuple(sorted(nodes)))]

    def test_cluster_label_is_min_rid(self, spark):
        _, labels = _components(spark, [("b", "c"), ("a", "b")], list("abc"))
        assert labels["c"] == "a"

    def test_no_edges_all_singletons(self, spark):
        comps, labels = _components(spark, [], list("abc"))
        assert len(comps) == 3
        assert all(labels[r] == r for r in "abc")

    def test_dense_clique(self, spark):
        nodes = [f"x{i}" for i in range(6)]
        edges = [(a, b) for i, a in enumerate(nodes) for b in nodes[i + 1 :]]
        comps, _ = _components(spark, edges, nodes)
        assert comps == [(6, tuple(sorted(nodes)))]

    def test_matches_networkx_free_reference(self, spark):
        # Reference union-find on the driver vs the Spark result.
        import random

        rng = random.Random(7)
        nodes = [f"r{i}" for i in range(40)]
        edges = [tuple(sorted(rng.sample(nodes, 2))) for _ in range(35)]
        comps, _ = _components(spark, edges, nodes)

        parent = {n: n for n in nodes}

        def find(x):
            while parent[x] != x:
                parent[x] = parent[parent[x]]
                x = parent[x]
            return x

        for a, b in edges:
            parent[find(a)] = find(b)
        expected: dict = {}
        for n in nodes:
            expected.setdefault(find(n), set()).add(n)
        assert comps == _canon_comps(expected.values())
