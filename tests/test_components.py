"""Tests for connected components (graphs.components) vs a union-find oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs import gen
from repro.graphs.components import connected_components
from repro.graphs.ops import to_spark


def _union_find(n: int, edges: pd.DataFrame) -> np.ndarray:
    parent = np.arange(n)

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for u, v in zip(edges["u"].to_numpy(), edges["v"].to_numpy()):
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[max(ru, rv)] = min(ru, rv)
    return np.array([find(x) for x in range(n)])


def _same_partition(a: np.ndarray, b: np.ndarray) -> bool:
    da = pd.Series(a).groupby(a).ngroup().to_numpy()
    db = pd.Series(b).groupby(b).ngroup().to_numpy()
    return bool((da == db).all())


class TestConnectedComponents:
    def test_two_cliques(self, spark):
        rows = [(i, j, 1.0) for i in range(4) for j in range(i + 1, 4)]
        rows += [(i, j, 1.0) for i in range(5, 9) for j in range(i + 1, 9)]
        edges = pd.DataFrame(rows, columns=["u", "v", "w"])
        g = gen.GenGraph(name="cliques", n=10, edges=edges)
        labels = connected_components(to_spark(spark, g, partitions=2))
        assert len(set(labels[:4])) == 1
        assert len(set(labels[5:9])) == 1
        assert labels[4] not in (labels[0], labels[5])
        assert labels[9] not in (labels[0], labels[5])

    def test_path_graph_converges(self, spark):
        n = 40
        edges = pd.DataFrame(
            {"u": np.arange(n - 1), "v": np.arange(1, n), "w": 1.0}
        )
        g = gen.GenGraph(name="path", n=n, edges=edges)
        labels = connected_components(to_spark(spark, g, partitions=2))
        assert (labels == 0).all()

    def test_matches_union_find_on_random_graph(self, spark):
        g = gen.planted_partition(400, avg_deg=3, mixing=0.4, seed=3)
        labels = connected_components(to_spark(spark, g, partitions=4))
        exp = _union_find(g.n, g.edges)
        assert _same_partition(labels, exp)

    def test_isolated_vertices_are_singletons(self, spark):
        edges = pd.DataFrame({"u": [0], "v": [1], "w": [1.0]})
        g = gen.GenGraph(name="iso", n=5, edges=edges)
        labels = connected_components(to_spark(spark, g, partitions=2))
        assert labels[0] == labels[1]
        assert len({labels[2], labels[3], labels[4]}) == 3
