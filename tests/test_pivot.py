"""Tests for KwikCluster / C4 / ClusterWild! (baselines.pivot)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.pivot import kwikcluster, parallel_pivot
from repro.core.seq_louvain import build_csr, csr_objective
from repro.graphs.gen import GenGraph, planted_partition
from repro.graphs.ops import to_spark


def _clique(n: int) -> GenGraph:
    rows = [(i, j, 1.0) for i in range(n) for j in range(i + 1, n)]
    return GenGraph(name="clique", n=n, edges=pd.DataFrame(rows, columns=["u", "v", "w"]))


def _valid_pivot_clustering(g: GenGraph, labels: np.ndarray) -> None:
    """Every cluster is a pivot plus a subset of its neighbors."""
    adj = {}
    for u, v in zip(g.edges["u"].to_numpy(), g.edges["v"].to_numpy()):
        adj.setdefault(u, set()).add(v)
        adj.setdefault(v, set()).add(u)
    for lbl in np.unique(labels):
        members = np.flatnonzero(labels == lbl)
        assert lbl in members, "pivot must belong to its own cluster"
        for m in members:
            if m != lbl:
                assert m in adj.get(lbl, set()), "member not adjacent to pivot"


class TestKwikCluster:
    def test_clique_single_cluster(self):
        g = _clique(6)
        labels = kwikcluster(g, seed=0)
        assert len(np.unique(labels)) == 1

    def test_pivot_structure(self):
        g = planted_partition(300, avg_deg=6, mixing=0.3, seed=1)
        labels = kwikcluster(g, seed=2)
        _valid_pivot_clustering(g, labels)

    def test_isolated_vertices_singletons(self):
        edges = pd.DataFrame({"u": [0], "v": [1], "w": [1.0]})
        g = GenGraph(name="iso", n=4, edges=edges)
        labels = kwikcluster(g, seed=0)
        assert labels[0] == labels[1]
        assert labels[2] != labels[3]

    def test_deterministic(self):
        g = planted_partition(200, avg_deg=5, mixing=0.3, seed=3)
        np.testing.assert_array_equal(kwikcluster(g, seed=5), kwikcluster(g, seed=5))


class TestParallelPivot:
    @pytest.mark.parametrize("variant", ["c4", "wild"])
    def test_structure(self, spark, variant):
        g = planted_partition(300, avg_deg=6, mixing=0.3, seed=4)
        gd = to_spark(spark, g, partitions=4)
        labels, rounds = parallel_pivot(gd, variant=variant, seed=1)
        assert rounds >= 1
        _valid_pivot_clustering(g, labels)

    def test_c4_matches_kwikcluster_partition(self, spark):
        """C4's concurrency control makes it serializable: with the same
        rank permutation it produces exactly KwikCluster's clustering."""
        g = planted_partition(250, avg_deg=6, mixing=0.3, seed=5)
        gd = to_spark(spark, g, partitions=4)
        labels_c4, _ = parallel_pivot(gd, variant="c4", seed=7)
        # Replay sequential KwikCluster with the same permutation.
        rng = np.random.default_rng(7)
        rank = rng.permutation(g.n).astype("int64")
        order = np.argsort(rank)
        adj = {}
        for u, v in zip(g.edges["u"].to_numpy(), g.edges["v"].to_numpy()):
            adj.setdefault(u, set()).add(v)
            adj.setdefault(v, set()).add(u)
        labels_seq = np.full(g.n, -1, dtype="int64")
        for p in order:
            if labels_seq[p] != -1:
                continue
            labels_seq[p] = p
            for nb in adj.get(p, ()):  # noqa: B905
                if labels_seq[nb] == -1:
                    labels_seq[nb] = p
        np.testing.assert_array_equal(labels_c4, labels_seq)

    def test_pivot_cc_objective_much_worse_than_positive(self, spark):
        """§C.1's point: pivots give poor/negative LambdaCC objective at
        general resolutions."""
        g = planted_partition(400, avg_deg=10, mixing=0.4, seed=6)
        gd = to_spark(spark, g, partitions=4)
        labels, _ = parallel_pivot(gd, variant="wild", seed=2)
        csr = build_csr(g.edges, g.n, np.ones(g.n))
        obj = csr_objective(csr, labels, 0.85)
        assert obj < 0  # large λ punishes the coarse pivot clusters
