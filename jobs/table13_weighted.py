"""T13 — weighted k-NN graphs from pointsets (Figures 15 and 16).

Gaussian-blob pointsets → exact cosine k-NN graphs (ScaNN stand-in).
Compares PAR-CC on the unweighted view, PAR-CC^W (edge weights = cosine
similarity), PAR-MOD, and PAR-MOD^W (the paper says NetworKit matches
PAR-MOD^W, so that row doubles as the NetworKit line) on average
precision/recall and ARI/NMI against the class labels.
"""
from __future__ import annotations

import numpy as np

from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.eval.harness import table
from repro.eval.quality import ari, avg_precision_recall, nmi
from repro.graphs.gen import GenGraph, digits_like, knn_graph, letter_like
from repro.graphs.ops import to_spark


def _unweighted(g: GenGraph) -> GenGraph:
    e = g.edges.copy()
    e["w"] = 1.0
    return GenGraph(name=g.name + "-unw", n=g.n, edges=e, gt=g.gt)


def run(spark, quick: bool = False):
    datasets = [digits_like()] if quick else [digits_like(), letter_like()]
    lams = [0.2, 0.5, 0.8]
    gammas = [0.5, 1.0, 4.0]
    rows = []
    for ps in datasets:
        g_w = knn_graph(ps, k=20 if quick else 50)
        gt = g_w.gt_communities()
        variants = {
            "par-cc": (_unweighted(g_w), "cc", lams),
            "par-cc-w": (g_w, "cc", lams),
            "par-mod": (_unweighted(g_w), "modularity", gammas),
            "par-mod-w (networkit)": (g_w, "modularity", gammas),
        }
        for algo, (graph, objective, params) in variants.items():
            gd = to_spark(spark, graph, partitions=8)
            gd.edges.cache().count()
            for p in params:
                cfg = CCConfig(
                    resolution=p, objective=objective, num_iter=10, seed=11, partitions=8
                )
                assign, stats = parallel_cc(gd, cfg)
                prec, rec = avg_precision_recall(gt, assign)
                rows.append(
                    {
                        "dataset": ps.name,
                        "algo": algo,
                        "param": p,
                        "precision": prec,
                        "recall": rec,
                        "ari": ari(g_w.gt, assign),
                        "nmi": nmi(g_w.gt, assign),
                        "n_clusters": int(np.unique(assign).size),
                    }
                )
            gd.edges.unpersist()
    return table(rows, title="T13: weighted k-NN graphs, P/R + ARI/NMI (Fig 15+16)")


if __name__ == "__main__":
    from _common import main

    main(run)
