"""T9 — C4 / ClusterWild! comparison (Appendix C.1).

The paper: pivots are up to 139x/429x faster than PAR-CC but drop the CC
objective by 273–433% (often negative) and get precision 0.44–0.65 at
recall 0.10–0.15, vs PAR-CC's recall 0.61–0.98 at precision > 0.5.
Reported here: runtime, CC objective at λ=0.5 (the only resolution
pivots optimize) and at λ=0.85, and precision/recall.
"""
from __future__ import annotations

import time

import numpy as np

from repro.baselines.pivot import kwikcluster, parallel_pivot
from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.core.seq_louvain import build_csr, csr_objective
from repro.eval.harness import table
from repro.eval.quality import avg_precision_recall
from repro.graphs.gen import lite_suite
from repro.graphs.ops import to_spark


def run(spark, quick: bool = False):
    graphs = ["amazon-lite"] if quick else ["amazon-lite", "dblp-lite"]
    rows = []
    for name, g in lite_suite(graphs).items():
        gt = g.gt_communities()
        csr = build_csr(g.edges, g.n, np.ones(g.n))
        gd = to_spark(spark, g, partitions=8)
        gd.edges.cache().count()

        def record(algo, labels, t):
            prec, rec = avg_precision_recall(gt, labels)
            rows.append(
                {
                    "graph": name,
                    "algo": algo,
                    "time_s": t,
                    "cc_obj@0.5": csr_objective(csr, labels, 0.5),
                    "cc_obj@0.85": csr_objective(csr, labels, 0.85),
                    "n_clusters": len(np.unique(labels)),
                    "precision": prec,
                    "recall": rec,
                }
            )

        t0 = time.perf_counter()
        labels = kwikcluster(g, seed=8)
        record("kwikcluster", labels, time.perf_counter() - t0)
        for variant in ("c4", "wild"):
            t0 = time.perf_counter()
            labels, rounds = parallel_pivot(gd, variant=variant, seed=8)
            record(variant, labels, time.perf_counter() - t0)
        for lam in (0.5, 0.85):
            cfg = CCConfig(resolution=lam, num_iter=10, seed=8, partitions=8)
            assign, stats = parallel_cc(gd, cfg)
            record(f"par-cc@{lam}", assign, stats.total_time)
        gd.edges.unpersist()
    return table(rows, title="T9: pivot baselines vs PAR-CC (Appendix C.1)")


if __name__ == "__main__":
    from _common import main

    main(run)
