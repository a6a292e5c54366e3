"""T7 — average precision/recall vs ground truth (Figures 9 and 14).

Sweeps the resolution for PAR-CC (λ) and PAR-MOD (γ) plus the sequential
counterparts (SEQ with num_iter=10, and SEQ^CON) and reports the
precision/recall operating points against the planted communities —
the curves of Figure 9.
"""
from __future__ import annotations

from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.core.seq_louvain import sequential_cc
from repro.eval.harness import table
from repro.eval.quality import avg_precision_recall
from repro.graphs.gen import lite_suite
from repro.graphs.ops import to_spark

LAMBDAS_QUICK = [0.02, 0.1, 0.3, 0.6, 0.9]
GAMMAS_QUICK = [0.1, 0.5, 1.0, 4.0, 16.0]


def run(spark, quick: bool = False):
    graphs = ["amazon-lite"] if quick else ["amazon-lite", "dblp-lite"]
    lams = LAMBDAS_QUICK if quick else [0.01 * x for x in (1, 5, 10, 20, 35, 50, 65, 80, 95)]
    gammas = GAMMAS_QUICK if quick else [0.02 * (1.8**x) for x in range(1, 12)]
    rows = []
    for name, g in lite_suite(graphs).items():
        gt = g.gt_communities()
        gd = to_spark(spark, g, partitions=8)
        gd.edges.cache().count()
        for lam in lams:
            cfg = CCConfig(resolution=lam, num_iter=10, seed=6, partitions=8)
            for algo, runner in (
                ("par-cc", lambda c: parallel_cc(gd, c)),
                ("seq-cc", lambda c: sequential_cc(g, c)),
                ("seq-cc-con", lambda c: sequential_cc(g, c.with_(to_convergence=True))),
            ):
                assign, _ = runner(cfg)
                prec, rec = avg_precision_recall(gt, assign)
                rows.append(
                    {"graph": name, "algo": algo, "param": lam, "precision": prec, "recall": rec}
                )
        for gamma in gammas:
            cfg = CCConfig(
                resolution=gamma, objective="modularity", num_iter=10, seed=6, partitions=8
            )
            for algo, runner in (
                ("par-mod", lambda c: parallel_cc(gd, c)),
                ("seq-mod-con", lambda c: sequential_cc(g, c.with_(to_convergence=True))),
            ):
                assign, _ = runner(cfg)
                prec, rec = avg_precision_recall(gt, assign)
                rows.append(
                    {"graph": name, "algo": algo, "param": gamma, "precision": prec, "recall": rec}
                )
        gd.edges.unpersist()
    return table(rows, title="T7: precision/recall vs ground truth (Fig 9+14)")


if __name__ == "__main__":
    from _common import main

    main(run)
