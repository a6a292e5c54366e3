"""T4 — PAR-CC scalability over rMAT graphs (Figure 6).

Runs PAR-CC on rMAT graphs across sizes and density regimes (very
sparse m=5n, sparse m=50n, dense m=n^1.5) and reports time per edge —
the paper's claim is near-linear scaling in m.
"""
from __future__ import annotations

from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.eval.harness import table
from repro.graphs.gen import rmat
from repro.graphs.ops import to_spark


def run(spark, quick: bool = False):
    logs = [11, 12, 13] if quick else [11, 12, 13, 14]
    rows = []
    for n_log2 in logs:
        n = 1 << n_log2
        regimes = {"m=5n": 5 * n, "m=50n": 50 * n}
        if not quick:
            regimes["m=n^1.5"] = int(n**1.5)
        for regime, m in regimes.items():
            g = rmat(n_log2, m, seed=3)
            gd = to_spark(spark, g, partitions=8)
            gd.edges.cache().count()
            for lam in (0.01, 0.85):
                cfg = CCConfig(resolution=lam, num_iter=10, seed=3, partitions=8)
                _, stats = parallel_cc(gd, cfg)
                rows.append(
                    {
                        "graph": f"rmat 2^{n_log2}",
                        "regime": regime,
                        "n": g.n,
                        "m": g.m,
                        "resolution": lam,
                        "time_s": stats.total_time,
                        "us_per_edge": 1e6 * stats.total_time / max(1, g.m),
                        "rounds": stats.total_rounds,
                    }
                )
            gd.edges.unpersist()
    return table(rows, title="T4: PAR-CC scaling over rMAT sizes (Fig 6)")


if __name__ == "__main__":
    from _common import main

    main(run)
