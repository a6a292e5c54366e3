"""T10 — NetworKit PLM stand-in comparison (Figure 17, Appendix C.1).

PAR-MOD vs the stand-in whose only difference is a single-threaded
compression step (the paper credits its ≤3.5x / avg 1.89x win over
NetworKit to parallel compression). Reports end-to-end speedup,
compression-phase speedup, and the modularity ratio (paper: 0.99–1.00x).
"""
from __future__ import annotations

from repro.baselines.networkit_like import networkit_like
from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.eval.harness import table
from repro.graphs.gen import lite_suite
from repro.graphs.ops import to_spark


def run(spark, quick: bool = False):
    graphs = ["orkut-lite"] if quick else ["amazon-lite", "orkut-lite", "lj-big"]
    gammas = [1.0] if quick else [0.05, 1.0]
    rows = []
    for name, g in lite_suite(graphs).items():
        gd = to_spark(spark, g, partitions=8)
        gd.edges.cache().count()
        for gamma in gammas:
            cfg = CCConfig(
                resolution=gamma, objective="modularity", num_iter=32, seed=3, partitions=8
            )
            _, s_par = parallel_cc(gd, cfg)
            _, s_nk = networkit_like(gd, gamma=gamma, seed=3, partitions=8)
            comp_par = sum(l.time_compress for l in s_par.levels)
            comp_nk = sum(l.time_compress for l in s_nk.levels)
            rows.append(
                {
                    "graph": name,
                    "gamma": gamma,
                    "par_mod_time_s": s_par.total_time,
                    "networkit_like_time_s": s_nk.total_time,
                    "speedup": s_nk.total_time / s_par.total_time,
                    "compress_par_s": comp_par,
                    "compress_nk_s": comp_nk,
                    "compress_speedup": comp_nk / comp_par if comp_par else float("nan"),
                    "modularity_ratio": (
                        s_par.reported_objective / s_nk.reported_objective
                        if s_nk.reported_objective
                        else float("nan")
                    ),
                }
            )
        gd.edges.unpersist()
    return table(rows, title="T10: PAR-MOD vs NetworKit stand-in (Fig 17)")


if __name__ == "__main__":
    from _common import main

    main(run)
