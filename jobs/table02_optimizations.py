"""T2 — Optimization tuning (paper Figures 2 and 3, §4.1).

For PAR-CC and PAR-MOD: starting from the unoptimized base (synchronous,
all vertices, no refinement), turn on one §3.2 optimization at a time and
report the multiplicative slowdown of the base relative to each option
plus the objective change — the paper's Figure 2 (times) and Figure 3
(objectives) as one table.
"""
from __future__ import annotations

from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.eval.harness import table
from repro.graphs.gen import lite_suite
from repro.graphs.ops import to_spark

_BASE = dict(async_moves=False, frontier="all", refine=False)
_VARIANTS = {
    "base": {},
    "async": dict(async_moves=True),
    "nbr-vertices": dict(frontier="vertices"),
    "nbr-clusters": dict(frontier="clusters"),
    "refine": dict(refine=True),
    "all-opts": dict(async_moves=True, frontier="vertices", refine=True),
}


def run(spark, quick: bool = False):
    graphs = ["amazon-lite"] if quick else ["amazon-lite", "orkut-lite"]
    lams = [0.01, 0.85]
    rows = []
    for name, g in lite_suite(graphs).items():
        gd = to_spark(spark, g, partitions=8)
        gd.edges.cache().count()
        for objective in ("cc", "modularity"):
            for lam in lams:
                res = lam if objective == "cc" else (0.05 if lam < 0.5 else 1.0)
                times, objs = {}, {}
                for vname, over in _VARIANTS.items():
                    cfg = CCConfig(
                        resolution=res, objective=objective, num_iter=10,
                        seed=1, partitions=8, **{**_BASE, **over},
                    )
                    _, stats = parallel_cc(gd, cfg)
                    times[vname] = stats.total_time
                    objs[vname] = stats.reported_objective
                for vname in _VARIANTS:
                    if vname == "base":
                        continue
                    rows.append(
                        {
                            "graph": name,
                            "algo": f"par-{objective}",
                            "resolution": res,
                            "optimization": vname,
                            "time_s": times[vname],
                            "base_time_s": times["base"],
                            "slowdown_base_over_opt": times["base"] / times[vname],
                            "objective": objs[vname],
                            "base_objective": objs["base"],
                        }
                    )
        gd.edges.unpersist()
    return table(rows, title="T2: optimization tuning (Fig 2 slowdowns + Fig 3 objectives)")


if __name__ == "__main__":
    from _common import main

    main(run)
