"""T6 — memory overhead of refinement (Figure 8).

The refinement optimization keeps every coarsened level alive while
unwinding, whereas without it each level can be dropped once compressed.
We report both retention footprints (directed edge rows, and bytes at
the paper's ~8 B/undirected-edge CSR accounting) as multiples of the
input size — the multiplicative overhead of Figure 8.
"""
from __future__ import annotations

from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.eval.harness import table
from repro.graphs.gen import lite_suite
from repro.graphs.ops import to_spark


def run(spark, quick: bool = False):
    graphs = ["amazon-lite"] if quick else ["amazon-lite", "orkut-lite"]
    rows = []
    for name, g in lite_suite(graphs).items():
        gd = to_spark(spark, g, partitions=8)
        gd.edges.cache().count()
        for objective in ("cc", "modularity"):
            for lam in (0.01, 0.85):
                res = lam if objective == "cc" else (0.05 if lam < 0.5 else 1.0)
                cfg = CCConfig(
                    resolution=res, objective=objective, num_iter=10, seed=5, partitions=8
                )
                _, stats = parallel_cc(gd, cfg)
                input_rows = stats.levels[0].m_directed
                rows.append(
                    {
                        "graph": name,
                        "algo": f"par-{objective}",
                        "resolution": res,
                        "levels": len(stats.levels),
                        "input_edge_rows": input_rows,
                        "retained_with_refine": stats.retained_edges_refine,
                        "retained_without_refine": stats.retained_edges_norefine,
                        "overhead_refine_x": stats.retained_edges_refine / input_rows,
                        "overhead_norefine_x": stats.retained_edges_norefine / input_rows,
                    }
                )
        gd.edges.unpersist()
    return table(rows, title="T6: memory (retained edges) overhead of refinement (Fig 8)")


if __name__ == "__main__":
    from _common import main

    main(run)
