"""T11 — SCD comparison (Appendix C.1).

The paper: PAR-CC gets 2.00–2.89x speedups over SCD at matched quality
on amazon/dblp/livejournal; on orkut SCD degrades to precision 0.15 /
recall 0.05 while PAR-CC reaches 0.61/0.53. SCD has no quality knob, so
it contributes one operating point per graph; PAR-CC contributes its
best-matching λ. A denser "orkut-mini" carries the degradation case at a
triangle-countable scale.
"""
from __future__ import annotations

import time

from repro.baselines.scd import scd
from repro.core.config import CCConfig
from repro.core.par_louvain import parallel_cc
from repro.eval.harness import table
from repro.eval.quality import avg_precision_recall
from repro.graphs.gen import lite_suite, planted_partition
from repro.graphs.ops import to_spark


def _graphs(quick: bool):
    names = ["amazon-lite"] if quick else ["amazon-lite", "dblp-lite"]
    out = lite_suite(names)
    out["orkut-mini"] = planted_partition(
        6000, avg_deg=40.0, mixing=0.45, cmin=20, cmax=400, seed=19, name="orkut-mini"
    )
    return out


def run(spark, quick: bool = False):
    rows = []
    for name, g in _graphs(quick).items():
        gt = g.gt_communities()
        t0 = time.perf_counter()
        labels = scd(spark, g, partitions=8)
        t_scd = time.perf_counter() - t0
        prec, rec = avg_precision_recall(gt, labels)
        rows.append(
            {"graph": name, "algo": "scd", "param": float("nan"),
             "time_s": t_scd, "precision": prec, "recall": rec}
        )
        gd = to_spark(spark, g, partitions=8)
        gd.edges.cache().count()
        for lam in (0.1, 0.3):
            cfg = CCConfig(resolution=lam, num_iter=10, seed=9, partitions=8)
            assign, stats = parallel_cc(gd, cfg)
            p2, r2 = avg_precision_recall(gt, assign)
            rows.append(
                {"graph": name, "algo": "par-cc", "param": lam,
                 "time_s": stats.total_time, "precision": p2, "recall": r2}
            )
        gd.edges.unpersist()
    return table(rows, title="T11: SCD vs PAR-CC (Appendix C.1)")


if __name__ == "__main__":
    from _common import main

    main(run)
