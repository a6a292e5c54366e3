"""T1 — Graph input suite (paper Table 1, scaled substitutes).

Prints each graph's n and m next to the SNAP original it stands in for,
so the density scaling can be verified.
"""
from __future__ import annotations

from repro.eval.harness import table
from repro.graphs.gen import digits_like, karate, knn_graph, letter_like, lite_suite, rmat

# name -> (paper graph, paper n, paper m) from Table 1.
_PAPER = {
    "amazon-lite": ("com-amazon", 334_863, 925_872),
    "dblp-lite": ("com-dblp", 317_080, 1_049_866),
    "lj-lite": ("com-livejournal", 3_997_962, 34_681_189),
    "orkut-lite": ("com-orkut", 3_072_441, 117_185_083),
    "twitter-lite": ("twitter", 41_652_231, 1_202_513_046),
    "friendster-lite": ("com-friendster", 65_608_366, 1_806_067_135),
}


def run(spark=None, quick: bool = False):
    rows = []
    suite = lite_suite(list(_PAPER))
    for name, g in suite.items():
        paper_name, pn, pm = _PAPER[name]
        rows.append(
            {
                "graph": name,
                "stands_for": paper_name,
                "n": g.n,
                "m": g.m,
                "density(2m/n)": 2 * g.m / g.n,
                "paper_n": pn,
                "paper_m": pm,
                "paper_density": 2 * pm / pn,
                "gt_communities": len(g.gt_communities()),
            }
        )
    kg = karate()
    rows.append(
        {"graph": "karate", "stands_for": "karate", "n": kg.n, "m": kg.m,
         "density(2m/n)": 2 * kg.m / kg.n, "paper_n": 34, "paper_m": 78,
         "paper_density": 2 * 78 / 34, "gt_communities": 0}
    )
    for ps, k in ((digits_like(), 50), (letter_like(), 50)):
        g = knn_graph(ps, k=10 if quick else k)
        rows.append(
            {"graph": g.name, "stands_for": f"UCI {ps.name}", "n": g.n, "m": g.m,
             "density(2m/n)": 2 * g.m / g.n, "paper_n": g.n, "paper_m": g.n * k,
             "paper_density": float(2 * k), "gt_communities": len(set(ps.labels))}
        )
    r = rmat(12, 40_000, seed=1)
    rows.append(
        {"graph": r.name, "stands_for": "rMAT family", "n": r.n, "m": r.m,
         "density(2m/n)": 2 * r.m / r.n, "paper_n": 0, "paper_m": 0,
         "paper_density": 0.0, "gt_communities": 0}
    )
    return table(rows, title="T1: graph input suite (ours vs paper Table 1)")


if __name__ == "__main__":
    from _common import main

    main(run)
