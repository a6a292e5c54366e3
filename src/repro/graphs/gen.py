"""Synthetic graph generators standing in for the paper's inputs.

The paper evaluates on SNAP graphs with ground-truth communities, rMAT
graphs, the karate graph, and weighted k-NN graphs built from UCI
pointsets. None of those are downloadable offline, so this module builds
deterministic synthetic equivalents (see DESIGN.md §3 for the
substitution rationale):

- :func:`rmat` — the same recursive-matrix generator the paper uses for
  its scalability study (Chakrabarti et al.), numpy-vectorized.
- :func:`planted_partition` — SBM-style community graphs with power-law
  community sizes; the planted communities play the role of SNAP's
  top-5000 ground-truth communities.
- :func:`lite_suite` — named configs (`amazon-lite`, ..., `friendster-lite`)
  whose density and community-size regime are scaled-down matches of the
  SNAP graphs in the paper's Table 1.
- :func:`karate` — Zachary's karate club, verbatim (used by the paper for
  the LambdaCC-MATLAB comparison).
- :func:`blobs` / :func:`knn_graph` — Gaussian-blob pointsets plus exact
  cosine k-NN graph construction, standing in for UCI digits/letter +
  ScaNN.

All generators are deterministic in ``seed`` and return edges as a pandas
DataFrame with columns ``u, v, w`` holding each undirected edge once with
``u < v`` and no self loops.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass
class GenGraph:
    """A generated graph: undirected edge list plus optional ground truth.

    ``edges`` holds each undirected edge once (u < v, no self loops).
    ``gt`` is a vertex -> community-id label array (planted partition) or
    ``None`` when the generator has no ground truth.
    """

    name: str
    n: int
    edges: pd.DataFrame
    gt: np.ndarray | None = None

    @property
    def m(self) -> int:
        return len(self.edges)

    def gt_communities(self) -> list[np.ndarray]:
        """Ground-truth communities as vertex-id arrays (paper's top-5000 analog)."""
        if self.gt is None:
            raise ValueError(f"graph {self.name} has no ground truth")
        order = np.argsort(self.gt, kind="stable")
        labels = self.gt[order]
        cuts = np.flatnonzero(np.diff(labels)) + 1
        return np.split(order, cuts)


def _dedupe(u: np.ndarray, v: np.ndarray, w: np.ndarray | None = None) -> pd.DataFrame:
    """Canonicalize to u < v, drop self loops and duplicates, sum weights."""
    lo = np.minimum(u, v)
    hi = np.maximum(u, v)
    keep = lo != hi
    df = pd.DataFrame(
        {
            "u": lo[keep],
            "v": hi[keep],
            "w": (w[keep] if w is not None else np.ones(keep.sum())),
        }
    )
    df = df.groupby(["u", "v"], as_index=False, sort=True)["w"].max()
    df["u"] = df["u"].astype("int64")
    df["v"] = df["v"].astype("int64")
    df["w"] = df["w"].astype("float64")
    return df


def rmat(
    n_log2: int,
    m: int,
    *,
    a: float = 0.5,
    b: float = 0.1,
    c: float = 0.1,
    d: float = 0.3,
    seed: int = 0,
) -> GenGraph:
    """rMAT graph with 2**n_log2 vertices and ~m undirected edges.

    Same parameters as the paper's scalability study (a=0.5, b=c=0.1,
    d=0.3). Edges are sampled by recursive quadrant choice, symmetrized,
    and deduplicated, so the realized edge count is slightly below the
    requested ``m``.
    """
    n = 1 << n_log2
    g = np.random.default_rng(seed)
    probs = np.array([a, b, c, d])
    probs = probs / probs.sum()
    # Oversample to compensate for dedupe/self-loop losses.
    n_samp = int(m * 1.35) + 16
    quad = g.choice(4, size=(n_samp, n_log2), p=probs)
    row_bits = (quad >> 1) & 1  # quadrants 2,3 pick the lower row half
    col_bits = quad & 1  # quadrants 1,3 pick the right column half
    weights = 1 << np.arange(n_log2 - 1, -1, -1)
    u = (row_bits * weights).sum(axis=1)
    v = (col_bits * weights).sum(axis=1)
    edges = _dedupe(u, v)
    if len(edges) > m:
        edges = edges.iloc[
            np.sort(g.choice(len(edges), size=m, replace=False))
        ].reset_index(drop=True)
    return GenGraph(name=f"rmat-{n_log2}-{m}", n=n, edges=edges)


def _powerlaw_sizes(
    n: int, *, cmin: int, cmax: int, alpha: float, rng: np.random.Generator
) -> np.ndarray:
    """Community sizes ~ bounded power law summing exactly to n."""
    sizes: list[int] = []
    total = 0
    support = np.arange(cmin, cmax + 1)
    p = support.astype("float64") ** (-alpha)
    p /= p.sum()
    while total < n:
        s = int(rng.choice(support, p=p))
        s = min(s, n - total)
        sizes.append(max(1, s))
        total += sizes[-1]
    return np.asarray(sizes)


def planted_partition(
    n: int,
    *,
    avg_deg: float,
    mixing: float,
    cmin: int = 8,
    cmax: int = 120,
    alpha: float = 2.0,
    seed: int = 0,
    name: str = "sbm",
) -> GenGraph:
    """Planted-partition (SBM-like) graph with power-law community sizes.

    ``avg_deg`` controls density (m ≈ n·avg_deg/2); ``mixing`` is the
    fraction of edge endpoints that leave the community (SNAP-community-
    style graphs sit around 0.2–0.5). Intra edges are sampled per
    community at the p_in implied by the intra-edge budget; inter edges
    are uniform random pairs across communities.
    """
    rng = np.random.default_rng(seed)
    sizes = _powerlaw_sizes(n, cmin=cmin, cmax=cmax, alpha=alpha, rng=rng)
    starts = np.concatenate(([0], np.cumsum(sizes)[:-1]))
    gt = np.repeat(np.arange(len(sizes)), sizes)

    m_total = int(n * avg_deg / 2)
    m_intra_budget = int(m_total * (1.0 - mixing))
    # Distribute the intra budget over communities proportionally to the
    # number of available pairs, capped by that pair count.
    pairs = sizes.astype("float64") * (sizes - 1) / 2.0
    p_in = min(1.0, m_intra_budget / max(pairs.sum(), 1.0))
    us: list[np.ndarray] = []
    vs: list[np.ndarray] = []
    for s, st in zip(sizes, starts):
        if s < 2:
            continue
        n_pairs = int(s * (s - 1) // 2)
        cnt = rng.binomial(n_pairs, p_in)
        if cnt == 0:
            continue
        idx = rng.choice(n_pairs, size=min(cnt, n_pairs), replace=False)
        # Decode linear pair index -> (i, j) with i < j inside the block.
        i = (np.ceil(np.sqrt(2.0 * (idx + 1) + 0.25) - 0.5)).astype("int64")
        j = (idx - i * (i - 1) // 2).astype("int64")
        us.append(st + j)
        vs.append(st + i)
    m_inter = m_total - sum(len(x) for x in us)
    if m_inter > 0:
        uu = rng.integers(0, n, size=int(m_inter * 1.8) + 8)
        vv = rng.integers(0, n, size=len(uu))
        keep = gt[uu] != gt[vv]
        us.append(uu[keep][:m_inter])
        vs.append(vv[keep][:m_inter])
    edges = _dedupe(np.concatenate(us), np.concatenate(vs))
    return GenGraph(name=name, n=n, edges=edges, gt=gt)


# Scaled-down analogs of the paper's Table 1 SNAP graphs. Densities (m/n)
# track the originals: amazon 2.8, dblp 3.3, livejournal 8.7, orkut 38,
# twitter 29 (few huge communities, heavy degree skew), friendster 27.5
# (avg cluster size ~1.1 per the paper's appendix).
_LITE_CONFIGS: dict[str, dict] = {
    "amazon-lite": dict(n=10_000, avg_deg=5.6, mixing=0.25, cmin=8, cmax=100, seed=11),
    "dblp-lite": dict(n=10_000, avg_deg=6.6, mixing=0.30, cmin=6, cmax=80, seed=12),
    "lj-lite": dict(n=24_000, avg_deg=17.4, mixing=0.35, cmin=10, cmax=200, seed=13),
    "orkut-lite": dict(n=16_000, avg_deg=76.0, mixing=0.45, cmin=20, cmax=400, seed=14),
    "twitter-lite": dict(n=12_000, avg_deg=58.0, mixing=0.55, cmin=400, cmax=3000, seed=15),
    "friendster-lite": dict(n=16_000, avg_deg=55.0, mixing=0.60, cmin=4, cmax=24, seed=16),
    # Large-enough instance that per-round edge work dominates Spark's
    # per-job overhead — the regime where the paper's PAR-over-SEQ
    # speedups are observable on this substrate (DESIGN.md §7).
    "lj-big": dict(n=80_000, avg_deg=30.0, mixing=0.35, cmin=12, cmax=300, seed=17),
}


def lite_suite(names: list[str] | None = None) -> dict[str, GenGraph]:
    """The scaled-down SNAP stand-in suite (see DESIGN.md §3)."""
    out: dict[str, GenGraph] = {}
    for name in names or list(_LITE_CONFIGS):
        cfg = dict(_LITE_CONFIGS[name])
        out[name] = planted_partition(cfg.pop("n"), name=name, **cfg)
    return out


def lite_graph(name: str) -> GenGraph:
    """One graph from :func:`lite_suite` by name."""
    return lite_suite([name])[name]


_KARATE_EDGES = [
    (0, 1), (0, 2), (0, 3), (0, 4), (0, 5), (0, 6), (0, 7), (0, 8), (0, 10),
    (0, 11), (0, 12), (0, 13), (0, 17), (0, 19), (0, 21), (0, 31), (1, 2),
    (1, 3), (1, 7), (1, 13), (1, 17), (1, 19), (1, 21), (1, 30), (2, 3),
    (2, 7), (2, 8), (2, 9), (2, 13), (2, 27), (2, 28), (2, 32), (3, 7),
    (3, 12), (3, 13), (4, 6), (4, 10), (5, 6), (5, 10), (5, 16), (6, 16),
    (8, 30), (8, 32), (8, 33), (9, 33), (13, 33), (14, 32), (14, 33),
    (15, 32), (15, 33), (18, 32), (18, 33), (19, 33), (20, 32), (20, 33),
    (22, 32), (22, 33), (23, 25), (23, 27), (23, 29), (23, 32), (23, 33),
    (24, 25), (24, 27), (24, 31), (25, 31), (26, 29), (26, 33), (27, 33),
    (28, 31), (28, 33), (29, 32), (29, 33), (30, 32), (30, 33), (31, 32),
    (31, 33), (32, 33),
]


def karate() -> GenGraph:
    """Zachary's karate club (34 vertices, 78 edges) — Appendix C.1 input."""
    u = np.array([e[0] for e in _KARATE_EDGES], dtype="int64")
    v = np.array([e[1] for e in _KARATE_EDGES], dtype="int64")
    return GenGraph(name="karate", n=34, edges=_dedupe(u, v))


@dataclass
class PointSet:
    """Labeled pointset, stand-in for a UCI dataset."""

    name: str
    points: np.ndarray  # (n, dim)
    labels: np.ndarray  # (n,)
    centers: np.ndarray = field(repr=False, default=None)


def blobs(
    *, n: int, n_classes: int, dim: int, spread: float = 1.0, seed: int = 0, name: str = "blobs"
) -> PointSet:
    """Gaussian blobs standing in for UCI digits (10 classes) / letter (26)."""
    rng = np.random.default_rng(seed)
    centers = rng.normal(0.0, 4.0, size=(n_classes, dim))
    labels = rng.integers(0, n_classes, size=n)
    points = centers[labels] + rng.normal(0.0, spread, size=(n, dim))
    return PointSet(name=name, points=points, labels=labels, centers=centers)


def digits_like(seed: int = 21) -> PointSet:
    """~UCI optical digits: 1797 instances, 10 classes (scaled dims)."""
    return blobs(n=1797, n_classes=10, dim=16, spread=1.6, seed=seed, name="digits-like")


def letter_like(seed: int = 22) -> PointSet:
    """~UCI letter recognition, scaled to 6000 instances, 26 classes."""
    return blobs(n=6000, n_classes=26, dim=16, spread=1.9, seed=seed, name="letter-like")


def knn_graph(ps: PointSet, *, k: int = 50) -> GenGraph:
    """Exact cosine k-NN graph, symmetrized — the paper's ScaNN pipeline.

    Edge weight = cosine similarity, clipped to be non-negative so that
    edge weights mean similarity as the LambdaCC objective expects.
    """
    x = ps.points / np.linalg.norm(ps.points, axis=1, keepdims=True)
    sims = x @ x.T
    np.fill_diagonal(sims, -np.inf)
    nbr = np.argpartition(-sims, kth=k, axis=1)[:, :k]
    rows = np.repeat(np.arange(len(x)), k)
    cols = nbr.ravel()
    w = np.clip(sims[rows, cols], 0.0, None)
    edges = _dedupe(rows, cols, w)
    g = GenGraph(name=f"{ps.name}-knn{k}", n=len(x), edges=edges, gt=ps.labels.astype("int64"))
    return g
