"""PARALLEL-CC (Algorithm 1): distributed-dataflow parallel Louvain for LambdaCC.

The edge set is the distributed dataset (hash-partitioned by ``src`` so a
vertex's out-edges are co-located); the O(n) vertex state (assignment,
cluster weights ``K_c``, vertex weights ``k``, frontier masks) is broadcast
each BEST-MOVES iteration. One iteration is exactly one ``mapInPandas``
pass over the cached edge partitions:

- **synchronous** (§3.2.1): every frontier vertex evaluates the appendix
  move-delta formula against the same broadcast snapshot; all moves are
  applied at once by the driver. Delta ties break toward the smallest
  cluster id, which is what makes Figure 1's lockstep pathology
  reproducible rather than an endless oscillation.
- **asynchronous** (§3.2.1): inside each edge partition the vertices are
  processed sequentially in random order against *partition-local* copies
  of the assignment/``K_c`` arrays that are updated immediately; across
  partitions the state is stale. This reproduces the paper's
  relaxed-consistency lock-free moves at partition granularity. Because a
  BSP step cannot interleave timing the way free-running threads do, each
  vertex additionally skips an iteration with constant probability
  (p=0.25) — the symmetry-breaking role timing noise plays in the paper.

Frontier options (§3.2.2) — ``all`` / ``vertices`` (neighbors of moved
vertices, Alg. 1 line 10) / ``clusters`` (members and neighbors of the
clusters movers left and joined) — are *fused into the move pass*: since
a vertex's edges are co-located, "has a neighbor in the moved set" is
computable per partition from the broadcast mask, so no separate
frontier job runs (the EDGEMAP role from GBBS). Multi-level refinement
(§3.2.3, Alg. 1 line 9) re-runs BEST-MOVES per level while unwinding.

Every vertex may also *detach* into a fresh singleton cluster (label
``U + v`` in the pre-densify label space), which matters for large λ.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

from ..graphs.ops import GraphData, degree_array
from .config import CCConfig
from .state import (
    LevelGraph,
    LevelStats,
    RunStats,
    Timer,
    cc_objective,
    cluster_weights,
    compress,
    densify,
    flatten,
    level0,
    map_edge_partitions,
)

_MOVES_SCHEMA = StructType(
    [
        StructField("v", LongType(), False),
        StructField("c", LongType(), False),
        StructField("delta", DoubleType(), False),
    ]
)

_EMPTY_MOVES = pd.DataFrame({"v": [], "c": [], "delta": []}).astype(
    {"v": "int64", "c": "int64", "delta": "float64"}
)


def _participates(vs: np.ndarray, seed: int) -> np.ndarray:
    """Async-mode per-iteration participation mask (p=0.75).

    Deterministic in (vertex, seed) and independent of partitioning, so
    the driver can recompute exactly which frontier vertices an executor
    skipped (they must stay eligible next iteration).
    """
    h = (vs.astype("uint64") * np.uint64(2654435761) + np.uint64(seed * 97 + 13)) * np.uint64(
        0x9E3779B97F4A7C15
    )
    return (h >> np.uint64(40)).astype("float64") / float(1 << 24) < 0.75


def _active_mask_rows(
    src: np.ndarray,
    dst: np.ndarray,
    n: int,
    all_active: bool,
    aux: np.ndarray | None,
    extra: np.ndarray | None,
) -> np.ndarray:
    """Per-vertex activity resolved locally: v is active if the frontier is
    dense, if v is in ``extra`` (skipped vertices / affected-cluster
    members), or if some neighbor of v is in ``aux`` (movers / members)."""
    if all_active:
        return np.ones(n, dtype=bool)
    act = np.zeros(n, dtype=bool)
    if aux is not None:
        hit = aux[dst]
        if hit.any():
            act[src[hit]] = True
    if extra is not None:
        act |= extra
    return act


def _sync_partition_moves(
    pdf: pd.DataFrame,
    a: np.ndarray,
    K: np.ndarray,
    k: np.ndarray,
    lam: float,
    U: int,
    tol: float,
    all_active: bool,
    aux: np.ndarray | None,
    extra: np.ndarray | None,
) -> pd.DataFrame:
    """Best move per active vertex against the broadcast snapshot."""
    src = pdf["src"].to_numpy()
    dst = pdf["dst"].to_numpy()
    act = _active_mask_rows(src, dst, len(a), all_active, aux, extra)
    sel = act[src]
    if not sel.any():
        return _EMPTY_MOVES
    src = src[sel]
    dst = dst[sel]
    w = pdf["w"].to_numpy()[sel]
    grp = (
        pd.DataFrame({"v": src, "c": a[dst], "w": w})
        .groupby(["v", "c"], sort=False)["w"]
        .sum()
        .reset_index()
    )
    v = grp["v"].to_numpy()
    c = grp["c"].to_numpy()
    wvc = grp["w"].to_numpy()
    cv = a[v]
    kv = k[v]
    own_rows = c == cv
    own_map = pd.Series(wvc[own_rows], index=v[own_rows])
    own_per_row = pd.Series(v).map(own_map).fillna(0.0).to_numpy()
    base = own_per_row - lam * kv * (K[cv] - kv)
    cand = ~own_rows
    delta = (wvc - lam * kv * K[c]) - base
    # Detach-to-singleton candidate, one per distinct vertex.
    uv = np.unique(v)
    own_uv = pd.Series(uv).map(own_map).fillna(0.0).to_numpy()
    kuv = k[uv]
    base_uv = own_uv - lam * kuv * (K[a[uv]] - kuv)
    all_v = np.concatenate([v[cand], uv])
    all_c = np.concatenate([c[cand], U + uv])
    all_d = np.concatenate([delta[cand], -base_uv])
    # Deterministic tie-break toward the smallest cluster id (Figure 1's
    # synchronous pathology relies on ties resolving identically).
    dfc = pd.DataFrame({"v": all_v, "c": all_c, "delta": all_d}).sort_values(
        ["v", "c"], kind="stable"
    )
    best = dfc.loc[dfc.groupby("v")["delta"].idxmax()]
    best = best[best["delta"] > tol]
    return best.astype({"v": "int64", "c": "int64", "delta": "float64"})


def _async_partition_moves(
    pdf: pd.DataFrame,
    a: np.ndarray,
    K: np.ndarray,
    k: np.ndarray,
    lam: float,
    U: int,
    tol: float,
    all_active: bool,
    aux: np.ndarray | None,
    extra: np.ndarray | None,
    seed: int,
    n: int,
    sample: bool = True,
) -> pd.DataFrame:
    """Sequential random-order moves with immediate partition-local updates."""
    src = pdf["src"].to_numpy()
    dst = pdf["dst"].to_numpy()
    w = pdf["w"].to_numpy()
    order_idx = np.argsort(src, kind="stable")
    src_s, dst_s, w_s = src[order_idx], dst[order_idx], w[order_idx]
    uniq_src, starts = np.unique(src_s, return_index=True)
    ends = np.append(starts[1:], len(src_s))
    act = _active_mask_rows(src_s, dst_s, n, all_active, aux, extra)
    in_frontier = act[uniq_src]
    participate = (
        _participates(uniq_src, seed) if sample else np.ones(len(uniq_src), dtype=bool)
    )
    active = np.flatnonzero(in_frontier & participate)
    if len(active) == 0:
        return _EMPTY_MOVES
    # Partition-deterministic order: seed mixes the config seed, the
    # iteration, and this partition's smallest vertex id.
    rng = np.random.default_rng((seed * 1_000_003 + int(uniq_src[0])) % (2**63))
    rng.shuffle(active)
    local_a = a.copy()
    local_K = np.zeros(U + n + 1)
    local_K[:U] = K
    mv_v: list[int] = []
    mv_c: list[int] = []
    mv_d: list[float] = []
    for i in active:
        v = int(uniq_src[i])
        dsts = dst_s[starts[i] : ends[i]]
        ws = w_s[starts[i] : ends[i]]
        cd = local_a[dsts]
        uniq, inv = np.unique(cd, return_inverse=True)
        wvc = np.bincount(inv, weights=ws)
        cv = int(local_a[v])
        kv = float(k[v])
        pos = np.searchsorted(uniq, cv)
        own = float(wvc[pos]) if pos < len(uniq) and uniq[pos] == cv else 0.0
        base = own - lam * kv * (local_K[cv] - kv)
        deltas = (wvc - lam * kv * local_K[uniq]) - base
        deltas[uniq == cv] = -np.inf
        j = int(np.argmax(deltas)) if len(deltas) else -1
        best_d = deltas[j] if j >= 0 else -np.inf
        best_c = int(uniq[j]) if j >= 0 else -1
        d_iso = -base
        if d_iso > best_d:
            best_d, best_c = d_iso, U + v
        if best_d > tol:
            local_K[cv] -= kv
            local_K[best_c] += kv
            local_a[v] = best_c
            mv_v.append(v)
            mv_c.append(best_c)
            mv_d.append(float(best_d))
    return pd.DataFrame(
        {
            "v": np.asarray(mv_v, "int64"),
            "c": np.asarray(mv_c, "int64"),
            "delta": np.asarray(mv_d, "float64"),
        }
    )


def _move_pass(
    level: LevelGraph,
    assign: np.ndarray,
    K: np.ndarray,
    U: int,
    lam: float,
    cfg: CCConfig,
    it_seed: int,
    all_active: bool,
    aux: np.ndarray | None,
    extra: np.ndarray | None,
    sample: bool = True,
) -> pd.DataFrame:
    """One BEST-MOVES iteration: broadcast state, mapInPandas, collect moves."""
    sc = level.edges.sparkSession.sparkContext
    bc = sc.broadcast((assign, K, level.k, aux, extra))
    n = level.n
    use_async = cfg.async_moves
    tol = cfg.move_tol

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        a, Kb, kb, auxb, extrab = bc.value
        if use_async:
            return _async_partition_moves(
                pdf, a, Kb, kb, lam, U, tol, all_active, auxb, extrab, it_seed, n, sample
            )
        return _sync_partition_moves(
            pdf, a, Kb, kb, lam, U, tol, all_active, auxb, extrab
        )

    try:
        return map_edge_partitions(level.edges, fn, _MOVES_SCHEMA).toPandas()
    finally:
        bc.destroy()


def best_moves(
    level: LevelGraph,
    assign_init: np.ndarray,
    lam: float,
    cfg: CCConfig,
    seed_base: int,
) -> tuple[np.ndarray, int, int]:
    """BEST-MOVES (Algorithm 1 lines 1–11) on one level.

    Returns ``(dense assignment, total moves, iterations run)``.
    """
    assign, U = densify(assign_init)
    K = cluster_weights(assign, level.k, U)
    all_active = True
    aux: np.ndarray | None = None
    extra: np.ndarray | None = None
    total_moves = 0
    iters = 0
    for it in range(cfg.effective_num_iter):
        iters = it + 1
        sampled = cfg.async_moves
        moves = _move_pass(
            level, assign, K, U, lam, cfg, seed_base + it, all_active, aux, extra
        )
        if len(moves) == 0 and cfg.async_moves:
            # The random subsample may have missed every movable vertex;
            # confirm convergence with one full-participation pass before
            # breaking (Alg. 1 line 9 assumes all of V' was considered).
            sampled = False
            moves = _move_pass(
                level,
                assign,
                K,
                U,
                lam,
                cfg,
                seed_base + it,
                all_active,
                aux,
                extra,
                sample=False,
            )
        if len(moves):
            vs = moves["v"].to_numpy()
            cs = moves["c"].to_numpy()
            real = cs != assign[vs]
            vs, cs = vs[real], cs[real]
        else:
            vs = np.empty(0, dtype="int64")
            cs = vs
        if len(vs) == 0:
            break  # Alg. 1 line 9
        old_labels = assign[vs].copy()
        # Frontier vertices the subsample skipped were never considered
        # this iteration — they must stay eligible next iteration.
        skipped = (
            ~_participates(np.arange(level.n), seed_base + it)
            if sampled
            else np.zeros(level.n, dtype=bool)
        )
        assign[vs] = cs
        total_moves += len(vs)
        if cfg.frontier == "all" or len(vs) > 0.5 * level.n:
            # Dense-mode shortcut (EDGEMAP's dense representation): when
            # most vertices moved their neighborhood is ~everything. A
            # superset frontier never changes which moves are available.
            all_active, aux, extra = True, None, None
        elif cfg.frontier == "vertices":
            moved_mask = np.zeros(level.n, dtype=bool)
            moved_mask[vs] = True
            all_active, aux, extra = False, moved_mask, skipped
        else:  # "clusters"
            affected = np.zeros(U + level.n + 1, dtype=bool)
            affected[old_labels] = True
            affected[cs] = True
            members = affected[assign]  # labels still in pre-densify space
            all_active, aux, extra = False, members, members | skipped
        assign, U = densify(assign)
        K = cluster_weights(assign, level.k, U)
    return assign, total_moves, iters


def _compress_driver_python(
    level: LevelGraph, assign_dense: np.ndarray, n_clusters: int, *, partitions: int
) -> LevelGraph:
    """Single-threaded compression (NetworKit stand-in, DESIGN.md §3).

    Collects the relabeled edges and aggregates them in an interpreted
    python loop — modeling a compression step that is *not* efficiently
    parallelized, which is exactly the difference the paper credits for
    its speedup over NetworKit.
    """
    spark = level.edges.sparkSession
    pdf = level.edges.toPandas()
    src = assign_dense[pdf["src"].to_numpy()]
    dst = assign_dense[pdf["dst"].to_numpy()]
    w = pdf["w"].to_numpy()
    agg: dict[tuple[int, int], float] = {}
    for s, d, x in zip(src.tolist(), dst.tolist(), w.tolist()):
        key = (s, d)
        agg[key] = agg.get(key, 0.0) + x
    rows_s, rows_d, rows_w = [], [], []
    self_w = np.zeros(n_clusters)
    for (s, d), x in agg.items():
        if s == d:
            self_w[s] += x / 2.0
        else:
            rows_s.append(s)
            rows_d.append(d)
            rows_w.append(x)
    from ..graphs.ops import EDGE_SCHEMA

    new_edges = (
        spark.createDataFrame(
            pd.DataFrame(
                {
                    "src": np.asarray(rows_s, "int64"),
                    "dst": np.asarray(rows_d, "int64"),
                    "w": np.asarray(rows_w, "float64"),
                }
            ),
            schema=EDGE_SCHEMA,
        )
        .repartition(partitions, "src")
        .persist()
    )
    m_new = new_edges.count()
    selfw = np.bincount(assign_dense, weights=level.selfw, minlength=n_clusters) + self_w
    return LevelGraph(
        edges=new_edges,
        n=n_clusters,
        k=np.bincount(assign_dense, weights=level.k, minlength=n_clusters),
        sq=np.bincount(assign_dense, weights=level.sq, minlength=n_clusters),
        selfw=selfw,
        m_directed=m_new,
    )


def _recurse(
    level: LevelGraph,
    depth: int,
    lam: float,
    cfg: CCConfig,
    stats: RunStats,
    compress_mode: str,
) -> np.ndarray:
    """PARALLEL-CC (Algorithm 1 lines 1–11), recursive."""
    lstats = LevelStats(n=level.n, m_directed=level.m_directed)
    stats.levels.append(lstats)
    seed_base = cfg.seed * 10_007 + depth * 1_000
    with Timer() as t:
        assign, nmoves, iters = best_moves(
            level, np.arange(level.n), lam, cfg, seed_base
        )
    lstats.time_moves, lstats.iters, lstats.moves = t.s, iters, nmoves
    dense, nc = densify(assign)
    if nmoves == 0 or nc >= level.n or depth + 1 >= cfg.max_levels:
        return dense
    with Timer() as t:
        if compress_mode == "driver_python":
            child = _compress_driver_python(level, dense, nc, partitions=cfg.partitions)
        else:
            child = compress(level, dense, nc, partitions=cfg.partitions)
    lstats.time_compress = t.s
    child_assign = _recurse(child, depth + 1, lam, cfg, stats, compress_mode)
    assign = flatten(dense, child_assign)
    child.unpersist()
    if cfg.refine:
        with Timer() as t:
            assign, rmoves, riters = best_moves(level, assign, lam, cfg, seed_base + 500)
        lstats.time_refine, lstats.refine_iters, lstats.refine_moves = t.s, riters, rmoves
    return densify(assign)[0]


def parallel_cc(
    g: GraphData, cfg: CCConfig, *, compress_mode: str = "spark"
) -> tuple[np.ndarray, RunStats]:
    """Run PAR-CC / PAR-MOD on a graph; returns (assignment, stats).

    ``cfg.objective`` selects the vertex-weight/λ regime (§2); the
    reported objective is the raw CC value for ``"cc"`` and modularity
    ``Q = CC/(2W)`` for ``"modularity"``.
    """
    deg = degree_array(g)
    two_w = float(deg.sum())
    if cfg.objective == "modularity":
        k0 = deg
        lam = cfg.resolution / two_w if two_w > 0 else 0.0
    else:
        k0 = np.ones(g.n)
        lam = cfg.resolution
    stats = RunStats(algo=f"par-{cfg.objective}", lam=lam, two_w=two_w)
    with Timer() as t:
        lvl0 = level0(g, k0, partitions=cfg.partitions)
        assign = _recurse(lvl0, 0, lam, cfg, stats, compress_mode)
    stats.total_time = t.s
    stats.objective = cc_objective(lvl0, assign, lam)
    stats.reported_objective = (
        stats.objective / two_w if cfg.objective == "modularity" and two_w > 0 else stats.objective
    )
    stats.n_clusters = int(assign.max()) + 1 if len(assign) else 0
    lvl0.unpersist()
    return assign, stats
