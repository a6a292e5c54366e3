"""LambdaCC-MATLAB stand-in: Louvain over a dense adjacency matrix.

Veldt et al.'s reference implementation stores the graph as a dense
adjacency matrix, which the paper reports "cannot scale to graphs of
more than hundreds of vertices". This stand-in reproduces that cost
model: every per-vertex step scans a full O(n) matrix row and
compression is a dense O(n·U) product, so runtime grows ~quadratically
while our sparse SEQ/PAR engines grow with m (Table T12).
"""
from __future__ import annotations

import numpy as np

from ..graphs.gen import GenGraph

_MAX_N = 6000


def lambdacc_dense(g: GenGraph, lam: float, *, num_iter: int = 20, seed: int = 0) -> np.ndarray:
    """Dense-matrix Louvain for the LambdaCC objective (k_v = 1)."""
    if g.n > _MAX_N:
        raise MemoryError(
            f"dense adjacency for n={g.n} refused (> {_MAX_N}); "
            "this is the scaling wall the stand-in exists to demonstrate"
        )
    A = np.zeros((g.n, g.n))
    u = g.edges["u"].to_numpy()
    v = g.edges["v"].to_numpy()
    w = g.edges["w"].to_numpy()
    A[u, v] = w
    A[v, u] = w
    k = np.ones(g.n)
    assign = np.arange(g.n)
    rng = np.random.default_rng(seed)
    n = g.n
    selfw = np.zeros(n)

    for _level in range(50):
        moved_any = False
        for _sweep in range(num_iter):
            moved = 0
            K = np.bincount(assign, weights=k, minlength=n)
            for vtx in rng.permutation(n):
                row = A[vtx]  # dense O(n) scan — the MATLAB cost model
                wvc = np.bincount(assign, weights=row, minlength=n)
                cv = assign[vtx]
                kv = k[vtx]
                own = wvc[cv] - A[vtx, vtx]
                base = own - lam * kv * (K[cv] - kv)
                deltas = wvc - lam * kv * K[: len(wvc)] - base
                deltas[cv] = -np.inf
                empty = K[: len(wvc)] == 0
                deltas[empty] = -base  # moving to an empty slot = detach
                j = int(np.argmax(deltas))
                if deltas[j] > 1e-12:
                    K[cv] -= kv
                    K[j] += kv
                    assign[vtx] = j
                    moved += 1
            if moved:
                moved_any = True
            else:
                break
        if not moved_any:
            break
        # Dense compression.
        labels, inv = np.unique(assign, return_inverse=True)
        U = len(labels)
        if U == n:
            break
        C = np.zeros((n, U))
        C[np.arange(n), inv] = 1.0
        A_new = C.T @ A @ C
        selfw_new = np.bincount(inv, weights=selfw) + np.diag(A_new) / 2.0
        np.fill_diagonal(A_new, 0.0)
        k = np.bincount(inv, weights=k)
        # Track the flattening so we can return original-vertex labels.
        if _level == 0:
            flat = inv.copy()
        else:
            flat = inv[flat]
        A = A_new
        selfw = selfw_new
        n = U
        assign = np.arange(n)
    if "flat" not in locals():
        return assign
    return assign[flat]
