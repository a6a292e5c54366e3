"""Executable Appendix D: the monotone CVP → LambdaCC Louvain reduction.

The paper proves Louvain-for-CC is P-complete by reducing the monotone
circuit-value problem to it: gates become vertices whose best-moves
dynamics (at λ = 0) force each gate vertex into the cluster of ``t`` or
``f`` according to its truth value. This module builds that exact gadget
graph (Figure 18) and decodes circuit outputs from the clustering, which
turns the theorem into a runnable test.

Weights are computed with exact rationals (the construction multiplies
inverse degree products, which underflow float64 for deep circuits) and
rescaled so the smallest gate weight is 1.0 before converting to float.
"""
from __future__ import annotations

from dataclasses import dataclass
from fractions import Fraction

import numpy as np
import pandas as pd

from ..graphs.gen import GenGraph
from .config import CCConfig
from .seq_louvain import _sweeps, build_csr


@dataclass(frozen=True)
class Gate:
    """One monotone gate: ``op`` in {"and", "or"}, inputs by node index.

    Node indices: inputs 0..n_inputs-1 are circuit inputs; gate ``i`` is
    node ``n_inputs + i`` and may reference any earlier node.
    """

    op: str
    a: int
    b: int


@dataclass
class Circuit:
    n_inputs: int
    gates: list[Gate]

    def evaluate(self, inputs: list[bool]) -> list[bool]:
        """Ground-truth gate values, in gate order."""
        vals = list(inputs)
        for g in self.gates:
            x, y = vals[g.a], vals[g.b]
            vals.append((x and y) if g.op == "and" else (x or y))
        return vals[self.n_inputs :]


_EPS = Fraction(3, 10)
# Weight decay per topological position. The proof needs the total weight
# of a gate's out-edges (its consumers' w, each <= f(pos)/_DECAY) to sit
# below the smallest decision margin (~ε/6 · w >= ε/6 · f(pos)); with
# decay D the out-sum is <= 2f(pos)/D, so D=128 leaves ε/6=0.05 ≫ 2/128.
_DECAY = 128


def reduction_graph(circ: Circuit, inputs: list[bool]) -> tuple[GenGraph, dict]:
    """Build the Appendix D gadget graph for ``circ`` under ``inputs``.

    Returns the graph plus a layout dict mapping roles to vertex ids:
    ``t``, ``f``, ``input[i]``, ``gate[i]``, ``gate_prime[i]``.
    """
    n_nodes = circ.n_inputs + len(circ.gates)
    # DAG degrees (in + out) per node, padded to >= _DECAY so the
    # geometric weight decay gives strict slack in the proof's
    # inequalities (see _DECAY above).
    deg = np.zeros(n_nodes, dtype="int64")
    for idx, g in enumerate(circ.gates):
        gid = circ.n_inputs + idx
        deg[g.a] += 1
        deg[g.b] += 1
        deg[gid] += 2
    pad_deg = np.maximum(deg, _DECAY)
    # f(node at topo position i) = 1 / prod of padded degrees before it;
    # node order = natural index order (inputs, then gates in order).
    f: list[Fraction] = []
    acc = Fraction(1)
    for i in range(n_nodes):
        f.append(acc)
        acc = acc / int(pad_deg[i])

    # Vertex ids: t=0, f=1, constant anchor literals 2/3 (the paper's
    # construction has every variable AND its negation, so t and f are
    # always anchored by at least one literal regardless of the input
    # assignment), input i -> 4+i, gate j -> base+2j, g' -> base+2j+1.
    t, fv = 0, 1
    anchor_t, anchor_f = 2, 3
    in_base = 4
    gate_base = in_base + circ.n_inputs
    n_vertices = gate_base + 2 * len(circ.gates)
    layout = {
        "t": t,
        "f": fv,
        "input": [in_base + i for i in range(circ.n_inputs)],
        "gate": [gate_base + 2 * j for j in range(len(circ.gates))],
        "gate_prime": [gate_base + 2 * j + 1 for j in range(len(circ.gates))],
    }

    def node_vertex(node: int) -> int:
        return in_base + node if node < circ.n_inputs else gate_base + 2 * (node - circ.n_inputs)

    edges: list[tuple[int, int, Fraction]] = []
    w_gate: list[Fraction] = []
    for j, g in enumerate(circ.gates):
        w = min(f[g.a], f[g.b])
        w_gate.append(w)
        gk = layout["gate"][j]
        gkp = layout["gate_prime"][j]
        edges.append((node_vertex(g.a), gk, w))
        edges.append((node_vertex(g.b), gk, w))
        edges.append((gk, gkp, (2 + 2 * _EPS / 3) * w))
        if g.op == "or":
            edges.append((gk, t, (1 + _EPS) * w))
            edges.append((gk, fv, (1 + _EPS / 2) * w))
        else:
            edges.append((gk, t, (1 + _EPS / 2) * w))
            edges.append((gk, fv, (1 + _EPS) * w))
    w_min = min(w_gate) if w_gate else Fraction(1)
    w_max = max(w_gate) if w_gate else Fraction(1)
    big = 100 * w_max / w_min  # literal anchor weight, dominates gate edges
    scaled: list[tuple[int, int, float]] = [
        (u, v, float(w / w_min)) for (u, v, w) in edges
    ]
    for i in range(circ.n_inputs):
        anchor = t if inputs[i] else fv
        scaled.append((layout["input"][i], anchor, float(big)))
    scaled.append((anchor_t, t, float(big)))
    scaled.append((anchor_f, fv, float(big)))
    scaled.append((t, fv, float(-100 * big)))
    pdf = pd.DataFrame(scaled, columns=["u", "v", "w"])
    lo = pdf[["u", "v"]].min(axis=1)
    hi = pdf[["u", "v"]].max(axis=1)
    pdf = pd.DataFrame({"u": lo.astype("int64"), "v": hi.astype("int64"), "w": pdf["w"]})
    return GenGraph(name="cvp-reduction", n=n_vertices, edges=pdf), layout


def louvain_decode(circ: Circuit, inputs: list[bool], *, seed: int = 0) -> list[bool]:
    """Run sequential best-moves (λ=0) on the gadget and decode gate values."""
    g, layout = reduction_graph(circ, inputs)
    csr = build_csr(g.edges, g.n, np.ones(g.n))
    cfg = CCConfig(
        resolution=0.0,
        to_convergence=True,
        frontier="all",
        refine=False,
        seed=seed,
        move_tol=0.0,
    )
    rng = np.random.default_rng(seed)
    assign, _, _ = _sweeps(csr, np.arange(g.n), 0.0, cfg, rng)
    t_cluster = assign[layout["t"]]
    f_cluster = assign[layout["f"]]
    out: list[bool] = []
    for gk in layout["gate"]:
        c = assign[gk]
        if c == t_cluster:
            out.append(True)
        elif c == f_cluster:
            out.append(False)
        else:
            raise AssertionError(
                f"gate vertex {gk} converged to neither t nor f cluster"
            )
    return out
