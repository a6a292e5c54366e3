"""Clustering quality metrics used in the paper's evaluation.

- :func:`avg_precision_recall` — the paper's ground-truth methodology
  (§4, following Tsourakakis et al.): each ground-truth community ``c``
  is matched to the output cluster ``c'`` with the largest intersection;
  precision = |c ∩ c'| / |c'| and recall = |c ∩ c'| / |c| are averaged
  over communities (a cluster may match several or no communities).
- :func:`ari` / :func:`nmi` — Adjusted Rand Index and Normalized Mutual
  Information for the weighted-graph experiments (Figures 15/16),
  implemented from the contingency table (no sklearn offline).
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def avg_precision_recall(
    gt_communities: list[np.ndarray], assign: np.ndarray
) -> tuple[float, float]:
    """Average precision/recall of ``assign`` against ground-truth communities."""
    cluster_sizes = pd.Series(assign).value_counts()
    precs: list[float] = []
    recs: list[float] = []
    for comm in gt_communities:
        labels, counts = np.unique(assign[comm], return_counts=True)
        j = int(np.argmax(counts))
        inter = float(counts[j])
        c_size = float(cluster_sizes[labels[j]])
        precs.append(inter / c_size)
        recs.append(inter / len(comm))
    return float(np.mean(precs)), float(np.mean(recs))


def _contingency(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Dense contingency counts between two label arrays."""
    _, ai = np.unique(a, return_inverse=True)
    _, bi = np.unique(b, return_inverse=True)
    na, nb = ai.max() + 1, bi.max() + 1
    m = np.zeros((na, nb), dtype="int64")
    np.add.at(m, (ai, bi), 1)
    return m


def ari(gt: np.ndarray, assign: np.ndarray) -> float:
    """Adjusted Rand Index (Hubert & Arabie)."""
    m = _contingency(gt, assign)
    n = m.sum()
    sum_comb = (m * (m - 1) // 2).sum()
    a = m.sum(axis=1)
    b = m.sum(axis=0)
    comb_a = (a * (a - 1) // 2).sum()
    comb_b = (b * (b - 1) // 2).sum()
    total = n * (n - 1) // 2
    expected = comb_a * comb_b / total if total else 0.0
    max_index = (comb_a + comb_b) / 2.0
    if max_index == expected:
        return 1.0
    return float((sum_comb - expected) / (max_index - expected))


def nmi(gt: np.ndarray, assign: np.ndarray) -> float:
    """NMI with arithmetic-mean normalization."""
    m = _contingency(gt, assign).astype("float64")
    n = m.sum()
    if n == 0:
        return 0.0
    pij = m / n
    pi = pij.sum(axis=1, keepdims=True)
    pj = pij.sum(axis=0, keepdims=True)
    nz = pij > 0
    mi = float((pij[nz] * np.log(pij[nz] / (pi @ pj)[nz])).sum())
    hi = -float((pi[pi > 0] * np.log(pi[pi > 0])).sum())
    hj = -float((pj[pj > 0] * np.log(pj[pj > 0])).sum())
    denom = (hi + hj) / 2.0
    return mi / denom if denom > 0 else 1.0
