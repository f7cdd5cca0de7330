"""Rand index (pair-counting agreement) — the paper's accuracy metric.

RI = (#agreeing pairs) / C(n,2), computed from the contingency table:
RI = (C(n,2) + 2·Σ_ij C(n_ij,2) − Σ_i C(a_i,2) − Σ_j C(b_j,2)) / C(n,2).

Noise label -1 is treated as a cluster of its own (all points are
compared, as in the paper's "clustering result of Ex-DPC is the ground
truth" protocol).
"""
from __future__ import annotations

import numpy as np

__all__ = ["rand_index"]


def _comb2(x: np.ndarray) -> float:
    x = x.astype(np.float64)
    return float((x * (x - 1.0) / 2.0).sum())


def rand_index(labels_a: np.ndarray, labels_b: np.ndarray) -> float:
    """Rand index between two label arrays over the same points."""
    a = np.asarray(labels_a)
    b = np.asarray(labels_b)
    if a.shape != b.shape or a.ndim != 1:
        raise ValueError("label arrays must be 1-D and the same length")
    n = len(a)
    if n < 2:
        return 1.0
    _, ai = np.unique(a, return_inverse=True)
    _, bi = np.unique(b, return_inverse=True)
    nb = bi.max() + 1
    pair = ai.astype(np.int64) * nb + bi
    nij = np.bincount(pair)
    arow = np.bincount(ai)
    brow = np.bincount(bi)
    total = n * (n - 1) / 2.0
    return (total + 2.0 * _comb2(nij) - _comb2(arow) - _comb2(brow)) / total
