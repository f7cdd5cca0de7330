"""Deliberately naive O(n^2) DPC — the test ground truth.

Independent of every algorithm module's traversal code: full pairwise
squared distances, numpy-masked argmins. All strict comparisons are on
*squared* distances against d_cut² (every index in the repo does the
same), so exact algorithms (Scan, R-tree+Scan, CFSFDP-A, Ex-DPC) must
match its rho and delta exactly, and Approx-DPC must match its rho and
centers (Theorem 4). Only for test-scale n.
"""
from __future__ import annotations

import numpy as np

from repro.core.distutil import sq_dists
from repro.core.labels import finalize
from repro.core.types import DPCParams, DPCResult, tiebreak

__all__ = ["brute_dpc", "brute_rho", "brute_delta"]


def brute_rho(points: np.ndarray, d_cut: float) -> np.ndarray:
    """Raw local density: #other points strictly within d_cut."""
    d2 = sq_dists(points, points)
    np.fill_diagonal(d2, np.inf)
    return (d2 < d_cut * d_cut).sum(axis=1).astype(np.int64)


def brute_delta(
    points: np.ndarray, rho_key: np.ndarray
) -> tuple[np.ndarray, np.ndarray]:
    """(delta, dep) from jittered densities; global peak gets (inf, -1)."""
    n = len(points)
    d2 = sq_dists(points, points)
    np.fill_diagonal(d2, np.inf)
    delta = np.full(n, np.inf)
    dep = np.full(n, -1, dtype=np.int64)
    for i in range(n):
        mask = rho_key > rho_key[i]
        if not mask.any():
            continue
        d = np.where(mask, d2[i], np.inf)
        j = int(np.argmin(d))
        delta[i] = np.sqrt(d[j])
        dep[i] = j
    return delta, dep


def brute_dpc(points: np.ndarray, params: DPCParams) -> DPCResult:
    """Full naive DPC pipeline."""
    n = len(points)
    rho = brute_rho(points, params.d_cut)
    key = rho + tiebreak(n, params.seed)
    delta, dep = brute_delta(points, key)
    centers, noise, labels = finalize(rho, delta, dep, params)
    return DPCResult(
        rho=rho,
        delta=delta,
        dep=dep,
        centers=centers,
        noise=noise,
        labels=labels,
        counters={"dist_evals": n * n},
    )
