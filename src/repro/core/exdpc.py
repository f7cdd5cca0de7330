"""Ex-DPC (§3): exact DPC via a kd-tree.

* Local density: one kd-tree range count per point. Parallel with
  dynamic-style load balancing — per-point cost is O(n^{1-1/d} + ρ_i)
  and unknowable up front, so (like the paper's OpenMP
  ``schedule(dynamic)``) the points are over-decomposed into ~4× more
  task groups than cores and the Spark scheduler assigns groups to free
  cores.

* Dependent points: the paper's incremental construction — sort by
  descending (jittered) density, then for each point run an NN query on
  a kd-tree containing exactly the higher-density points, inserting the
  point afterwards. This is *inherently sequential* (the paper proves it
  cannot be parallelized) and runs on the driver.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd

from repro.core.labels import finalize
from repro.core.types import DPCParams, DPCResult, tiebreak
from repro.index.kdtree import IncrementalKDTree, KDTree
from repro.par.spark_map import Shared, run_tasks

__all__ = ["ex_dpc", "rho_kdtree"]


def _rho_kernel(items: pd.DataFrame, shared: Shared) -> pd.DataFrame:
    p = shared.get()
    tree: KDTree = p["tree"]
    pts, d_cut = p["pts"], p["d_cut"]
    ids = items["id"].to_numpy()
    rho = np.empty(len(ids), dtype=np.int64)
    nde = np.empty(len(ids), dtype=np.int64)
    for k, i in enumerate(ids):
        before = tree.dist_evals
        rho[k] = tree.range_count(pts[i], d_cut) - 1  # exclude self
        nde[k] = tree.dist_evals - before
    return pd.DataFrame({"id": ids, "rho": rho, "nde": nde})


def rho_kdtree(
    points: np.ndarray,
    tree: KDTree,
    d_cut: float,
    *,
    spark=None,
    n_tasks: int | None = None,
) -> tuple[np.ndarray, int]:
    """All local densities by per-point range counts on ``tree``.

    Returns (rho, dist_evals).
    """
    if spark is not None and n_tasks is None:
        n_tasks = 4 * spark.sparkContext.defaultParallelism  # dynamic-style
    shared = Shared({"tree": tree, "pts": points, "d_cut": d_cut}, spark)
    try:
        out = run_tasks(
            spark,
            lambda it: _rho_kernel(it, shared),
            pd.DataFrame({"id": np.arange(len(points), dtype=np.int64)}),
            "id long, rho long, nde long",
            n_tasks=n_tasks,
        )
    finally:
        shared.destroy()
    rho = np.zeros(len(points), dtype=np.int64)
    rho[out["id"].to_numpy()] = out["rho"].to_numpy()
    return rho, int(out["nde"].sum())


def ex_dpc(
    points: np.ndarray,
    params: DPCParams,
    *,
    spark=None,
    n_tasks: int | None = None,
    leaf_size: int = 32,
) -> DPCResult:
    """Exact DPC: kd-tree range counts + incremental-kd-tree NN (§3)."""
    points = np.ascontiguousarray(points, dtype=np.float64)
    n, d = points.shape
    t0 = time.perf_counter()
    tree = KDTree(points, leaf_size=leaf_size)
    t_build = time.perf_counter() - t0

    t1 = time.perf_counter()
    rho, nde_rho = rho_kdtree(
        points, tree, params.d_cut, spark=spark, n_tasks=n_tasks
    )
    t2 = time.perf_counter()

    key = rho + tiebreak(n, params.seed)
    # Sequential dependent-point phase (driver): destroy K, re-insert in
    # descending density order, NN query against the partial tree.
    order = np.argsort(-key, kind="stable")
    coords = points.tolist()
    itree = IncrementalKDTree(d)
    delta = np.full(n, np.inf)
    dep = np.full(n, -1, dtype=np.int64)
    for rank in range(n):
        i = int(order[rank])
        if rank > 0:
            j, dist = itree.nn(coords[i])
            dep[i] = j
            delta[i] = dist
        itree.insert(i, coords[i])
    t3 = time.perf_counter()

    centers, noise, labels = finalize(rho, delta, dep, params)
    t4 = time.perf_counter()
    return DPCResult(
        rho=rho,
        delta=delta,
        dep=dep,
        centers=centers,
        noise=noise,
        labels=labels,
        timings={
            "build": t_build,
            "rho": (t2 - t1) + t_build,  # Table 6 counts online index build
            "delta": t3 - t2,
            "assign": t4 - t3,
            "total": t4 - t0,
        },
        counters={"dist_evals": nde_rho + itree.dist_evals},
        memory_bytes=tree.memory_bytes() + itree.memory_bytes(),
    )
