"""Spark task fan-out: the multicore substrate (DESIGN.md §2).

Every parallel phase of every algorithm is expressed as

    run_tasks(spark, kernel, items, out_schema, costs=...)

where ``items`` is a pandas DataFrame of work descriptors (point ids,
cell ids, chunk ranges). Items are grouped into cost-balanced task
groups with Graham's greedy LPT (``par.partition``) and executed with
``groupBy("task").applyInPandas`` — one pandas batch per task group,
scheduled onto local[*] cores by Spark. Read-only payloads (points,
kd-trees, grids) ride along as Spark broadcasts via :class:`Shared`.

With ``spark=None`` the kernel runs once on the driver over all items —
the serial mode used by unit tests and serial-vs-parallel equality
tests. Kernels therefore must be pure functions of (items, payload).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.par.partition import lpt_assign

__all__ = ["Shared", "run_tasks"]


class Shared:
    """A read-only payload, broadcast under Spark, plain reference otherwise.

    Only the broadcast *handle* is pickled into task closures, so the
    payload ships to each executor once, not once per task.
    """

    def __init__(self, payload, spark=None):
        if spark is not None:
            self._bc = spark.sparkContext.broadcast(payload)
            self._payload = None
        else:
            self._bc = None
            self._payload = payload

    def get(self):
        return self._bc.value if self._bc is not None else self._payload

    def destroy(self) -> None:
        if self._bc is not None:
            self._bc.unpersist()


def run_tasks(
    spark,
    kernel,
    items: pd.DataFrame,
    out_schema: str,
    *,
    costs: np.ndarray | None = None,
    n_tasks: int | None = None,
) -> pd.DataFrame:
    """Run ``kernel(items_group) -> pandas DataFrame`` over balanced groups.

    ``out_schema`` is the Spark DDL schema of the kernel output (parallel
    mode only). Serial mode (``spark=None``) calls the kernel once.
    """
    if spark is None or len(items) == 0:
        return kernel(items).reset_index(drop=True)
    if n_tasks is None:
        n_tasks = spark.sparkContext.defaultParallelism
    if costs is None:
        costs = np.ones(len(items))
    # AQE would coalesce the (byte-wise tiny, compute-wise heavy) shuffle
    # into a single partition and serialise the whole fan-out onto one
    # core; group count here is compute balance, not data balance.
    spark.conf.set("spark.sql.adaptive.coalescePartitions.enabled", "false")
    items = items.copy()
    items["task"] = lpt_assign(np.asarray(costs), n_tasks)
    sdf = spark.createDataFrame(items)
    out = sdf.groupBy("task").applyInPandas(
        lambda pdf: kernel(pdf.drop(columns=["task"])), out_schema
    )
    return out.toPandas()
