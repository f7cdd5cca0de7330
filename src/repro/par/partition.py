"""Greedy cost-based load balancing (§4.5).

The paper balances per-task costs across threads with the classic
greedy makespan-minimisation algorithm of Graham [22] (the cited
3/2-approximation). We implement the LPT variant — sort items by
decreasing cost, always assign to the currently lightest thread — which
achieves a (4/3 − 1/3m) makespan bound, at O(n' log n' + n' log t)
with a binary heap.
"""
from __future__ import annotations

import heapq

import numpy as np

__all__ = ["lpt_assign"]


def lpt_assign(costs: np.ndarray, n_tasks: int) -> np.ndarray:
    """Assign each item to one of ``n_tasks`` groups, balancing cost sums.

    Returns an int64 array ``assign`` with ``assign[i]`` in [0, n_tasks).
    Deterministic: ties broken by item order / task id.
    """
    costs = np.asarray(costs, dtype=np.float64)
    if costs.ndim != 1:
        raise ValueError("costs must be 1-D")
    n_tasks = max(1, int(n_tasks))
    assign = np.zeros(len(costs), dtype=np.int64)
    if len(costs) == 0 or n_tasks == 1:
        return assign
    order = np.argsort(-costs, kind="stable")
    heap = [(0.0, t) for t in range(n_tasks)]
    heapq.heapify(heap)
    for i in order:
        load, t = heapq.heappop(heap)
        assign[i] = t
        heapq.heappush(heap, (load + costs[i], t))
    return assign
