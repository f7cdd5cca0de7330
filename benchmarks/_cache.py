"""Shared dataset/ground-truth cache for the benchmarks.

Ground truth (Ex-DPC + δ_min selection) is needed by every accuracy
benchmark; caching it per (dataset, scale) keeps the benchmark suite's
wall time dominated by the code actually being measured.
"""
from __future__ import annotations

from repro import experiments

_CACHE: dict = {}


def dataset_and_params(name: str, scale: float):
    key = (name, scale)
    if key not in _CACHE:
        ds = experiments._scaled(name, scale)
        _, params = experiments.ground_truth(ds)
        _CACHE[key] = (ds, params)
    return _CACHE[key]
