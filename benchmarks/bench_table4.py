"""Benchmark regenerating Table 4 (Rand index on real-like datasets)."""
from __future__ import annotations

from repro import experiments

SCALE = 0.1


def test_table4(benchmark, spark):
    df = benchmark.pedantic(
        lambda: experiments.table4(scale=SCALE, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 4
    # the paper's shape: Approx-DPC beats LSH-DDP on every dataset
    assert (df["Approx-DPC"] >= df["LSH-DDP"] - 0.01).all()
