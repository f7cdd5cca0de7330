"""Benchmark regenerating Table 3 (Rand index on S1-S4)."""
from __future__ import annotations

from repro import experiments


def test_table3(benchmark, spark):
    df = benchmark.pedantic(
        lambda: experiments.table3(scale=1.0, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert df["dataset"].tolist() == ["S1", "S2", "S3", "S4"]
    assert df["Approx-DPC"].min() >= 0.95
