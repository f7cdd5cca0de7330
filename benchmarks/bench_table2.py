"""Benchmark regenerating Table 2 (Rand index vs noise rate on Syn).

One measured round — the table is a full multi-algorithm sweep, not a
microbenchmark; pytest-benchmark records its wall time and the job
prints the same rows as ``jobs/table2.py``.
"""
from __future__ import annotations

from repro import experiments

SCALE = 0.1


def test_table2(benchmark, spark):
    df = benchmark.pedantic(
        lambda: experiments.table2(scale=SCALE, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 5
    assert df["Approx-DPC"].min() >= 0.9
