"""Benchmark regenerating Table 5 (S-Approx-DPC: eps vs time/accuracy)."""
from __future__ import annotations

from repro import experiments

SCALE = 0.25


def test_table5(benchmark, spark):
    df = benchmark.pedantic(
        lambda: experiments.table5(scale=SCALE, spark=spark),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 10
    # accuracy decreases (weakly) as eps grows, per dataset
    for _, sub in df.groupby("dataset"):
        ri = sub.sort_values("eps")["rand_index"].to_numpy()
        assert all(ri[i] >= ri[i + 1] - 0.02 for i in range(len(ri) - 1))
