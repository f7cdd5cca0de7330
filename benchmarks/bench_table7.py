"""Benchmark regenerating Table 7 (index memory usage).

Memory comes from the same executions as Table 6; this benchmark runs a
reduced-scale Table 6 and checks the paper's memory ordering.
"""
from __future__ import annotations

from repro import experiments

SCALE = 0.1


def test_table7(benchmark, spark):
    t7 = benchmark.pedantic(
        lambda: experiments.table7(scale=SCALE, spark=spark),
        rounds=1,
        iterations=1,
    )
    mem = t7.set_index("algorithm")
    for ds in mem.columns:
        # the paper's shape: CFSFDP-A's pivot table dwarfs everything;
        # Ex-DPC is the leanest of the indexed algorithms
        assert mem.loc["CFSFDP-A", ds] == mem[ds].max()
        assert mem.loc["Ex-DPC", ds] <= mem.loc["Approx-DPC", ds]
