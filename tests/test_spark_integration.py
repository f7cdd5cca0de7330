"""Serial (driver) vs Spark-parallel equality for every algorithm, plus
run_tasks/Shared substrate behaviour under Spark."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.baselines.cfsfdp_a import cfsfdp_a
from repro.baselines.lsh_ddp import lsh_ddp
from repro.baselines.rtree_scan import rtree_scan_dpc
from repro.core.approx_dpc import approx_dpc
from repro.core.exdpc import ex_dpc
from repro.core.s_approx_dpc import s_approx_dpc
from repro.core.scan import scan_dpc
from repro.core.types import DPCParams
from repro.par.spark_map import Shared, run_tasks
from tests.conftest import make_blobs

ALGOS = [
    ("scan", scan_dpc),
    ("exdpc", ex_dpc),
    ("rtree_scan", rtree_scan_dpc),
    ("cfsfdp_a", cfsfdp_a),
    ("approx_dpc", approx_dpc),
    ("lsh_ddp", lsh_ddp),
]


@pytest.fixture(scope="module")
def data():
    pts = make_blobs(n_per=120, k=3, n_noise=20, seed=0)
    return pts, DPCParams(d_cut=8.0, rho_min=5, delta_min=30.0)


@pytest.mark.parametrize("name,fn", ALGOS, ids=[a for a, _ in ALGOS])
def test_parallel_equals_serial(spark, data, name, fn):
    pts, params = data
    a = fn(pts, params)
    b = fn(pts, params, spark=spark)
    assert np.array_equal(a.rho, b.rho), name
    assert np.allclose(a.delta, b.delta), name
    assert np.array_equal(a.dep, b.dep), name
    assert np.array_equal(a.centers, b.centers), name
    assert np.array_equal(a.labels, b.labels), name


@pytest.mark.parametrize("eps", [0.4, 1.0])
def test_s_approx_parallel_equals_serial(spark, data, eps):
    pts, params = data
    a = s_approx_dpc(pts, params, eps)
    b = s_approx_dpc(pts, params, eps, spark=spark)
    assert np.array_equal(a.rho, b.rho)
    assert np.allclose(a.delta, b.delta)
    assert np.array_equal(a.labels, b.labels)


@pytest.mark.parametrize("n_tasks", [1, 3, 16, 64])
def test_task_count_invariant(spark, data, n_tasks):
    pts, params = data
    base = ex_dpc(pts, params)
    res = ex_dpc(pts, params, spark=spark, n_tasks=n_tasks)
    assert np.array_equal(base.labels, res.labels)


class TestRunTasks:
    def test_serial_mode_single_call(self):
        calls = []

        def kernel(items):
            calls.append(len(items))
            return items.assign(out=items["x"] * 2)

        out = run_tasks(None, kernel, pd.DataFrame({"x": np.arange(10)}), "ignored")
        assert calls == [10]
        assert out["out"].tolist() == list(range(0, 20, 2))

    def test_parallel_covers_all_items(self, spark):
        def kernel(items):
            return items.assign(out=items["x"] + 1)

        out = run_tasks(
            spark,
            kernel,
            pd.DataFrame({"x": np.arange(100, dtype=np.int64)}),
            "x long, out long",
            n_tasks=7,
        )
        assert sorted(out["out"].tolist()) == list(range(1, 101))

    def test_costs_drive_grouping(self, spark):
        # kernel records group sizes; with one giant item, LPT isolates it
        def kernel(items):
            return pd.DataFrame({"size": [np.int64(len(items))]})

        costs = np.array([100.0] + [1.0] * 30)
        out = run_tasks(
            spark,
            kernel,
            pd.DataFrame({"x": np.arange(31, dtype=np.int64)}),
            "size long",
            costs=costs,
            n_tasks=4,
        )
        assert 1 in out["size"].tolist()  # the giant item sits alone

    def test_empty_items(self, spark):
        def kernel(items):
            return items

        out = run_tasks(spark, kernel, pd.DataFrame({"x": []}), "x double")
        assert len(out) == 0

    def test_shared_serial_and_spark(self, spark):
        s1 = Shared({"v": 42})
        assert s1.get()["v"] == 42
        s2 = Shared({"v": 43}, spark)
        assert s2.get()["v"] == 43
        s2.destroy()
