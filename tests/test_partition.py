"""Greedy LPT load-balancing tests (§4.5 substrate)."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.par.partition import lpt_assign


def _makespan(costs, assign, n_tasks):
    return max(
        (costs[assign == t].sum() for t in range(n_tasks)), default=0.0
    )


class TestLPT:
    def test_single_task(self):
        assert np.all(lpt_assign(np.ones(10), 1) == 0)

    def test_empty(self):
        assert len(lpt_assign(np.empty(0), 4)) == 0

    def test_covers_all_tasks_when_enough_items(self):
        a = lpt_assign(np.ones(100), 8)
        assert set(a.tolist()) == set(range(8))

    def test_equal_costs_balanced(self):
        costs = np.ones(64)
        a = lpt_assign(costs, 4)
        loads = [costs[a == t].sum() for t in range(4)]
        assert max(loads) == min(loads) == 16

    def test_deterministic(self):
        costs = np.random.default_rng(0).random(200)
        assert np.array_equal(lpt_assign(costs, 7), lpt_assign(costs, 7))

    def test_lpt_bound(self):
        """LPT achieves <= (4/3 - 1/(3m)) * OPT; check vs the LB max(avg, max)."""
        rng = np.random.default_rng(1)
        for m in (2, 4, 8):
            costs = rng.random(100) * 10
            a = lpt_assign(costs, m)
            ms = _makespan(costs, a, m)
            lb = max(costs.sum() / m, costs.max())
            assert ms <= (4 / 3) * lb + 1e-9

    def test_skewed_costs(self):
        costs = np.array([100.0] + [1.0] * 50)
        a = lpt_assign(costs, 4)
        # the giant item sits alone-ish: its task gets no more than ~14 extra
        giant_task = a[0]
        assert costs[a == giant_task].sum() <= 115

    def test_more_tasks_than_items(self):
        a = lpt_assign(np.ones(3), 10)
        assert len(set(a.tolist())) == 3

    def test_2d_rejected(self):
        with pytest.raises(ValueError):
            lpt_assign(np.ones((3, 3)), 2)

    @settings(max_examples=30, deadline=None)
    @given(st.lists(st.floats(0.0, 1000.0), min_size=0, max_size=200), st.integers(1, 16))
    def test_property_valid_assignment(self, costs, m):
        costs = np.asarray(costs)
        a = lpt_assign(costs, m)
        assert len(a) == len(costs)
        if len(costs):
            assert a.min() >= 0 and a.max() < m
