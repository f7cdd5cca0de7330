"""kd-tree substrate tests: differential vs brute force + invariants."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.distutil import sq_dists
from repro.index.kdtree import IncrementalKDTree, KDTree


def _pts(n, d, seed=0, scale=100.0):
    return np.random.default_rng(seed).uniform(0, scale, (n, d))


def _brute_count(pts, q, r):
    return int((sq_dists(q[None, :], pts)[0] < r * r).sum())


def _brute_nn(pts, q, exclude=-1):
    d2 = sq_dists(q[None, :], pts)[0]
    if exclude >= 0:
        d2[exclude] = np.inf
    i = int(np.argmin(d2))
    return i, float(np.sqrt(d2[i]))


class TestBuild:
    @pytest.mark.parametrize("n", [1, 2, 31, 32, 33, 100, 1000])
    def test_perm_is_permutation(self, n):
        t = KDTree(_pts(n, 2))
        assert sorted(t.perm.tolist()) == list(range(n))

    @pytest.mark.parametrize("d", [1, 2, 3, 5, 8])
    def test_dimensions(self, d):
        t = KDTree(_pts(200, d))
        assert t.d == d and t.n == 200

    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            KDTree(np.empty((0, 2)))

    def test_1d_shape_rejected(self):
        with pytest.raises(ValueError):
            KDTree(np.arange(5.0))

    def test_leaf_size_one(self):
        t = KDTree(_pts(64, 2), leaf_size=1)
        assert t.n_nodes >= 64

    def test_duplicate_points_ok(self):
        pts = np.ones((50, 3))
        t = KDTree(pts)
        assert t.range_count(pts[0], 0.5) == 50

    def test_memory_bytes_positive(self):
        assert KDTree(_pts(100, 2)).memory_bytes() > 0


class TestRangeCount:
    @pytest.mark.parametrize("seed", range(5))
    @pytest.mark.parametrize("d", [2, 3, 5])
    def test_matches_brute(self, seed, d):
        pts = _pts(500, d, seed)
        t = KDTree(pts, leaf_size=16)
        qs = _pts(30, d, seed + 100)
        for r in (1.0, 10.0, 40.0, 200.0):
            for q in qs:
                assert t.range_count(q, r) == _brute_count(pts, q, r)

    def test_strict_inequality(self):
        pts = np.array([[0.0, 0.0], [3.0, 4.0]])
        t = KDTree(pts)
        assert t.range_count(np.array([0.0, 0.0]), 5.0) == 1  # dist 5 excluded
        assert t.range_count(np.array([0.0, 0.0]), 5.0 + 1e-9) == 2

    def test_radius_covers_all(self):
        pts = _pts(300, 2, 1)
        t = KDTree(pts)
        assert t.range_count(pts.mean(axis=0), 1e6) == 300

    def test_counts_dist_evals(self):
        t = KDTree(_pts(100, 2))
        t.range_count(np.zeros(2), 10.0)
        assert t.dist_evals > 0


class TestRangeQuery:
    @pytest.mark.parametrize("seed", range(4))
    def test_matches_brute(self, seed):
        pts = _pts(400, 3, seed)
        t = KDTree(pts, leaf_size=8)
        q = pts[seed]
        for r in (5.0, 20.0, 80.0):
            got = sorted(t.range_query(q, r).tolist())
            d2 = sq_dists(q[None, :], pts)[0]
            want = sorted(np.flatnonzero(d2 < r * r).tolist())
            assert got == want

    def test_empty_result(self):
        pts = _pts(100, 2, 0)
        t = KDTree(pts)
        out = t.range_query(np.array([1e6, 1e6]), 1.0)
        assert len(out) == 0 and out.dtype == np.int64

    def test_query_count_consistency(self):
        pts = _pts(300, 4, 2)
        t = KDTree(pts)
        q = pts[7]
        assert len(t.range_query(q, 30.0)) == t.range_count(q, 30.0)


class TestNN:
    @pytest.mark.parametrize("seed", range(5))
    @pytest.mark.parametrize("d", [2, 3, 8])
    def test_matches_brute(self, seed, d):
        pts = _pts(400, d, seed)
        t = KDTree(pts, leaf_size=4)
        for q in _pts(25, d, seed + 50):
            i, dist = t.nn(q)
            bi, bdist = _brute_nn(pts, q)
            assert dist == pytest.approx(bdist)
            assert i == bi or sq_dists(pts[i][None], q[None])[0, 0] == pytest.approx(bdist**2)

    def test_exclude(self):
        pts = _pts(100, 2, 0)
        t = KDTree(pts)
        i, dist = t.nn(pts[5], exclude=5)
        bi, bdist = _brute_nn(pts, pts[5], exclude=5)
        assert dist == pytest.approx(bdist) and i != 5

    def test_single_point_excluded(self):
        t = KDTree(np.zeros((1, 2)))
        i, dist = t.nn(np.zeros(2), exclude=0)
        assert i == -1 and dist == np.inf

    def test_nn_with_bound_prunes(self):
        pts = _pts(500, 2, 1)
        t = KDTree(pts)
        q = np.array([50.0, 50.0])
        bi, bdist = _brute_nn(pts, q)
        i, dist = t.nn_with_bound(q, bdist * 2)
        assert dist == pytest.approx(bdist)
        # bound below the true NN distance: nothing found
        i2, d2 = t.nn_with_bound(q, bdist * 0.5)
        assert i2 == -1 and d2 == pytest.approx(bdist * 0.5)


class TestHypothesis:
    @settings(max_examples=25, deadline=None)
    @given(
        st.integers(1, 200),
        st.integers(1, 4),
        st.floats(0.1, 100.0),
        st.integers(0, 10_000),
    )
    def test_range_count_property(self, n, d, r, seed):
        pts = _pts(n, d, seed)
        t = KDTree(pts, leaf_size=7)
        q = _pts(1, d, seed + 1)[0]
        assert t.range_count(q, r) == _brute_count(pts, q, r)

    @settings(max_examples=25, deadline=None)
    @given(st.integers(2, 150), st.integers(1, 3), st.integers(0, 10_000))
    def test_nn_property(self, n, d, seed):
        pts = _pts(n, d, seed)
        t = KDTree(pts, leaf_size=5)
        q = _pts(1, d, seed + 1)[0]
        _, dist = t.nn(q)
        _, bdist = _brute_nn(pts, q)
        assert dist == pytest.approx(bdist)


class TestIncremental:
    @pytest.mark.parametrize("seed", range(4))
    @pytest.mark.parametrize("d", [2, 3, 6])
    def test_prefix_nn_matches_brute(self, seed, d):
        pts = _pts(200, d, seed)
        t = IncrementalKDTree(d)
        order = np.random.default_rng(seed).permutation(200)
        for rank, i in enumerate(order):
            q = pts[i]
            if rank > 0:
                j, dist = t.nn(q.tolist())
                prefix = pts[order[:rank]]
                d2 = sq_dists(q[None, :], prefix)[0]
                b = int(np.argmin(d2))
                assert dist == pytest.approx(float(np.sqrt(d2[b])))
                assert j == int(order[b]) or dist == pytest.approx(np.sqrt(d2[b]))
            t.insert(int(i), q.tolist())
        assert len(t) == 200

    def test_empty_nn(self):
        t = IncrementalKDTree(2)
        assert t.nn([0.0, 0.0]) == (-1, np.inf)

    def test_duplicate_inserts(self):
        t = IncrementalKDTree(2)
        for i in range(10):
            t.insert(i, [1.0, 1.0])
        j, dist = t.nn([1.0, 1.0])
        assert dist == 0.0 and 0 <= j < 10

    def test_counts_dist_evals(self):
        t = IncrementalKDTree(2)
        t.insert(0, [0.0, 0.0])
        t.nn([1.0, 1.0])
        assert t.dist_evals > 0

    def test_memory_bytes(self):
        t = IncrementalKDTree(3)
        t.insert(0, [0.0, 0.0, 0.0])
        assert t.memory_bytes() == 8 * (3 + 3)
