"""Rand index tests: known values + brute-force pair counting property."""
from __future__ import annotations

import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.rand_index import rand_index


def _brute_ri(a, b):
    n = len(a)
    agree = 0
    total = 0
    for i, j in itertools.combinations(range(n), 2):
        total += 1
        if (a[i] == a[j]) == (b[i] == b[j]):
            agree += 1
    return agree / total if total else 1.0


class TestRandIndex:
    def test_identical(self):
        a = np.array([0, 0, 1, 1, 2])
        assert rand_index(a, a) == 1.0

    def test_relabeled_identical(self):
        a = np.array([0, 0, 1, 1, 2, 2])
        b = np.array([5, 5, 9, 9, 1, 1])
        assert rand_index(a, b) == 1.0

    def test_known_small(self):
        a = np.array([0, 0, 1, 1])
        b = np.array([0, 1, 0, 1])
        # pairs: (01):a same,b diff; (23):a same,b diff; (02):diff,same;
        # (13):diff,same; (03):diff,diff agree; (12):diff,diff agree => 2/6
        assert rand_index(a, b) == pytest.approx(2 / 6)

    def test_all_singletons_vs_one_cluster(self):
        a = np.arange(5)
        b = np.zeros(5, dtype=int)
        assert rand_index(a, b) == 0.0

    def test_symmetry(self):
        rng = np.random.default_rng(0)
        a = rng.integers(0, 4, 50)
        b = rng.integers(0, 3, 50)
        assert rand_index(a, b) == pytest.approx(rand_index(b, a))

    def test_noise_label_is_a_class(self):
        a = np.array([-1, -1, 0, 0])
        b = np.array([0, 0, 0, 0])
        assert rand_index(a, b) == pytest.approx(_brute_ri(a, b))

    def test_negative_labels_ok(self):
        a = np.array([-1, -5, 3, 3])
        b = np.array([7, 7, -2, -2])
        assert rand_index(a, b) == pytest.approx(_brute_ri(a, b))

    def test_short_inputs(self):
        assert rand_index(np.array([1]), np.array([2])) == 1.0

    def test_mismatched_shapes(self):
        with pytest.raises(ValueError):
            rand_index(np.array([1, 2]), np.array([1]))

    @settings(max_examples=40, deadline=None)
    @given(st.integers(2, 40), st.integers(1, 5), st.integers(0, 9999))
    def test_matches_brute_pair_counting(self, n, k, seed):
        rng = np.random.default_rng(seed)
        a = rng.integers(-1, k, n)
        b = rng.integers(-1, k, n)
        assert rand_index(a, b) == pytest.approx(_brute_ri(a, b))
