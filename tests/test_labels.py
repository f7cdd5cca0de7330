"""Noise/center selection and label-propagation tests (§2.1 step 4)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.labels import finalize, propagate_labels, select_centers
from repro.core.types import DPCParams


def P(d_cut=1.0, rho_min=0.0, delta_min=np.inf):
    return DPCParams(d_cut=d_cut, rho_min=rho_min, delta_min=delta_min)


class TestSelectCenters:
    def test_noise_threshold_strict(self):
        rho = np.array([9, 10, 11])
        delta = np.full(3, 100.0)
        centers, noise = select_centers(rho, delta, P(rho_min=10, delta_min=50))
        assert noise.tolist() == [True, False, False]
        assert centers.tolist() == [1, 2]

    def test_delta_threshold_inclusive(self):
        rho = np.array([5, 5])
        delta = np.array([10.0, 9.999])
        centers, _ = select_centers(rho, delta, P(delta_min=10.0))
        assert centers.tolist() == [0]

    def test_noise_cannot_be_center(self):
        rho = np.array([1, 100])
        delta = np.array([1e9, 1e9])
        centers, noise = select_centers(rho, delta, P(rho_min=10, delta_min=5))
        assert centers.tolist() == [1] and noise[0]

    def test_inf_delta_is_center(self):
        rho = np.array([100])
        delta = np.array([np.inf])
        centers, _ = select_centers(rho, delta, P(delta_min=1e18))
        assert centers.tolist() == [0]


class TestPropagate:
    def test_chain(self):
        # 3 <- 2 <- 1 <- 0 ; center = 3
        dep = np.array([1, 2, 3, -1])
        labels = propagate_labels(dep, np.array([3]), np.zeros(4, bool))
        assert labels.tolist() == [0, 0, 0, 0]

    def test_two_trees(self):
        dep = np.array([-1, 0, 0, -1, 3])
        labels = propagate_labels(dep, np.array([0, 3]), np.zeros(5, bool))
        assert labels.tolist() == [0, 0, 0, 1, 1]

    def test_unreachable_stays_minus_one(self):
        dep = np.array([-1, 0, 1, -1])  # second root (3) is not a center
        labels = propagate_labels(dep, np.array([0]), np.zeros(4, bool))
        assert labels.tolist() == [0, 0, 0, -1]

    def test_propagates_through_noise(self):
        # 0(center) <- 1(noise) <- 2 : 2 keeps the cluster, 1 is -1
        dep = np.array([-1, 0, 1])
        noise = np.array([False, True, False])
        labels = propagate_labels(dep, np.array([0]), noise)
        assert labels.tolist() == [0, -1, 0]

    def test_cycle_tolerated(self):
        # approximate deps can produce cycles; they stay unlabelled
        dep = np.array([1, 0, -1])
        labels = propagate_labels(dep, np.array([2]), np.zeros(3, bool))
        assert labels.tolist() == [-1, -1, 0]

    def test_center_below_other_center_not_absorbed(self):
        # 0 is a center whose dep chain hangs under center 1's tree
        dep = np.array([1, -1, 0])
        labels = propagate_labels(dep, np.array([0, 1]), np.zeros(3, bool))
        assert labels[0] == 0 and labels[1] == 1 and labels[2] == 0

    def test_center_label_order_stable(self):
        dep = np.array([-1, -1])
        labels = propagate_labels(dep, np.array([1, 0]), np.zeros(2, bool))
        assert labels[1] == 0 and labels[0] == 1


class TestFinalize:
    def test_pipeline(self):
        rho = np.array([50, 40, 30, 2])
        delta = np.array([np.inf, 100.0, 1.0, 1.0])
        dep = np.array([-1, 0, 1, 2])
        centers, noise, labels = finalize(rho, delta, dep, P(rho_min=5, delta_min=50))
        assert centers.tolist() == [0, 1]
        assert noise.tolist() == [False, False, False, True]
        assert labels.tolist() == [0, 1, 1, -1]

    def test_everything_noise(self):
        rho = np.zeros(3)
        delta = np.full(3, np.inf)
        dep = np.full(3, -1)
        centers, noise, labels = finalize(rho, delta, dep, P(rho_min=1))
        assert len(centers) == 0 and noise.all() and (labels == -1).all()
