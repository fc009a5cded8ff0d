"""Tests for the remaining from-scratch baselines: STSC, DipMeans, RIC."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.dipmeans import dipmeans
from repro.baselines.ric import ric
from repro.baselines.stsc import stsc
from repro.metrics.ami import ami


@pytest.fixture(scope="module")
def blobs3():
    g = np.random.default_rng(0)
    X = np.vstack([g.normal(c, 0.05, (150, 2)) for c in [(0, 0), (1, 0), (0, 1)]])
    y = np.repeat([0, 1, 2], 150)
    return X, y


class TestSTSC:
    def test_given_k(self, blobs3):
        X, y = blobs3
        assert ami(y, stsc(X, 3)) > 0.95

    def test_auto_k_eigengap(self, blobs3):
        X, y = blobs3
        labels = stsc(X)
        assert len(np.unique(labels)) == 3
        assert ami(y, labels) > 0.95

    def test_rings(self):
        # spectral clustering's signature: concentric rings with local sigma
        g = np.random.default_rng(1)
        t = g.uniform(0, 2 * np.pi, (2, 400))
        inner = 0.3 * np.column_stack([np.cos(t[0]), np.sin(t[0])])
        outer = 1.0 * np.column_stack([np.cos(t[1]), np.sin(t[1])])
        X = np.vstack([inner, outer]) + g.normal(0, 0.01, (800, 2))
        y = np.repeat([0, 1], 400)
        assert ami(y, stsc(X, 2)) > 0.9

    def test_subsample_path(self, blobs3):
        X, y = blobs3
        labels = stsc(X, 3, max_n=100)
        assert len(labels) == len(X)
        assert ami(y, labels) > 0.9

    def test_deterministic(self, blobs3):
        X, _ = blobs3
        assert np.array_equal(stsc(X, 3), stsc(X, 3))


class TestDipMeans:
    def test_finds_three_blobs(self, blobs3):
        X, y = blobs3
        labels = dipmeans(X)
        assert len(np.unique(labels)) == 3
        assert ami(y, labels) > 0.95

    def test_single_blob_no_split(self):
        g = np.random.default_rng(2)
        X = g.normal(0, 1, (300, 2))
        labels = dipmeans(X)
        assert len(np.unique(labels)) == 1

    def test_no_noise_labels(self, blobs3):
        X, _ = blobs3
        assert (dipmeans(X) >= 0).all()

    def test_max_k_respected(self, blobs3):
        X, _ = blobs3
        labels = dipmeans(X, max_k=2)
        assert len(np.unique(labels)) <= 2


class TestRIC:
    def test_runs_and_labels_valid(self, blobs3):
        X, _ = blobs3
        labels = ric(X)
        assert len(labels) == len(X)
        assert labels.min() >= -1

    def test_separable_blobs_reasonable(self, blobs3):
        X, y = blobs3
        labels = ric(X, k0=3)
        assert ami(y, labels) > 0.5

    def test_struggles_on_non_gaussian_shapes(self):
        # RIC codes clusters as Gaussians; ring-shaped clusters in noise
        # defeat it (the paper reports RIC near-zero on such data)
        g = np.random.default_rng(3)
        t = g.uniform(0, 2 * np.pi, 500)
        ring = 0.35 * np.column_stack([np.cos(t), np.sin(t)]) + 0.5
        X = np.vstack([ring + g.normal(0, 0.01, (500, 2)), g.uniform(0, 1, (500, 2))])
        y = np.r_[np.zeros(500, int), -np.ones(500, int)]
        labels = ric(X)
        mask = y >= 0
        assert ami(y[mask], labels[mask]) < 0.6

    def test_noise_points_get_minus_one(self):
        g = np.random.default_rng(4)
        X = np.vstack(
            [g.normal((0.5, 0.5), 0.02, (150, 2)), g.uniform(-3, 4, (300, 2))]
        )
        labels = ric(X, k0=4)
        assert (labels == -1).any()

    def test_deterministic(self, blobs3):
        X, _ = blobs3
        assert np.array_equal(ric(X), ric(X))
