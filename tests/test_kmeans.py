"""Tests for the Lloyd's k-means substrate."""
import numpy as np
import pytest

from repro.core.kmeans import kmeans


def test_labels_and_centers_shapes():
    g = np.random.default_rng(0)
    x = g.normal(size=(100, 4))
    labels, centers = kmeans(x, 5, seed=0)
    assert labels.shape == (100,)
    assert centers.shape == (5, 4)
    assert labels.min() >= 0 and labels.max() < 5


def test_separated_clusters_recovered():
    g = np.random.default_rng(1)
    a = g.normal(size=(50, 3)) + np.array([10, 0, 0])
    b = g.normal(size=(50, 3)) + np.array([-10, 0, 0])
    x = np.vstack([a, b])
    labels, centers = kmeans(x, 2, seed=0)
    # All of a in one cluster, all of b in the other.
    assert len(np.unique(labels[:50])) == 1
    assert len(np.unique(labels[50:])) == 1
    assert labels[0] != labels[50]
    xs = np.sort(centers[:, 0])
    assert xs[0] < -8 and xs[1] > 8


def test_deterministic_in_seed():
    g = np.random.default_rng(2)
    x = g.normal(size=(60, 5))
    l1, c1 = kmeans(x, 4, seed=7)
    l2, c2 = kmeans(x, 4, seed=7)
    np.testing.assert_array_equal(l1, l2)
    np.testing.assert_array_equal(c1, c2)


def test_k_clamped_to_n_points():
    x = np.eye(3)
    labels, centers = kmeans(x, 10, seed=0)
    assert centers.shape[0] == 3
    assert len(np.unique(labels)) == 3


def test_single_cluster():
    g = np.random.default_rng(3)
    x = g.normal(size=(20, 2))
    labels, centers = kmeans(x, 1, seed=0)
    assert np.all(labels == 0)
    np.testing.assert_allclose(centers[0], x.mean(axis=0))


def test_identical_points():
    x = np.ones((15, 3))
    labels, centers = kmeans(x, 3, seed=0)
    assert labels.shape == (15,)
    assert np.all(np.isfinite(centers))


def test_assignment_is_nearest_center():
    g = np.random.default_rng(4)
    x = g.normal(size=(80, 4))
    labels, centers = kmeans(x, 4, seed=1)
    d2 = ((x[:, None, :] - centers[None, :, :]) ** 2).sum(-1)
    np.testing.assert_array_equal(labels, d2.argmin(axis=1))


@pytest.mark.parametrize("k", [2, 3, 8])
def test_inertia_not_worse_than_random_centers(k):
    g = np.random.default_rng(5)
    x = g.normal(size=(120, 6))
    labels, centers = kmeans(x, k, seed=2)
    inertia = ((x - centers[labels]) ** 2).sum()
    rand_centers = x[g.choice(120, k, replace=False)]
    d2 = ((x[:, None, :] - rand_centers[None, :, :]) ** 2).sum(-1)
    rand_inertia = d2.min(axis=1).sum()
    assert inertia <= rand_inertia + 1e-9
