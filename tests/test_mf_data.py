"""Tests for the synthetic ratings substrate."""
import numpy as np
import pytest

from repro.mf.data import (
    DATASET_SHAPES,
    PAPER_TABLE1,
    Ratings,
    dataset_ratings,
    synthetic_ratings,
    train_test_split,
)


def test_synthetic_ratings_shapes():
    r = synthetic_ratings(n_users=50, n_items=30, density=0.1, seed=0)
    assert r.n_users == 50 and r.n_items == 30
    assert len(r.user) == len(r.item) == len(r.rating) == r.nnz


def test_ratings_in_star_range():
    r = synthetic_ratings(n_users=40, n_items=25, seed=1)
    assert r.rating.min() >= 1.0 and r.rating.max() <= 5.0


def test_every_user_has_a_rating():
    r = synthetic_ratings(n_users=64, n_items=20, density=0.02, seed=2)
    assert len(np.unique(r.user)) == 64


def test_indices_in_range():
    r = synthetic_ratings(n_users=30, n_items=12, seed=3)
    assert r.user.min() >= 0 and r.user.max() < 30
    assert r.item.min() >= 0 and r.item.max() < 12


def test_deterministic_in_seed():
    a = synthetic_ratings(n_users=20, n_items=10, seed=5)
    b = synthetic_ratings(n_users=20, n_items=10, seed=5)
    np.testing.assert_array_equal(a.rating, b.rating)
    np.testing.assert_array_equal(a.user, b.user)


def test_different_seeds_differ():
    a = synthetic_ratings(n_users=20, n_items=10, seed=5)
    b = synthetic_ratings(n_users=20, n_items=10, seed=6)
    assert not np.array_equal(a.rating, b.rating)


def test_train_test_split_partitions():
    r = synthetic_ratings(n_users=40, n_items=20, density=0.2, seed=7)
    train, test = train_test_split(r, test_frac=0.25, seed=0)
    assert train.nnz + test.nnz == r.nnz
    assert 0.1 < test.nnz / r.nnz < 0.4  # roughly the requested fraction


def test_train_test_split_preserves_dims():
    r = synthetic_ratings(n_users=40, n_items=20, seed=8)
    train, test = train_test_split(r)
    assert train.n_users == test.n_users == 40
    assert train.n_items == test.n_items == 20


@pytest.mark.parametrize("name", sorted(DATASET_SHAPES))
def test_dataset_ratings_analogs(name):
    r = dataset_ratings(name, scale=0.01, seed=0)
    assert r.n_users >= 8 and r.n_items >= 8
    assert r.nnz > 0


def test_dataset_aspect_ratios_match_paper_direction():
    """The analogs must preserve which side (users vs items) dominates."""
    for name, (nu, ni) in DATASET_SHAPES.items():
        paper = PAPER_TABLE1[name]
        assert (nu > ni) == (paper["users"] > paper["items"]), name


def test_dataset_ratings_unknown_name():
    with pytest.raises(KeyError):
        dataset_ratings("movielens")


def test_nnz_property():
    r = Ratings(
        user=np.array([0, 1]), item=np.array([0, 1]),
        rating=np.array([1.0, 2.0]), n_users=2, n_items=2,
    )
    assert r.nnz == 2
