"""Tests for the ALS trainer — λ must genuinely shape the learned geometry."""
import numpy as np
import pytest

from repro.mf.als import rmse, train_als
from repro.mf.data import synthetic_ratings, train_test_split


@pytest.fixture(scope="module")
def ratings():
    return synthetic_ratings(n_users=120, n_items=60, density=0.15, rank=4, seed=0)


def test_shapes(ratings):
    u, v = train_als(ratings, f=5, lam=0.1, n_iters=3)
    assert u.shape == (120, 5)
    assert v.shape == (60, 5)


def test_training_reduces_rmse(ratings):
    g = np.random.default_rng(0)
    u0 = g.normal(size=(120, 5))
    v0 = g.normal(size=(60, 5))
    before = rmse(u0, v0, ratings)
    u, v = train_als(ratings, f=5, lam=0.05, n_iters=6)
    after = rmse(u, v, ratings)
    assert after < before


def test_train_rmse_small_on_easy_problem(ratings):
    u, v = train_als(ratings, f=8, lam=0.01, n_iters=8)
    assert rmse(u, v, ratings) < 0.5


def test_more_iters_not_worse(ratings):
    u1, v1 = train_als(ratings, f=5, lam=0.05, n_iters=2, seed=1)
    u8, v8 = train_als(ratings, f=5, lam=0.05, n_iters=10, seed=1)
    assert rmse(u8, v8, ratings) <= rmse(u1, v1, ratings) + 1e-6


def test_regularization_shrinks_norms(ratings):
    """The Section-3 property: larger λ ⇒ smaller factor norms.

    ALS has a per-side scale ambiguity (U can shrink while V grows to
    compensate), so the invariant is on the *combined* penalty term
    Σ‖u‖² + Σ‖i‖² that λ actually multiplies in the objective.
    """

    def penalty(lam):
        u, v = train_als(ratings, f=5, lam=lam, n_iters=6)
        return np.sum(u**2) + np.sum(v**2)

    p = [penalty(lam) for lam in (1e-4, 0.1, 1.0, 10.0)]
    assert p[0] > p[1] > p[2] > p[3]


def test_lambda_zero_does_not_crash(ratings):
    u, v = train_als(ratings, f=4, lam=0.0, n_iters=3)
    assert np.all(np.isfinite(u)) and np.all(np.isfinite(v))


def test_deterministic_in_seed(ratings):
    u1, v1 = train_als(ratings, f=4, lam=0.1, n_iters=3, seed=9)
    u2, v2 = train_als(ratings, f=4, lam=0.1, n_iters=3, seed=9)
    np.testing.assert_array_equal(u1, u2)
    np.testing.assert_array_equal(v1, v2)


def test_generalizes_to_test_set():
    r = synthetic_ratings(n_users=200, n_items=80, density=0.2, rank=4, seed=3)
    train, test = train_test_split(r, seed=3)
    u, v = train_als(train, f=6, lam=0.05, n_iters=8)
    # Mean rating is ~3; a trained model should beat the trivial 1.15-ish
    # std of the generator by a wide margin on held-out data.
    assert rmse(u, v, test) < 1.0


def test_rmse_zero_for_perfect_factors():
    u = np.array([[1.0, 0.0], [0.0, 1.0]])
    v = np.array([[2.0, 0.0], [0.0, 3.0]])
    from repro.mf.data import Ratings

    r = Ratings(
        user=np.array([0, 1]),
        item=np.array([0, 1]),
        rating=np.array([2.0, 3.0]),
        n_users=2,
        n_items=2,
    )
    assert rmse(u, v, r) == 0.0
