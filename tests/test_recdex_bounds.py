"""Property tests for the RECDEX bound (Lemma 5.1) and index structure."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.kmeans import kmeans
from repro.core.recdex import RecdexIndex, cbound
from repro.linalg.kernels import angles_to
from repro.mf.models import tiny_model


def _vec(f, lo=-5.0, hi=5.0):
    return st.lists(
        st.floats(lo, hi, allow_nan=False, allow_infinity=False),
        min_size=f, max_size=f,
    ).map(np.array)


@settings(max_examples=150, deadline=None)
@given(u=_vec(4), c=_vec(4), i=_vec(4))
def test_cbound_upper_bounds_normalized_rating(u, c, i):
    """Lemma 5.1: r*_ci ≥ (u·i)/‖u‖ whenever θ(u,c) ≤ θ_b."""
    if np.linalg.norm(u) < 1e-6 or np.linalg.norm(c) < 1e-6 or np.linalg.norm(i) < 1e-6:
        return
    theta_uc = float(angles_to(u[None, :], c)[0])
    theta_ic = float(angles_to(i[None, :], c)[0])
    theta_b = theta_uc  # tightest admissible θ_b
    bound = float(cbound(np.array([theta_ic]), np.array([np.linalg.norm(i)]), theta_b)[0])
    normalized = float(u @ i) / float(np.linalg.norm(u))
    assert bound >= normalized - 1e-9


@settings(max_examples=100, deadline=None)
@given(u=_vec(4), c=_vec(4), i=_vec(4), extra=st.floats(0.0, 1.0))
def test_cbound_monotone_in_theta_b(u, c, i, extra):
    """Relaxing θ_b (Eqn. 2 → Eqn. 3) can only loosen the bound."""
    if np.linalg.norm(c) < 1e-6 or np.linalg.norm(i) < 1e-6 or np.linalg.norm(u) < 1e-6:
        return
    theta_ic = angles_to(i[None, :], c)
    norms = np.array([np.linalg.norm(i)])
    theta_b = float(angles_to(u[None, :], c)[0])
    tight = float(cbound(theta_ic, norms, theta_b)[0])
    loose = float(cbound(theta_ic, norms, min(theta_b + extra, np.pi))[0])
    assert loose >= tight - 1e-12


def test_cbound_caps_at_item_norm():
    theta_ic = np.array([0.3, 1.0, 2.0])
    norms = np.array([2.0, 3.0, 4.0])
    b = cbound(theta_ic, norms, theta_b=2.5)  # θ_b ≥ all θ_ic → bound = ‖i‖
    np.testing.assert_array_equal(b, norms)


def test_cbound_aligned_item():
    # θ_ic = 0 < θ_b is false when θ_b=0... θ_b < θ_ic fails → bound = ‖i‖.
    b = cbound(np.array([0.0]), np.array([5.0]), theta_b=0.0)
    np.testing.assert_array_equal(b, [5.0])


def test_cbound_vectorized_matches_scalar():
    g = np.random.default_rng(0)
    theta_ic = g.uniform(0, np.pi, 20)
    norms = g.uniform(0.1, 3.0, 20)
    theta_b = 0.7
    vec = cbound(theta_ic, norms, theta_b)
    for j in range(20):
        want = norms[j] * np.cos(theta_ic[j] - theta_b) if theta_b < theta_ic[j] else norms[j]
        assert vec[j] == pytest.approx(want)


# --- index-structure invariants -------------------------------------------

@pytest.fixture(scope="module")
def built_index():
    model = tiny_model(m=80, n=50, f=6, seed=42)
    idx = RecdexIndex(model, n_clusters=5, block=8, walk_chunk=4, seed=0)
    idx.build()
    return model, idx


def test_cluster_lists_sorted_descending(built_index):
    """Property 5.1: each L_c is sorted descending by r*_ci."""
    _, idx = built_index
    for cl in idx.clusters:
        assert np.all(np.diff(cl.bounds) <= 1e-12)


def test_cluster_lists_cover_all_items(built_index):
    model, idx = built_index
    for cl in idx.clusters:
        assert sorted(cl.item_order.tolist()) == list(range(model.n))


def test_theta_b_covers_all_members(built_index):
    """θ_b must be ≥ every member's angle to the centroid."""
    model, idx = built_index
    for cl in idx.clusters:
        member_angles = angles_to(model.users[cl.user_rows], cl.center)
        assert member_angles.max() <= cl.theta_b + 1e-12


def test_clusters_partition_users(built_index):
    model, idx = built_index
    all_rows = np.concatenate([cl.user_rows for cl in idx.clusters])
    assert sorted(all_rows.tolist()) == list(range(model.m))


def test_bounds_dominate_member_normalized_scores(built_index):
    """End-to-end Lemma 5.1 on a real built index."""
    model, idx = built_index
    for cl in idx.clusters:
        users = model.users[cl.user_rows]
        norms = np.linalg.norm(users, axis=1, keepdims=True)
        normalized = (users @ model.items[cl.item_order].T) / np.maximum(norms, 1e-12)
        assert np.all(normalized <= cl.bounds[None, :] + 1e-9)


def test_items_visited_counter(built_index):
    model, _ = built_index
    idx = RecdexIndex(model, n_clusters=5, block=8, walk_chunk=4, seed=0)
    idx.build()
    assert idx.items_visited == 0
    idx.query_all(3)
    assert idx.items_visited >= model.m * min(3, model.n)
    assert idx.items_visited <= model.m * model.n


def test_build_timings_recorded(built_index):
    _, idx = built_index
    assert set(idx.timings) == {"cluster", "bound", "sort"}
    assert all(v >= 0 for v in idx.timings.values())


def test_build_idempotent(built_index):
    model, idx = built_index
    before = [cl.bounds.copy() for cl in idx.clusters]
    idx.build()
    for cl, b in zip(idx.clusters, before):
        np.testing.assert_array_equal(cl.bounds, b)
