"""White-box tests for FEXIPRO-lite's transforms and bounds."""
import numpy as np
import pytest

from repro.indexes.fexipro import FexiproIndex
from repro.mf.models import tiny_model


@pytest.fixture(scope="module")
def built_si():
    model = tiny_model(m=15, n=40, f=8, seed=0)
    idx = FexiproIndex(model, variant="SI")
    idx.build()
    return model, idx


@pytest.fixture(scope="module")
def built_sir():
    model = tiny_model(m=15, n=40, f=8, seed=0)
    idx = FexiproIndex(model, variant="SIR")
    idx.build()
    return model, idx


def test_rotation_is_orthonormal(built_si):
    _, idx = built_si
    np.testing.assert_allclose(idx.v @ idx.v.T, np.eye(idx.model.f), atol=1e-10)


def test_rotation_preserves_inner_products(built_si):
    model, idx = built_si
    u = model.users[0]
    scores_orig = model.items @ u
    scores_rot = (model.items @ idx.v) @ (u @ idx.v)
    np.testing.assert_allclose(scores_rot, scores_orig, atol=1e-9)


def test_energy_concentrates_in_leading_dims(built_si):
    """After the SVD rotation, column energy must be non-increasing."""
    model, idx = built_si
    rot = model.items @ idx.v
    energy = (rot**2).sum(axis=0)
    assert np.all(np.diff(energy) <= 1e-9)


def test_h_covers_90_percent_energy(built_si):
    model, idx = built_si
    rot = model.items @ idx.v
    energy = (rot**2).sum(axis=0)
    assert energy[: idx.h].sum() / energy.sum() >= 0.9
    assert 1 <= idx.h <= model.f


def test_visit_order_by_descending_norm(built_si):
    _, idx = built_si
    norms = np.linalg.norm(idx.rot_items, axis=1)
    assert np.all(np.diff(norms) <= 1e-12)


def test_sir_items_nonnegative(built_sir):
    _, idx = built_sir
    assert idx.rot_items.min() >= -1e-12


def test_sir_shift_correction_exact(built_sir):
    """q·p = q'·p̃ + q'·shift — the SIR decomposition must be lossless."""
    model, idx = built_sir
    u = model.users[3]
    uq = u @ idx.v
    recon = idx.rot_items @ uq + uq @ idx.shift
    np.testing.assert_allclose(recon, model.items[idx.order] @ u, atol=1e-9)


def test_si_shift_is_zero(built_si):
    _, idx = built_si
    np.testing.assert_array_equal(idx.shift, 0.0)


def test_integer_bound_dominates_partial_product(built_si):
    """The quantization bound must upper-bound the true leading partial."""
    model, idx = built_si
    g = np.random.default_rng(7)
    for _ in range(20):
        u = g.normal(size=model.f)
        uq = (u @ idx.v)[: idx.h]
        amax_u = np.abs(uq).max()
        s_q = 127.0 / amax_u if amax_u > 0 else 1.0
        u_int = np.rint(uq * s_q).astype(np.int64)
        int_dot = idx.q_items @ u_int
        err = 0.5 * (idx.q_items_abs_sum + np.abs(u_int).sum()) + 0.25 * idx.h
        ub = (int_dot + err) / (idx.s_p * s_q)
        true_partial = idx.rot_items[:, : idx.h] @ uq
        assert np.all(ub >= true_partial - 1e-9)


def test_invalid_variant_rejected():
    with pytest.raises(ValueError):
        FexiproIndex(tiny_model(), variant="XYZ")


def test_strategy_names():
    assert FexiproIndex(tiny_model(), variant="SI").name == "fexipro-si"
    assert FexiproIndex(tiny_model(), variant="SIR").name == "fexipro-sir"


def test_not_batching():
    assert FexiproIndex(tiny_model()).batching is False
