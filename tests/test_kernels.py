"""Unit tests for repro.linalg.kernels."""
import numpy as np
import pytest

from repro.linalg.kernels import (
    angles_to,
    canonical_topk,
    merge_topk,
    row_norms,
    topk_from_scores,
)


def test_row_norms_matches_numpy():
    g = np.random.default_rng(0)
    x = g.normal(size=(17, 5))
    np.testing.assert_allclose(row_norms(x), np.linalg.norm(x, axis=1))


def test_row_norms_zero_rows():
    x = np.zeros((3, 4))
    np.testing.assert_array_equal(row_norms(x), np.zeros(3))


@pytest.mark.parametrize("f", [1, 2, 7, 32])
def test_angles_to_range(f):
    g = np.random.default_rng(f)
    v = g.normal(size=(50, f))
    c = g.normal(size=f)
    th = angles_to(v, c)
    assert np.all(th >= 0) and np.all(th <= np.pi + 1e-12)


def test_angles_to_self_is_zero():
    g = np.random.default_rng(1)
    c = g.normal(size=6)
    th = angles_to(np.vstack([c, 2 * c, 0.5 * c]), c)
    np.testing.assert_allclose(th, 0.0, atol=1e-6)


def test_angles_to_opposite_is_pi():
    c = np.array([1.0, 0.0])
    th = angles_to(np.array([[-2.0, 0.0]]), c)
    np.testing.assert_allclose(th, np.pi, atol=1e-12)


def test_angles_to_orthogonal():
    c = np.array([1.0, 0.0])
    th = angles_to(np.array([[0.0, 3.0]]), c)
    np.testing.assert_allclose(th, np.pi / 2, atol=1e-12)


def test_angles_to_zero_vector_treated_aligned():
    c = np.array([1.0, 1.0])
    th = angles_to(np.zeros((2, 2)), c)
    np.testing.assert_array_equal(th, 0.0)


def test_angles_to_zero_center():
    th = angles_to(np.ones((3, 2)), np.zeros(2))
    np.testing.assert_array_equal(th, 0.0)


def test_canonical_topk_orders_by_score_desc():
    ids = np.array([[3, 1, 2]])
    scores = np.array([[1.0, 3.0, 2.0]])
    i2, s2 = canonical_topk(ids, scores)
    np.testing.assert_array_equal(i2, [[1, 2, 3]])
    np.testing.assert_array_equal(s2, [[3.0, 2.0, 1.0]])


def test_canonical_topk_tie_breaks_by_id_asc():
    ids = np.array([[9, 4, 7]])
    scores = np.array([[5.0, 5.0, 5.0]])
    i2, _ = canonical_topk(ids, scores)
    np.testing.assert_array_equal(i2, [[4, 7, 9]])


def test_canonical_topk_multi_row_independent():
    ids = np.array([[0, 1], [1, 0]])
    scores = np.array([[1.0, 2.0], [1.0, 2.0]])
    i2, s2 = canonical_topk(ids, scores)
    np.testing.assert_array_equal(i2, [[1, 0], [0, 1]])
    np.testing.assert_array_equal(s2, [[2.0, 1.0], [2.0, 1.0]])


@pytest.mark.parametrize("k", [1, 2, 5, 11])
def test_topk_from_scores_matches_argsort(k):
    g = np.random.default_rng(k)
    scores = g.normal(size=(20, 11))
    ids, sc = topk_from_scores(scores, k)
    for r in range(20):
        want = np.argsort(-scores[r], kind="stable")[:k]
        np.testing.assert_array_equal(np.sort(ids[r]), np.sort(want))
        np.testing.assert_allclose(sc[r], scores[r][ids[r]])


def test_topk_from_scores_k_exceeds_n():
    scores = np.array([[3.0, 1.0, 2.0]])
    ids, sc = topk_from_scores(scores, 10)
    np.testing.assert_array_equal(ids, [[0, 2, 1]])
    np.testing.assert_array_equal(sc, [[3.0, 2.0, 1.0]])


def test_topk_from_scores_with_exact_ties_prefers_small_ids():
    scores = np.array([[1.0, 1.0, 1.0, 1.0]])
    ids, _ = topk_from_scores(scores, 2)
    np.testing.assert_array_equal(ids, [[0, 1]])


def test_merge_topk_combines_sides():
    ids_a = np.array([[0, 1]])
    sc_a = np.array([[5.0, 1.0]])
    ids_b = np.array([[10, 11]])
    sc_b = np.array([[3.0, 4.0]])
    ids, sc = merge_topk(ids_a, sc_a, ids_b, sc_b, 3)
    np.testing.assert_array_equal(ids, [[0, 11, 10]])
    np.testing.assert_array_equal(sc, [[5.0, 4.0, 3.0]])


def test_merge_topk_k_larger_than_total():
    ids_a = np.array([[0]])
    sc_a = np.array([[1.0]])
    ids_b = np.array([[1]])
    sc_b = np.array([[2.0]])
    ids, sc = merge_topk(ids_a, sc_a, ids_b, sc_b, 5)
    np.testing.assert_array_equal(ids, [[1, 0]])
