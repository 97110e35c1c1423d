"""Shared vector kernels used by every MIPS strategy.

All strategies must agree bit-for-bit on the returned top-K *ids* so the
exactness tests can compare them directly.  The canonical ordering is
(score descending, item id ascending); ``canonical_topk`` enforces it.
"""
from __future__ import annotations

import numpy as np


def row_norms(x: np.ndarray) -> np.ndarray:
    """L2 norm of each row of a 2-D array; shape ``(m,)``.

    ``einsum`` rather than ``np.linalg.norm(axis=1)`` — the latter is an
    order of magnitude slower on this container's NumPy build and these
    norms sit on RECDEX's index-construction path.
    """
    return np.sqrt(np.einsum("ij,ij->i", x, x))


def angles_to(vectors: np.ndarray, center: np.ndarray) -> np.ndarray:
    """Angular distance (radians, in [0, pi]) from each row to ``center``.

    Zero-norm rows or a zero-norm center are defined to have angle 0 — a
    zero vector's inner product with anything is 0, and treating it as
    perfectly aligned keeps every bound that uses these angles conservative
    (cos(θ - θ_b) can only grow when θ shrinks).
    """
    cn = float(np.linalg.norm(center))
    vn = row_norms(vectors)
    if cn == 0.0:
        return np.zeros(len(vectors))
    with np.errstate(invalid="ignore", divide="ignore"):
        cos = (vectors @ center) / (vn * cn)
    cos = np.where(vn == 0.0, 1.0, cos)
    return np.arccos(np.clip(cos, -1.0, 1.0))


def canonical_topk(ids: np.ndarray, scores: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Sort per-row (ids, scores) pairs by score desc, then id asc.

    ``ids``/``scores`` are ``(m, k)``; returns the same shapes reordered.
    This is the tie-break every strategy must share for exact comparisons.
    """
    # lexsort keys are applied last-key-major: primary -scores, secondary ids.
    order = np.lexsort((ids, -scores), axis=1)
    rows = np.arange(ids.shape[0])[:, None]
    return ids[rows, order], scores[rows, order]


def topk_with_ids(ids: np.ndarray, scores: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    """Exact canonical top-``k`` of ``scores`` labeled by ``ids``.

    ``scores`` is ``(m, n)``; ``ids`` is ``(n,)`` or ``(m, n)`` and gives
    the real item id of each column.  Fast path: ``argpartition`` (the
    NumPy analog of the paper's priority queue).  ``argpartition`` picks
    *arbitrary* members of a tied boundary group, which would violate the
    canonical (score desc, id asc) rule, so rows whose kth score ties
    across the selection boundary are re-done with a full tie-aware sort
    over real ids.  ``k`` is clamped to the column count.
    """
    m, n = scores.shape
    ids2d = np.broadcast_to(ids, scores.shape) if ids.ndim == 1 else ids
    k = min(k, n)
    if k == n:
        return canonical_topk(ids2d.copy(), scores.copy())
    part = np.argpartition(-scores, k - 1, axis=1)[:, :k]
    rows = np.arange(m)[:, None]
    out_ids, out_sc = canonical_topk(ids2d[rows, part], scores[rows, part])
    kth = out_sc[:, -1]
    # A row is tie-ambiguous iff more than k entries are >= its kth score.
    ambiguous = np.nonzero((scores >= kth[:, None]).sum(axis=1) > k)[0]
    for r in ambiguous:
        order = np.lexsort((ids2d[r], -scores[r]))[:k]
        out_ids[r] = ids2d[r, order]
        out_sc[r] = scores[r, order]
    return out_ids, out_sc


def topk_from_scores(scores: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    """Exact top-``k`` (ids, scores) per row; ids are column indices."""
    return topk_with_ids(np.arange(scores.shape[1]), scores, k)


def merge_topk(
    ids_a: np.ndarray,
    scores_a: np.ndarray,
    ids_b: np.ndarray,
    scores_b: np.ndarray,
    k: int,
) -> tuple[np.ndarray, np.ndarray]:
    """Merge two per-row top-K candidate sets into one exact top-``k``.

    Both inputs are ``(m, *)`` with matching row counts; duplicate ids
    between the two sides are not expected (callers pass disjoint item
    ranges).  Ties broken canonically.
    """
    ids = np.concatenate([ids_a, ids_b], axis=1)
    scores = np.concatenate([scores_a, scores_b], axis=1)
    return topk_with_ids(ids, scores, k)
