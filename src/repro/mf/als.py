"""Regularized ALS matrix-factorization trainer.

Minimizes the paper's Section-3 objective:

    sum_{(u,i) observed} (r_ui − uᵀi)² + λ (Σ‖u‖² + Σ‖i‖²)

via alternating least squares: each user row solves the ridge system
``(IᵀI + λE) u = Iᵀ r`` over that user's observed items, then the same for
item rows.  The point of owning the trainer (rather than loading fixed
factor matrices) is that λ must *genuinely* shape the geometry of the
learned factors — the paper's whole argument is that this geometry
determines whether a MIPS index beats brute force.

Rows are grouped with a sort + ``np.split`` so each least-squares solve is
a small dense ``f × f`` system; at reproduction scale (≤ ~10⁴ users) this
trains in well under a second per sweep.
"""
from __future__ import annotations

import numpy as np

from repro.mf.data import Ratings


def _solve_side(
    keys: np.ndarray,
    other_idx: np.ndarray,
    ratings: np.ndarray,
    other_factors: np.ndarray,
    n_rows: int,
    lam: float,
    f: int,
) -> np.ndarray:
    """One ALS half-step: ridge-solve factors for every row of one side."""
    out = np.zeros((n_rows, f))
    order = np.argsort(keys, kind="stable")
    keys_s = keys[order]
    other_s = other_idx[order]
    r_s = ratings[order]
    uniq, starts = np.unique(keys_s, return_index=True)
    bounds = np.append(starts, len(keys_s))
    eye = lam * np.eye(f)
    for j, row in enumerate(uniq):
        sl = slice(bounds[j], bounds[j + 1])
        a = other_factors[other_s[sl]]
        gram = a.T @ a + eye
        rhs = a.T @ r_s[sl]
        out[row] = np.linalg.solve(gram, rhs)
    return out


def train_als(
    ratings: Ratings,
    *,
    f: int,
    lam: float,
    n_iters: int = 8,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Train ``(users, items)`` factor matrices of rank ``f`` at reg. ``lam``.

    Returns ``(U, I)`` with shapes ``(n_users, f)`` and ``(n_items, f)``.
    ``lam`` is floored at a tiny ridge (1e-9) so the normal equations stay
    solvable for λ=0 sweeps.
    """
    g = np.random.default_rng(seed)
    lam_eff = max(lam, 1e-9)
    items = g.normal(scale=0.1, size=(ratings.n_items, f))
    users = np.zeros((ratings.n_users, f))
    for _ in range(n_iters):
        users = _solve_side(
            ratings.user, ratings.item, ratings.rating, items,
            ratings.n_users, lam_eff, f,
        )
        items = _solve_side(
            ratings.item, ratings.user, ratings.rating, users,
            ratings.n_items, lam_eff, f,
        )
    return users, items


def rmse(users: np.ndarray, items: np.ndarray, ratings: Ratings) -> float:
    """Root-mean-square prediction error over the given observed entries."""
    pred = np.einsum("ij,ij->i", users[ratings.user], items[ratings.item])
    return float(np.sqrt(np.mean((pred - ratings.rating) ** 2)))
