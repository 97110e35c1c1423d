"""Seeded Lloyd's k-means — the clustering substrate for RECDEX.

The paper uses Armadillo's k-means ("standard k-means works remarkably
well" for approximating angular clusters, Section 5.1).  This is a plain
NumPy Lloyd's iteration with k-means++-style seeding, deterministic in
``seed``.  Empty clusters are re-seeded from the farthest points so the
requested cluster count is always honored.
"""
from __future__ import annotations

import numpy as np


def _seed_centers(x: np.ndarray, k: int, g: np.random.Generator) -> np.ndarray:
    """k-means++ seeding: spread initial centers by squared distance."""
    n = len(x)
    centers = np.empty((k, x.shape[1]))
    centers[0] = x[g.integers(n)]
    d2 = np.sum((x - centers[0]) ** 2, axis=1)
    for j in range(1, k):
        total = d2.sum()
        if total <= 0:
            centers[j:] = x[g.integers(n, size=k - j)]
            break
        probs = d2 / total
        centers[j] = x[g.choice(n, p=probs)]
        d2 = np.minimum(d2, np.sum((x - centers[j]) ** 2, axis=1))
    return centers


def kmeans(
    x: np.ndarray,
    k: int,
    *,
    n_iters: int = 25,
    seed: int = 0,
    tol: float = 1e-7,
) -> tuple[np.ndarray, np.ndarray]:
    """Cluster rows of ``x`` into ``k`` groups.

    Returns ``(labels, centers)`` with ``labels`` shape ``(n,)`` in
    ``[0, k)`` and ``centers`` shape ``(k, f)``.  ``k`` is clamped to the
    number of points.
    """
    n = len(x)
    k = min(k, n)
    g = np.random.default_rng(seed)
    centers = _seed_centers(x, k, g)
    labels = np.zeros(n, dtype=np.int64)
    x_sq = np.sum(x**2, axis=1)
    for _ in range(n_iters):
        # Squared distances via the expansion ‖x−c‖² = ‖x‖² − 2x·c + ‖c‖².
        d2 = x_sq[:, None] - 2.0 * (x @ centers.T) + np.sum(centers**2, axis=1)
        labels = np.argmin(d2, axis=1)
        new_centers = centers.copy()
        shift = 0.0
        for j in range(k):
            members = x[labels == j]
            if len(members) == 0:
                # Re-seed an empty cluster at the current farthest point.
                far = int(np.argmax(np.min(d2, axis=1)))
                new_centers[j] = x[far]
            else:
                new_centers[j] = members.mean(axis=0)
            shift = max(shift, float(np.sum((new_centers[j] - centers[j]) ** 2)))
        centers = new_centers
        if shift < tol:
            break
    d2 = x_sq[:, None] - 2.0 * (x @ centers.T) + np.sum(centers**2, axis=1)
    labels = np.argmin(d2, axis=1)
    return labels, centers
