"""Strategy protocol shared by every MIPS serving technique.

A strategy owns a model, optionally builds an index (``build``), and
answers exact top-K queries for an arbitrary subset of users (``query``).
RECOPT relies on three properties encoded here:

* ``build`` is timed separately from queries (index construction is cheap
  relative to traversal — the paper's Fig. 2 observation);
* ``query`` accepts a user subset, so the optimizer can measure a sample;
* ``batching`` marks strategies whose throughput depends on user batching
  (blocked MM, LEMP, RECDEX) — for those the T-test early-stop is invalid
  and the full sample must be measured at once (Section 4.1).
"""
from __future__ import annotations

from abc import ABC, abstractmethod
from dataclasses import dataclass

import numpy as np

from repro.mf.models import MFModel


@dataclass(frozen=True)
class TopK:
    """Exact top-K answer for a set of users, in canonical order.

    ``ids``/``scores`` are ``(n_queried, k)``; row order matches the
    ``user_rows`` passed to ``query``.
    """

    ids: np.ndarray
    scores: np.ndarray

    def row(self, i: int) -> tuple[np.ndarray, np.ndarray]:
        return self.ids[i], self.scores[i]


class Strategy(ABC):
    """Base class for exact MIPS serving strategies."""

    #: short machine name, e.g. "mm", "lemp", "recdex"
    name: str = "?"
    #: True if the strategy's throughput depends on batching many users
    batching: bool = True

    def __init__(self, model: MFModel):
        self.model = model
        self.built = False

    def build(self) -> None:
        """Construct the index (no-op for brute force). Idempotent."""
        self.built = True

    @abstractmethod
    def query(self, user_rows: np.ndarray, k: int) -> TopK:
        """Exact top-``k`` for ``model.users[user_rows]``."""

    def query_all(self, k: int) -> TopK:
        return self.query(np.arange(self.model.m), k)
