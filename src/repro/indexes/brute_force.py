"""Brute-force blocked matrix multiply as a Strategy."""
from __future__ import annotations

import numpy as np

from repro.indexes.base import Strategy, TopK
from repro.linalg.blocked_mm import DEFAULT_USER_BLOCK, blocked_mm_topk
from repro.mf.models import MFModel


class BlockedMM(Strategy):
    """The paper's MM baseline: BLAS GEMM over user blocks + top-K extract.

    No index to build; ``build`` is a no-op.  Performance is independent of
    the model's weight geometry — the property RECOPT exploits when
    extrapolating from a sample.
    """

    name = "mm"
    batching = True

    def __init__(self, model: MFModel, *, user_block: int = DEFAULT_USER_BLOCK):
        super().__init__(model)
        self.user_block = user_block

    def query(self, user_rows: np.ndarray, k: int) -> TopK:
        ids, scores = blocked_mm_topk(
            self.model.users[user_rows],
            self.model.items,
            k,
            user_block=self.user_block,
        )
        return TopK(ids=ids, scores=scores)
