"""Table 1: dataset statistics — paper datasets vs our synthetic analogs."""
from __future__ import annotations

import pandas as pd

from repro.mf.data import DATASET_SHAPES, PAPER_TABLE1, dataset_ratings


def dataset_table(*, scale: float = 1.0, seed: int = 0) -> pd.DataFrame:
    """Users/items/ratings of each analog next to the paper's Table 1."""
    rows = []
    for name in DATASET_SHAPES:
        r = dataset_ratings(name, scale=scale, seed=seed)
        paper = PAPER_TABLE1[name]
        rows.append(
            {
                "dataset": name,
                "paper_users": paper["users"],
                "paper_items": paper["items"],
                "paper_ratings": paper["ratings"],
                "analog_users": r.n_users,
                "analog_items": r.n_items,
                "analog_ratings": r.nnz,
                "paper_user_item_ratio": paper["users"] / paper["items"],
                "analog_user_item_ratio": r.n_users / r.n_items,
            }
        )
    return pd.DataFrame(rows).set_index("dataset")
