"""Search-quality metrics: the paper's k-NN accuracy (Eq. 1)."""
from __future__ import annotations

import numpy as np


def knn_accuracy(returned: np.ndarray, truth: np.ndarray) -> float:
    """Mean |N'_k(q) ∩ N_k(q)| / k over queries (Eq. 1).

    ``returned``/``truth`` are (n_queries, k) arrays of point ids; rows of
    ``returned`` may be shorter lists padded with -1 (no match).
    """
    returned = np.asarray(returned)
    truth = np.asarray(truth)
    k = truth.shape[1]
    hits = 0
    for r, t in zip(returned, truth):
        hits += len(set(int(x) for x in r if x >= 0) & set(int(x) for x in t))
    return hits / (len(truth) * k)
