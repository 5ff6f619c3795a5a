"""Shared experiment plumbing: dataset registry, ground truth, formatting.

Two scales per dataset: ``test`` (unit-test speed) and ``bench`` (the scale
EXPERIMENTS.md numbers are produced at). Both are deterministic in the seed,
so every table is exactly re-runnable.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.knn.exact import topk_neighbors
from repro.synth_data import mnist_lite, sift_lite

# sift_lite at bench scale is deliberately harder (many components + noise)
# so the accuracy-vs-|C| curves separate below 100% accuracy, as on real SIFT.
_SCALES = {
    "sift": {
        "test": dict(n=3_000, d=16, n_queries=200, n_components=32),
        "bench": dict(n=20_000, d=32, n_queries=1_000, n_components=200),
    },
    "mnist": {
        "test": dict(n=2_000, d=32, n_queries=150, n_components=10),
        "bench": dict(n=10_000, d=64, n_queries=500, n_components=10),
    },
}


def load_dataset(name: str, scale: str = "bench") -> tuple[np.ndarray, np.ndarray]:
    """(data, queries) for a registered dataset at a registered scale."""
    cfg = _SCALES[name][scale]
    return sift_lite(**cfg) if name == "sift" else mnist_lite(**cfg)


def ground_truth(data: np.ndarray, queries: np.ndarray, k: int = 10) -> np.ndarray:
    """Exact k-NN ids of each query — the N_k(q) of Eq. 1."""
    idx, _ = topk_neighbors(queries, data, k)
    return idx


def markdown_table(df: pd.DataFrame, *, floatfmt: str = "{:.3f}") -> str:
    """GitHub-markdown rendering of a result frame (no tabulate offline)."""
    cols = list(df.columns)
    lines = ["| " + " | ".join(str(c) for c in cols) + " |",
             "|" + "|".join("---" for _ in cols) + "|"]
    # itertuples keeps per-column dtypes (iterrows would upcast ints to float)
    for row in df.itertuples(index=False):
        cells = []
        for v in row:
            if isinstance(v, float):
                cells.append(floatfmt.format(v))
            else:
                cells.append(str(v))
        lines.append("| " + " | ".join(cells) + " |")
    return "\n".join(lines)
