"""Table 2: learnable parameter counts when dividing SIFT into 256 bins.

Paper: Neural LSH 729k (hidden 512), Ours 183k (hidden 128), K-means 33k.

We instantiate the three methods' models and count parameters, at the paper's
SIFT shape (d=128) and at our sift_lite shape. Neural LSH's 729k corresponds
to a 3×512-hidden MLP (128·512 + 512² + 512² + 512·256 weights ≈ 721k +
biases/BN); "Ours" is the 3-model ensemble of single-hidden-128 nets used for
the 256-bin runs. K-means parameters are the 256 centroids.
"""
from __future__ import annotations

import pandas as pd

from repro.nn.model import mlp_partitioner, n_parameters

PAPER = {"Neural LSH": 729_000, "Ours": 183_000, "K-Means": 33_000}


def count_params(d: int, m: int, *, ensemble: int = 3) -> dict[str, int]:
    """Parameter counts for the three Table 2 methods at dims (d, m)."""
    nlsh = n_parameters(mlp_partitioner(d, m, hidden=512, n_hidden=3))
    ours_one = n_parameters(mlp_partitioner(d, m, hidden=128, n_hidden=1))
    return {
        "Neural LSH": nlsh,
        "Ours": ensemble * ours_one,
        "K-Means": m * d,
    }


def run(*, d_paper: int = 128, d_ours: int = 32, m: int = 256) -> pd.DataFrame:
    paper_shape = count_params(d_paper, m)
    ours_shape = count_params(d_ours, m)
    rows = []
    for method in ("Neural LSH", "Ours", "K-Means"):
        rows.append(
            {
                "method": method,
                "paper_reported": PAPER[method],
                f"measured_d{d_paper}": paper_shape[method],
                f"measured_d{d_ours}_sift_lite": ours_shape[method],
            }
        )
    return pd.DataFrame(rows)
