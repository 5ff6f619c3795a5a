"""Table 3: offline training times and η per configuration.

Paper (Tesla K80, full SIFT/MNIST): MNIST-16 2min η=7, MNIST-256 12min η=30,
SIFT-16 6min η=7, SIFT-256 40min η=10 — each the time to train the 3 base
models of the ensemble.

We measure wall-clock offline time (k'-NN matrix + 3-model ensemble; the
256-bin configs use the hierarchical 16×16 scheme of §5.4.1) on the _lite
datasets with the paper's η values. Absolute minutes differ (CPU numpy vs
GPU, smaller data); the *shape* to check is the ordering
MNIST-16 < SIFT-16 < MNIST-256 < SIFT-256 and the η values used.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd

from repro.core.ensemble import train_ensemble
from repro.core.hierarchy import HierarchicalPartitioner
from repro.core.train import TrainConfig
from repro.experiments.common import load_dataset
from repro.knn.exact import knn_matrix_numpy

PAPER = [
    {"dataset": "MNIST", "bins": 16, "paper_minutes": 2.0, "eta": 7.0},
    {"dataset": "MNIST", "bins": 256, "paper_minutes": 12.0, "eta": 30.0},
    {"dataset": "SIFT", "bins": 16, "paper_minutes": 6.0, "eta": 7.0},
    {"dataset": "SIFT", "bins": 256, "paper_minutes": 40.0, "eta": 10.0},
]


def _train_config(dataset: str, bins: int, scale: str, eta: float, epochs: int) -> float:
    """Offline-phase wall-clock seconds for one Table 3 configuration."""
    data, _ = load_dataset(dataset.lower(), scale)
    t0 = time.perf_counter()
    if bins <= 16:
        knn_idx = knn_matrix_numpy(data, 10)
        cfg = TrainConfig(m=bins, eta=eta, epochs=epochs)
        train_ensemble(data, m=bins, e=3, cfg=cfg, knn_idx=knn_idx)
    else:
        # 256 bins via hierarchical 16×16 (§5.4.1); ensemble of 3 trees.
        side = int(round(np.sqrt(bins)))
        for j in range(3):
            HierarchicalPartitioner(
                [side, side],
                cfg_factory=lambda level, m: TrainConfig(m=m, eta=eta, epochs=epochs),
                seed=j,
            ).fit(data)
    return time.perf_counter() - t0


def run(*, scale: str = "bench", epochs: int = 25) -> pd.DataFrame:
    rows = []
    for cfg in PAPER:
        secs = _train_config(cfg["dataset"], cfg["bins"], scale, cfg["eta"], epochs)
        rows.append(
            {
                "dataset": cfg["dataset"],
                "bins": cfg["bins"],
                "eta": cfg["eta"],
                "paper_minutes": cfg["paper_minutes"],
                "measured_minutes": secs / 60.0,
                "measured_seconds": secs,
            }
        )
    return pd.DataFrame(rows)
