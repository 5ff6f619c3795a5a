"""Ensembling (§4.4.1, Algorithms 3–4).

Models are trained sequentially; after model j, each point's weight is
multiplied by the number of its k' neighbors that model j separated from it
(Eq. 14's weight update), so later models specialize on "difficult" points.
At query time every model scores the query; the candidate set of the model
with the highest confidence (max bin probability) is used (Algorithm 4).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.core.partitioner import UnsupervisedSpacePartitioner
from repro.core.train import TrainConfig
from repro.index.base import PartitionIndex
from repro.knn.exact import knn_matrix_numpy, knn_matrix_spark_collect


def separation_counts(data_bins: np.ndarray, knn_idx: np.ndarray) -> np.ndarray:
    """Per point: |{p ∈ N_k'(q_i) : R(p) ≠ R(q_i)}| — the Alg. 3 weight term."""
    return (data_bins[knn_idx] != data_bins[:, None]).sum(axis=1).astype(np.float64)


def update_weights(
    weights: np.ndarray, data_bins: np.ndarray, knn_idx: np.ndarray
) -> np.ndarray:
    """Multiplicative AdaBoost-style update, renormalized to mean 1.

    The paper's update is ``w_i ← count_i · w_i``; the loss argmin is
    invariant to the overall weight scale, so we renormalize for numerical
    stability and fall back to uniform if every point is perfectly placed.
    """
    w = weights * separation_counts(data_bins, knn_idx)
    if w.sum() <= 0:
        return np.ones_like(weights)
    return w * (len(w) / w.sum())


class EnsemblePartitioner(PartitionIndex):
    """An ensemble of complementary USP partitions with confidence routing."""

    def __init__(self, models: list[UnsupervisedSpacePartitioner]):
        if not models:
            raise ValueError("empty ensemble")
        self.models = models
        self.n_bins = models[0].n_bins
        self._members = [m.bin_members() for m in models]
        self._data_bins = models[0].data_bins()  # representative partition

    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:
        """Probe order of the *selected* (most confident) model per query."""
        choice = self.model_choice(queries)
        rows = [self.models[c].probe_matrix(q[None])[0] for c, q in zip(choice, queries)]
        return np.stack(rows)

    def model_choice(self, queries: np.ndarray) -> np.ndarray:
        conf = np.stack([m.confidence(queries) for m in self.models])  # (e, n_q)
        return conf.argmax(axis=0)

    def candidate_ids(self, queries: np.ndarray, n_probes: int) -> list[np.ndarray]:
        choice = self.model_choice(queries)
        out = []
        for c, q in zip(choice, queries):
            order = self.models[c].probe_matrix(q[None])[0][:n_probes]
            mem = self._members[c]
            out.append(np.concatenate([mem[b] for b in order]))
        return out


def train_ensemble(
    x: np.ndarray,
    *,
    m: int,
    e: int = 3,
    k_prime: int = 10,
    cfg: TrainConfig | None = None,
    arch: str = "mlp",
    hidden: int = 128,
    seed: int = 0,
    spark: SparkSession | None = None,
    knn_idx: np.ndarray | None = None,
) -> EnsemblePartitioner:
    """Algorithm 3: sequentially train ``e`` USP models with boosted weights."""
    x = np.asarray(x, dtype=np.float64)
    if knn_idx is None:
        if spark is not None:
            knn_idx = knn_matrix_spark_collect(spark, x, k_prime)
        else:
            knn_idx = knn_matrix_numpy(x, k_prime)
    weights = np.ones(len(x))
    models = []
    for j in range(e):
        base = cfg or TrainConfig(m=m)
        cfg_j = TrainConfig(
            m=m, eta=base.eta, epochs=base.epochs, batch_frac=base.batch_frac,
            min_batch=base.min_batch, lr=base.lr, seed=seed + 1000 * j,
        )
        p = UnsupervisedSpacePartitioner(
            m, arch=arch, hidden=hidden, k_prime=k_prime, cfg=cfg_j, seed=seed + 1000 * j
        )
        p.fit(x, knn_idx=knn_idx, weights=weights)
        models.append(p)
        if j + 1 < e:
            weights = update_weights(weights, p.data_bins(), knn_idx)
    return EnsemblePartitioner(models)
