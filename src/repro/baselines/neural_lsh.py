"""Neural LSH (Dong et al., ICLR 2020) and its Regression LSH variant.

The supervised pipeline the paper improves upon: (1) build the k'-NN graph,
(2) run a balanced combinatorial graph partitioner (KaHIP in the original;
our substitute lives in :mod:`repro.baselines.graph_partition`) to obtain
ground-truth bin labels, (3) train a classifier (MLP with a 512-unit hidden
layer for Neural LSH, logistic regression per node of a binary tree for
Regression LSH) to route out-of-sample queries to bins. Data points keep
their graph-partition bins; only queries go through the model.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.graph_partition import balanced_graph_partition
from repro.index.base import PartitionIndex
from repro.knn.exact import knn_matrix_numpy
from repro.nn.layers import softmax
from repro.nn.model import MLP, logistic_regression, mlp_partitioner
from repro.nn.optim import Adam


def train_supervised(
    model: MLP,
    x: np.ndarray,
    labels: np.ndarray,
    *,
    epochs: int = 40,
    lr: float = 5e-3,
    batch: int = 128,
    seed: int = 0,
) -> list[float]:
    """Softmax cross-entropy classifier training; returns epoch-loss history."""
    n = len(x)
    rng = np.random.default_rng(seed)
    opt = Adam(model.params(), lr=lr)
    history = []
    for _ in range(epochs):
        order = rng.permutation(n)
        total, nb = 0.0, 0
        for lo in range(0, n, batch):
            idx = order[lo : lo + batch]
            logits = model.forward(x[idx], train=True)
            probs = softmax(logits)
            onehot = np.zeros_like(probs)
            onehot[np.arange(len(idx)), labels[idx]] = 1.0
            loss = float(-np.log(probs[np.arange(len(idx)), labels[idx]] + 1e-12).mean())
            grad = (probs - onehot) / len(idx)
            opt.zero_grad()
            model.backward(grad)
            opt.step()
            total += loss
            nb += 1
        history.append(total / max(nb, 1))
    return history


class NeuralLSHPartitioner(PartitionIndex):
    """Neural LSH: graph-partition labels + supervised MLP query router.

    ``hidden`` defaults to 512 as in the original paper (Table 2 contrasts
    its 729k parameters against USP's 183k).
    """

    def __init__(
        self,
        m: int,
        *,
        hidden: int = 512,
        k_prime: int = 10,
        epochs: int = 40,
        eps: float = 0.05,
        seed: int = 0,
    ):
        self.n_bins = m
        self.hidden = hidden
        self.k_prime = k_prime
        self.epochs = epochs
        self.eps = eps
        self.seed = seed
        self.model: MLP | None = None

    def fit(
        self, x: np.ndarray, *, knn_idx: np.ndarray | None = None
    ) -> "NeuralLSHPartitioner":
        x = np.asarray(x, dtype=np.float64)
        if knn_idx is None:
            knn_idx = knn_matrix_numpy(x, self.k_prime)
        labels = balanced_graph_partition(knn_idx, self.n_bins, eps=self.eps, seed=self.seed)
        self.model = mlp_partitioner(
            x.shape[1], self.n_bins, hidden=self.hidden, seed=self.seed
        )
        train_supervised(self.model, x, labels, epochs=self.epochs, seed=self.seed)
        self._data_bins = labels  # data points keep their graph-partition bins
        return self

    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:
        probs = self.model.predict_proba(np.asarray(queries, dtype=np.float64))
        return np.argsort(-probs, axis=1, kind="stable")

    def n_parameters(self) -> int:
        return int(sum(p.value.size for p in self.model.params()))


class _RegNode:
    __slots__ = ("model", "children", "leaf_id")

    def __init__(self):
        self.model = None
        self.children: list[_RegNode] = []
        self.leaf_id: int | None = None


class RegressionLSHTree(PartitionIndex):
    """Regression LSH: binary tree; each node 2-way graph-partitions its
    subset and trains logistic regression on those labels (§5.2)."""

    def __init__(
        self,
        depth: int,
        *,
        k_prime: int = 10,
        epochs: int = 30,
        min_split: int = 32,
        seed: int = 0,
    ):
        self.depth = depth
        self.k_prime = k_prime
        self.epochs = epochs
        self.min_split = min_split
        self.seed = seed
        self.root: _RegNode | None = None
        self.n_bins = 0

    def fit(self, x: np.ndarray) -> "RegressionLSHTree":
        x = np.asarray(x, dtype=np.float64)
        self._leaf_counter = 0
        bins = np.zeros(len(x), dtype=np.int64)
        self.root = self._fit_node(x, np.arange(len(x)), 0, bins)
        self.n_bins = self._leaf_counter
        self._data_bins = bins
        return self

    def _fit_node(self, x, idx, level, bins) -> _RegNode:
        node = _RegNode()
        if level >= self.depth or len(idx) < self.min_split:
            node.leaf_id = self._leaf_counter
            self._leaf_counter += 1
            bins[idx] = node.leaf_id
            return node
        sub = x[idx]
        kp = min(self.k_prime, len(sub) - 1)
        knn_idx = knn_matrix_numpy(sub, kp)
        labels = balanced_graph_partition(knn_idx, 2, seed=self.seed + level)
        node.model = logistic_regression(x.shape[1], 2, seed=self.seed + level)
        train_supervised(node.model, sub, labels, epochs=self.epochs, seed=self.seed)
        for b in range(2):
            node.children.append(self._fit_node(x, idx[labels == b], level + 1, bins))
        return node

    def leaf_probs(self, queries: np.ndarray) -> np.ndarray:
        queries = np.asarray(queries, dtype=np.float64)
        out = np.zeros((len(queries), self.n_bins))
        self._acc(self.root, queries, np.ones(len(queries)), out)
        return out

    def _acc(self, node, q, acc, out) -> None:
        if node.leaf_id is not None:
            out[:, node.leaf_id] = acc
            return
        probs = node.model.predict_proba(q)
        for b, child in enumerate(node.children):
            self._acc(child, q, acc * probs[:, b], out)

    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:
        return np.argsort(-self.leaf_probs(queries), axis=1, kind="stable")
