"""Boosted Search Forest (Li et al., NIPS 2011) — the prior learning-to-
partition baseline with a custom loss (§2.3, §5.4.2).

BSF learns a forest of binary *hyperplane* trees via boosting: each node's
hyperplane maximizes (weighted) preservation of neighbor pairs — neighbor
pairs should land on the same side — and per-point boosting weights emphasize
points whose neighbors earlier trees separated. We realize the node objective
as the spectral relaxation: minimize  Σ_{(i,j)∈NN} w_ij (s_i - s_j)²  subject
to unit projected variance, i.e. the smallest generalized eigenvector of
(Xᵀ L X, Xᵀ X) over the node's subset — a hyperplane that cuts as few
weighted neighbor pairs as possible (the same quantity BSF's similarity-
preservation gain scores). Threshold at the median for balance. At query
time the forest behaves as an ensemble: each tree routes the query softly
(sigmoid margins), and the candidate set unions the trees' probed leaves.

Simplification vs. the original (documented per DESIGN.md): BSF's exact
functional-gradient derivation is replaced by this spectral node solver; the
boosting weight update (multiply by the fraction of separated neighbors) and
the forest-union query path match the original's structure.
"""
from __future__ import annotations

import numpy as np

from repro.index.base import PartitionIndex
from repro.knn.exact import knn_matrix_numpy


class _BsfNode:
    __slots__ = ("w", "t", "scale", "children", "leaf_id")

    def __init__(self):
        self.w = None
        self.t = 0.0
        self.scale = 1.0
        self.children = []
        self.leaf_id = None


def similarity_preserving_hyperplane(
    sub: np.ndarray, sub_knn: np.ndarray, weights: np.ndarray, rng: np.random.Generator
) -> tuple[np.ndarray, float]:
    """Smallest generalized eigenvector of (Xᵀ L X, Xᵀ X): the direction that
    separates the fewest (weighted) neighbor pairs per unit spread."""
    n, d = sub.shape
    centered = sub - sub.mean(axis=0)
    # Weighted neighbor-pair Laplacian applied through X: XᵀLX = Σ w_ij (x_i-x_j)(x_i-x_j)ᵀ
    k = sub_knn.shape[1]
    rows = np.repeat(np.arange(n), k)
    cols = sub_knn.ravel()
    pw = np.repeat(weights, k)
    diffs = centered[rows] - centered[cols]
    a = (diffs * pw[:, None]).T @ diffs
    b = centered.T @ centered + 1e-6 * np.trace(centered.T @ centered) / d * np.eye(d)
    # Generalized eig via Cholesky whitening.
    try:
        l = np.linalg.cholesky(b)
        linv = np.linalg.inv(l)
        sym = linv @ a @ linv.T
        vals, vecs = np.linalg.eigh((sym + sym.T) / 2)
        w = linv.T @ vecs[:, 0]
    except np.linalg.LinAlgError:
        w = rng.normal(size=d)
    nrm = np.linalg.norm(w)
    w = w / (nrm + 1e-12)
    return w, float(np.median(sub @ w))


class BoostedSearchForest(PartitionIndex):
    """Forest of boosted similarity-preserving hyperplane trees."""

    def __init__(
        self,
        depth: int,
        *,
        n_trees: int = 3,
        k_prime: int = 10,
        min_split: int = 16,
        seed: int = 0,
    ):
        self.depth = depth
        self.n_trees = n_trees
        self.k_prime = k_prime
        self.min_split = min_split
        self.seed = seed
        self.trees: list[_BsfNode] = []
        self.tree_bins: list[np.ndarray] = []
        self.tree_n_bins: list[int] = []
        self.n_bins = 0

    def fit(self, x: np.ndarray) -> "BoostedSearchForest":
        x = np.asarray(x, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        knn_idx = knn_matrix_numpy(x, min(self.k_prime, len(x) - 1))
        weights = np.ones(len(x))
        self.trees, self.tree_bins, self.tree_n_bins = [], [], []
        for t in range(self.n_trees):
            self._leaf_counter = 0
            bins = np.zeros(len(x), dtype=np.int64)
            root = self._fit_node(x, np.arange(len(x)), 0, bins, weights, rng)
            self.trees.append(root)
            self.tree_bins.append(bins)
            self.tree_n_bins.append(self._leaf_counter)
            # Boosting update: weight ∝ fraction of k'-NN separated so far.
            sep = (bins[knn_idx] != bins[:, None]).mean(axis=1)
            weights = weights * (0.1 + sep)
            s = weights.sum()
            weights = np.ones(len(x)) if s <= 0 else weights * (len(x) / s)
        self.n_bins = self.tree_n_bins[0]
        self._data_bins = self.tree_bins[0]
        self._members = [self._bins_to_members(b, nb) for b, nb in zip(self.tree_bins, self.tree_n_bins)]
        return self

    @staticmethod
    def _bins_to_members(bins: np.ndarray, n_bins: int) -> list[np.ndarray]:
        order = np.argsort(bins, kind="stable")
        sb = bins[order]
        return [
            order[np.searchsorted(sb, b, "left") : np.searchsorted(sb, b, "right")]
            for b in range(n_bins)
        ]

    def _fit_node(self, x, idx, level, bins, weights, rng) -> _BsfNode:
        node = _BsfNode()
        if level >= self.depth or len(idx) < self.min_split:
            node.leaf_id = self._leaf_counter
            self._leaf_counter += 1
            bins[idx] = node.leaf_id
            return node
        sub = x[idx]
        kp = min(self.k_prime, len(sub) - 1)
        sub_knn = knn_matrix_numpy(sub, kp)
        w, t = similarity_preserving_hyperplane(sub, sub_knn, weights[idx], rng)
        margins = sub @ w - t
        left = margins < 0
        if left.all() or (~left).all():
            node.leaf_id = self._leaf_counter
            self._leaf_counter += 1
            bins[idx] = node.leaf_id
            return node
        node.w, node.t = w, t
        node.scale = float(np.abs(margins).mean()) + 1e-9
        node.children = [
            self._fit_node(x, idx[left], level + 1, bins, weights, rng),
            self._fit_node(x, idx[~left], level + 1, bins, weights, rng),
        ]
        return node

    # -- query side --------------------------------------------------------
    def _tree_leaf_probs(self, root: _BsfNode, n_bins: int, q: np.ndarray) -> np.ndarray:
        out = np.zeros((len(q), n_bins))
        self._acc(root, q, np.ones(len(q)), out)
        return out

    def _acc(self, node, q, acc, out) -> None:
        if node.leaf_id is not None:
            out[:, node.leaf_id] = acc
            return
        z = (q @ node.w - node.t) / node.scale
        p_right = 1.0 / (1.0 + np.exp(-np.clip(z, -60, 60)))
        self._acc(node.children[0], q, acc * (1 - p_right), out)
        self._acc(node.children[1], q, acc * p_right, out)

    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:
        """Ranking over the *first* tree's leaves (PartitionIndex contract)."""
        q = np.asarray(queries, dtype=np.float64)
        return np.argsort(-self._tree_leaf_probs(self.trees[0], self.tree_n_bins[0], q), axis=1, kind="stable")

    def candidate_ids(self, queries: np.ndarray, n_probes: int) -> list[np.ndarray]:
        """Union of each tree's top ``n_probes`` leaves across the forest."""
        q = np.asarray(queries, dtype=np.float64)
        per_tree = n_probes
        all_orders = [
            np.argsort(-self._tree_leaf_probs(r, nb, q), axis=1, kind="stable")[:, :per_tree]
            for r, nb in zip(self.trees, self.tree_n_bins)
        ]
        out = []
        for i in range(len(q)):
            parts = [
                np.concatenate([mem[b] for b in order[i]])
                for order, mem in zip(all_orders, self._members)
            ]
            out.append(np.unique(np.concatenate(parts)))
        return out
