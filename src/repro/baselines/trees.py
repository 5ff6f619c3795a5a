"""Hyperplane partition trees (§5.4.2 baselines): 2-means tree, PCA tree,
random-projection tree, and the learned KD-tree of Cayton & Dasgupta.

All are binary trees of depth ``l`` (2^l leaves before small-node pruning).
Each node stores a hyperplane (w, t); a point goes left when w·x < t.
Multiprobe ranking follows the soft-margin convention: the probability of a
side is a sigmoid of the signed margin scaled by the node's margin spread, and
a leaf's score is the product down its root path — the same mechanism the
paper's logistic-regression tree uses, so sweeps are comparable.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.kmeans import KMeans
from repro.index.base import PartitionIndex


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(z, -60, 60)))


# --- split rules: subset (and optional global-kNN context) → (w, t) --------


def rp_split(sub: np.ndarray, rng: np.random.Generator, **_) -> tuple[np.ndarray, float]:
    """Random-projection tree: random unit direction, median threshold."""
    w = rng.normal(size=sub.shape[1])
    w /= np.linalg.norm(w) + 1e-12
    return w, float(np.median(sub @ w))


def pca_split(sub: np.ndarray, rng: np.random.Generator, **_) -> tuple[np.ndarray, float]:
    """PCA tree: top principal component, median threshold."""
    centered = sub - sub.mean(axis=0)
    # Top right-singular vector via power iteration on the covariance.
    w = rng.normal(size=sub.shape[1])
    cov = centered.T @ centered
    for _ in range(30):
        w = cov @ w
        w /= np.linalg.norm(w) + 1e-12
    return w, float(np.median(sub @ w))


def two_means_split(sub: np.ndarray, rng: np.random.Generator, **_) -> tuple[np.ndarray, float]:
    """2-means tree: direction between the two cluster centers, threshold at
    the midpoint projection (nearest-center assignment ≡ this hyperplane)."""
    km = KMeans(2, n_iter=25, seed=int(rng.integers(1 << 31))).fit(sub)
    c0, c1 = km.centroids
    w = c1 - c0
    nrm = np.linalg.norm(w)
    if nrm < 1e-12:
        return rp_split(sub, rng)
    w /= nrm
    return w, float(w @ (c0 + c1) / 2.0)


def learned_kd_split(
    sub: np.ndarray,
    rng: np.random.Generator,
    *,
    sub_knn: np.ndarray | None = None,
    balance_lo: float = 0.3,
    balance_hi: float = 0.7,
    **_,
) -> tuple[np.ndarray, float]:
    """Learned KD-tree (Cayton & Dasgupta 2007 flavor): axis-aligned split
    whose threshold is *learned* to minimize the number of k-NN pairs it
    separates, subject to a balance constraint, instead of the plain median."""
    d = sub.shape[1]
    axis = int(np.argmax(sub.var(axis=0)))
    proj = sub[:, axis]
    qs = np.quantile(proj, np.linspace(balance_lo, balance_hi, 9))
    w = np.zeros(d)
    w[axis] = 1.0
    if sub_knn is None:
        return w, float(np.median(proj))
    best_t, best_cost = float(np.median(proj)), np.inf
    n = len(sub)
    for t in qs:
        left = proj < t
        # k-NN pairs split by the threshold.
        split_pairs = int((left[:, None] != left[sub_knn]).sum())
        imbalance = abs(left.sum() - n / 2) / n
        cost = split_pairs + 0.5 * n * imbalance
        if cost < best_cost:
            best_cost, best_t = cost, float(t)
    return w, best_t


SPLIT_RULES = {
    "rp": rp_split,
    "pca": pca_split,
    "two_means": two_means_split,
    "learned_kd": learned_kd_split,
}


class _TreeNode:
    __slots__ = ("w", "t", "scale", "children", "leaf_id")

    def __init__(self):
        self.w = None
        self.t = 0.0
        self.scale = 1.0
        self.children: list[_TreeNode] = []
        self.leaf_id: int | None = None


class BinaryPartitionTree(PartitionIndex):
    """Generic hyperplane binary tree driven by a named split rule."""

    def __init__(
        self,
        rule: str,
        depth: int,
        *,
        min_split: int = 16,
        k_prime: int = 10,
        seed: int = 0,
    ):
        if rule not in SPLIT_RULES:
            raise ValueError(f"unknown rule {rule!r}; choose from {sorted(SPLIT_RULES)}")
        self.rule = rule
        self.depth = depth
        self.min_split = min_split
        self.k_prime = k_prime
        self.seed = seed
        self.root: _TreeNode | None = None
        self.n_bins = 0

    def fit(self, x: np.ndarray) -> "BinaryPartitionTree":
        from repro.knn.exact import knn_matrix_numpy

        x = np.asarray(x, dtype=np.float64)
        self._rng = np.random.default_rng(self.seed)
        self._leaf_counter = 0
        bins = np.zeros(len(x), dtype=np.int64)
        self._knn_fn = (
            (lambda sub: knn_matrix_numpy(sub, min(self.k_prime, len(sub) - 1)))
            if self.rule == "learned_kd"
            else None
        )
        self.root = self._fit_node(x, np.arange(len(x)), 0, bins)
        self.n_bins = self._leaf_counter
        self._data_bins = bins
        return self

    def _fit_node(self, x, idx, level, bins) -> _TreeNode:
        node = _TreeNode()
        if level >= self.depth or len(idx) < self.min_split:
            node.leaf_id = self._leaf_counter
            self._leaf_counter += 1
            bins[idx] = node.leaf_id
            return node
        sub = x[idx]
        sub_knn = self._knn_fn(sub) if self._knn_fn is not None else None
        w, t = SPLIT_RULES[self.rule](sub, self._rng, sub_knn=sub_knn)
        margins = sub @ w - t
        node.w, node.t = w, t
        node.scale = float(np.abs(margins).mean()) + 1e-9
        left = margins < 0
        if left.all() or (~left).all():  # degenerate split → force median
            med = float(np.median(sub @ w))
            node.t = med
            margins = sub @ w - med
            left = margins < 0
            if left.all() or (~left).all():
                node.w = None
                node.leaf_id = self._leaf_counter
                self._leaf_counter += 1
                bins[idx] = node.leaf_id
                return node
        node.children = [
            self._fit_node(x, idx[left], level + 1, bins),
            self._fit_node(x, idx[~left], level + 1, bins),
        ]
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
        margins = (q @ node.w - node.t) / node.scale
        p_right = _sigmoid(margins)
        self._acc(node.children[0], q, acc * (1 - p_right), out)
        self._acc(node.children[1], q, acc * p_right, out)

    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:
        return np.argsort(-self.leaf_probs(queries), axis=1, kind="stable")
