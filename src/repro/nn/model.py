"""Model containers matching the paper's two architectures (§5.2).

- ``mlp_partitioner``: input layer → one hidden layer of 128 units
  (Linear + BatchNorm + ReLU + Dropout(0.1)) → Linear(m) → softmax.
- ``logistic_regression``: a single Linear(d, m) → softmax (m=2 in the
  paper's binary-tree setting).

Models expose ``get_weights``/``set_weights`` (flat list of arrays) so Spark
executors can run inference from a broadcast variable without pickling layer
objects, and ``predict_proba`` runs an eval-mode forward pass.
"""
from __future__ import annotations

import numpy as np

from repro.nn.layers import BatchNorm1d, Dropout, Layer, Linear, ReLU, softmax


class MLP:
    """A sequential stack of layers ending in logits (softmax applied by callers)."""

    def __init__(self, layers: list[Layer]):
        self.layers = layers

    # -- forward / backward ------------------------------------------------
    def forward(self, x: np.ndarray, train: bool = True) -> np.ndarray:
        for layer in self.layers:
            x = layer.forward(x, train)
        return x

    def backward(self, g: np.ndarray) -> np.ndarray:
        for layer in reversed(self.layers):
            g = layer.backward(g)
        return g

    def predict_proba(self, x: np.ndarray) -> np.ndarray:
        """Eval-mode bin probability distribution M(p) (Eq. 6)."""
        return softmax(self.forward(np.asarray(x, dtype=np.float64), train=False))

    def predict_bin(self, x: np.ndarray) -> np.ndarray:
        return np.argmax(self.predict_proba(x), axis=1)

    # -- parameter access --------------------------------------------------
    def params(self):
        return [p for layer in self.layers for p in layer.params()]

    def get_weights(self) -> list[np.ndarray]:
        w = [p.value.copy() for p in self.params()]
        for layer in self.layers:
            if isinstance(layer, BatchNorm1d):
                w.append(layer.running_mean.copy())
                w.append(layer.running_var.copy())
        return w

    def set_weights(self, weights: list[np.ndarray]) -> None:
        ps = self.params()
        for p, w in zip(ps, weights[: len(ps)]):
            p.value = np.asarray(w, dtype=np.float64).reshape(p.value.shape)
        extra = weights[len(ps):]
        i = 0
        for layer in self.layers:
            if isinstance(layer, BatchNorm1d):
                layer.running_mean = np.asarray(extra[i])
                layer.running_var = np.asarray(extra[i + 1])
                i += 2


def mlp_partitioner(
    d: int, m: int, *, hidden: int = 128, n_hidden: int = 1, dropout: float = 0.1, seed: int = 0
) -> MLP:
    """The paper's neural-network partitioner (§5.2, "Neural Networks").

    ``n_hidden=1`` is USP's architecture; Neural LSH's original uses wider
    and deeper stacks (``hidden=512, n_hidden=3`` reproduces its Table 2
    parameter count).
    """
    rng = np.random.default_rng(seed)
    layers: list = []
    d_in = d
    for _ in range(n_hidden):
        layers += [Linear(d_in, hidden, rng), BatchNorm1d(hidden), ReLU(), Dropout(dropout, rng)]
        d_in = hidden
    layers.append(Linear(d_in, m, rng))
    return MLP(layers)


def logistic_regression(d: int, m: int = 2, *, seed: int = 0) -> MLP:
    """The paper's logistic-regression partitioner (one linear layer + softmax)."""
    rng = np.random.default_rng(seed)
    return MLP([Linear(d, m, rng)])


def n_parameters(model: MLP) -> int:
    """Count of learnable parameters (Table 2)."""
    return int(sum(p.value.size for p in model.params()))
