"""IVF-Flat — the FAISS baseline of §5.4.3.

Inverted-file index: a K-means coarse quantizer over ``nlist`` cells; a query
probes the ``nprobe`` nearest cells and scans their points exactly. This is
faiss.IndexIVFFlat's algorithm on numpy.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.kmeans import KMeans


class IVFFlat:
    def __init__(self, nlist: int = 64, *, n_iter: int = 25, seed: int = 0):
        self.nlist = nlist
        self.km = KMeans(nlist, n_iter=n_iter, seed=seed)
        self.lists: list[np.ndarray] = []
        self._x: np.ndarray | None = None

    def fit(self, x: np.ndarray) -> "IVFFlat":
        self._x = np.asarray(x, dtype=np.float64)
        self.km.fit(self._x)
        assign = self.km.predict(self._x)
        order = np.argsort(assign, kind="stable")
        sa = assign[order]
        self.lists = [
            order[np.searchsorted(sa, j, "left") : np.searchsorted(sa, j, "right")]
            for j in range(self.nlist)
        ]
        return self

    def search(self, query: np.ndarray, k: int, *, nprobe: int = 4) -> np.ndarray:
        q = np.asarray(query, dtype=np.float64)
        c = self.km.centroids
        cd = ((c - q) ** 2).sum(axis=1)
        probe = np.argsort(cd, kind="stable")[:nprobe]
        cand = np.concatenate([self.lists[j] for j in probe]) if len(probe) else np.empty(0, int)
        if len(cand) == 0:
            return np.empty(0, dtype=np.int64)
        d = np.linalg.norm(self._x[cand] - q, axis=1)
        kk = min(k, len(cand))
        top = np.argpartition(d, kk - 1)[:kk] if kk < len(cand) else np.arange(len(cand))
        top = top[np.argsort(d[top], kind="stable")]
        return cand[top]
