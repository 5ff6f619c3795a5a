"""K-means clustering (sklearn/faiss stand-in) and its partition index.

K-means is both a paper baseline (§5.1.2: "used in many production systems
for partitioning the dataset before ANN search") and a substrate for the
2-means tree, IVF coarse quantizer, and spectral clustering. Lloyd's
algorithm with k-means++ seeding, driver-side numpy; Spark assignment via
``mapInPandas`` with broadcast centroids for the distributed lookup build.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.index.base import PartitionIndex


class KMeans:
    """Lloyd's algorithm with k-means++ initialization."""

    def __init__(self, k: int, *, n_iter: int = 50, tol: float = 1e-6, seed: int = 0):
        self.k = k
        self.n_iter = n_iter
        self.tol = tol
        self.seed = seed
        self.centroids: np.ndarray | None = None

    def _init_pp(self, x: np.ndarray, rng: np.random.Generator) -> np.ndarray:
        n = len(x)
        centers = [x[rng.integers(n)]]
        d2 = np.full(n, np.inf)
        for _ in range(1, self.k):
            d2 = np.minimum(d2, ((x - centers[-1]) ** 2).sum(axis=1))
            total = d2.sum()
            if total <= 0:
                centers.append(x[rng.integers(n)])
            else:
                centers.append(x[rng.choice(n, p=d2 / total)])
        return np.stack(centers)

    def fit(self, x: np.ndarray) -> "KMeans":
        x = np.asarray(x, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        c = self._init_pp(x, rng)
        for _ in range(self.n_iter):
            assign = self.assign(x, c)
            new_c = c.copy()
            for j in range(self.k):
                pts = x[assign == j]
                if len(pts):
                    new_c[j] = pts.mean(axis=0)
                else:  # re-seed empty cluster at the farthest point
                    far = np.argmax(((x - c[assign]) ** 2).sum(axis=1))
                    new_c[j] = x[far]
            shift = np.linalg.norm(new_c - c)
            c = new_c
            if shift < self.tol:
                break
        self.centroids = c
        return self

    @staticmethod
    def assign(x: np.ndarray, centroids: np.ndarray) -> np.ndarray:
        d2 = (
            (x**2).sum(axis=1, keepdims=True)
            - 2 * x @ centroids.T
            + (centroids**2).sum(axis=1)
        )
        return d2.argmin(axis=1)

    def predict(self, x: np.ndarray) -> np.ndarray:
        return self.assign(np.asarray(x, dtype=np.float64), self.centroids)

    def inertia(self, x: np.ndarray) -> float:
        a = self.predict(x)
        return float(((x - self.centroids[a]) ** 2).sum())


class KMeansPartitioner(PartitionIndex):
    """K-means as a space-partitioning ANN index: bins = Voronoi cells,
    multiprobe order = ascending centroid distance."""

    def __init__(self, m: int, *, n_iter: int = 50, seed: int = 0):
        self.n_bins = m
        self.km = KMeans(m, n_iter=n_iter, seed=seed)

    def fit(self, x: np.ndarray) -> "KMeansPartitioner":
        x = np.asarray(x, dtype=np.float64)
        self.km.fit(x)
        self._data_bins = self.km.predict(x)
        return self

    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:
        q = np.asarray(queries, dtype=np.float64)
        c = self.km.centroids
        d2 = (q**2).sum(axis=1, keepdims=True) - 2 * q @ c.T + (c**2).sum(axis=1)
        return np.argsort(d2, axis=1, kind="stable")

    def n_parameters(self) -> int:
        """Centroid table size — Table 2's K-means parameter count."""
        return int(self.km.centroids.size)


def assign_kmeans_spark(
    spark: SparkSession, vec_df: DataFrame, centroids: np.ndarray
) -> DataFrame:
    """Distributed Voronoi assignment: (id, vec) → (id, bin) with broadcast
    centroids — the Spark half of the K-means lookup-table build."""
    bc = spark.sparkContext.broadcast(np.asarray(centroids, dtype=np.float64))

    def go(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        c = bc.value
        for pdf in batches:
            if not len(pdf):
                continue
            x = np.stack(pdf["vec"].to_numpy())
            yield pd.DataFrame(
                {"id": pdf["id"].to_numpy(), "bin": KMeans.assign(x, c).astype(np.int64)}
            )

    return vec_df.mapInPandas(go, schema="id long, bin long")
