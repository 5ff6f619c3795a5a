"""Exact (brute-force) k-NN: numpy reference and Spark-distributed build.

The Spark build is the distributed-dataflow version of the paper's k'-NN
matrix construction (§4.2.1): the dataset is a DataFrame of (id, vec) rows;
each executor block computes distances from its rows to the *broadcast*
dataset with vectorized numpy, keeping the top-k per row. At the scale
factors used here the full dataset broadcast is a few MB — the same pattern
an ANN index build over object-store shards uses (block × broadcast probe
side). Correctness is oracle-checked against a DuckDB SQL cross-join top-k
in the tests.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def topk_neighbors(
    queries: np.ndarray, data: np.ndarray, k: int, *, exclude_self: bool = False
) -> tuple[np.ndarray, np.ndarray]:
    """Top-k nearest rows of ``data`` for each row of ``queries``.

    Returns ``(indices, distances)`` each of shape (n_queries, k), neighbors
    sorted by increasing Euclidean distance. ``exclude_self`` assumes
    ``queries is data`` row-aligned and drops the self-match (used for the
    k'-NN matrix).
    """
    queries = np.asarray(queries, dtype=np.float64)
    data = np.asarray(data, dtype=np.float64)
    # Squared Euclidean via the expansion; clamp tiny negatives from fp error.
    d2 = (
        (queries**2).sum(axis=1, keepdims=True)
        - 2.0 * queries @ data.T
        + (data**2).sum(axis=1)
    )
    np.maximum(d2, 0.0, out=d2)
    if exclude_self:
        n = len(queries)
        d2[np.arange(n), np.arange(n)] = np.inf
    kk = min(k, d2.shape[1] - (1 if exclude_self else 0))
    idx = np.argpartition(d2, kk - 1, axis=1)[:, :kk]
    part = np.take_along_axis(d2, idx, axis=1)
    order = np.argsort(part, axis=1, kind="stable")
    idx = np.take_along_axis(idx, order, axis=1)
    dist = np.sqrt(np.take_along_axis(part, order, axis=1))
    return idx, dist


def knn_matrix_numpy(data: np.ndarray, k: int, *, block: int = 2048) -> np.ndarray:
    """k'-NN matrix (n, k) of neighbor *indices*, self excluded, blocked to
    bound peak memory — the driver-side reference implementation."""
    n = len(data)
    out = np.empty((n, min(k, n - 1)), dtype=np.int64)
    for lo in range(0, n, block):
        hi = min(lo + block, n)
        d2 = (
            (data[lo:hi] ** 2).sum(axis=1, keepdims=True)
            - 2.0 * data[lo:hi] @ data.T
            + (data**2).sum(axis=1)
        )
        np.maximum(d2, 0.0, out=d2)
        d2[np.arange(hi - lo), np.arange(lo, hi)] = np.inf
        kk = out.shape[1]
        idx = np.argpartition(d2, kk - 1, axis=1)[:, :kk]
        part = np.take_along_axis(d2, idx, axis=1)
        order = np.argsort(part, axis=1, kind="stable")
        out[lo:hi] = np.take_along_axis(idx, order, axis=1)
    return out


def knn_matrix_spark(
    spark: SparkSession, data: np.ndarray, k: int, *, n_blocks: int | None = None
) -> DataFrame:
    """Distributed k'-NN matrix build (Algorithm 1, Step 1).

    Rows of ``data`` are sharded across executors; the full dataset is
    broadcast once. Returns a DataFrame (id: long, neighbors: array<long>)
    where ``neighbors`` holds the k nearest other points, nearest first.
    """
    n = len(data)
    kk = min(k, n - 1)
    bc = spark.sparkContext.broadcast(np.asarray(data, dtype=np.float64))
    if n_blocks is None:
        n_blocks = max(1, min(spark.sparkContext.defaultParallelism, n // 256 or 1))
    ids = spark.range(0, n, 1, n_blocks)  # column "id"

    def compute(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        x = bc.value
        for pdf in batches:
            rows = pdf["id"].to_numpy()
            idx, _ = topk_neighbors(x[rows], x, kk + 1)
            # Drop the self column wherever it appears (always distance 0,
            # so it sorts first among its ties).
            neigh = np.empty((len(rows), kk), dtype=np.int64)
            for i, r in enumerate(rows):
                row = idx[i]
                row = row[row != r][:kk]
                neigh[i] = row
            yield pd.DataFrame({"id": rows, "neighbors": list(map(list, neigh))})

    return ids.mapInPandas(compute, schema="id long, neighbors array<long>")


def knn_matrix_spark_collect(
    spark: SparkSession, data: np.ndarray, k: int
) -> np.ndarray:
    """Run the Spark build and materialize the (n, k) index matrix on the
    driver (the training loop indexes it per mini-batch, §4.2.2)."""
    pdf = knn_matrix_spark(spark, data, k).toPandas().sort_values("id")
    return np.stack(pdf["neighbors"].to_numpy()).astype(np.int64)
