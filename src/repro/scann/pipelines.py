"""§5.4.3 pipelines: partition-then-ScaNN and the non-learning ANNS baselines.

``ScannPipeline`` composes a space partitioner (USP, K-means, or none) with
the anisotropic-PQ sketch: the partitioner produces a candidate set for a
query, ScaNN's ADC + re-rank searches inside it. ``recall_time_curve`` turns
any ``search(query, k, param)`` function into a (param, recall, ms/query)
curve, and ``speedup_at_recall`` interpolates the relative query-time saving
at a fixed recall — the paper's "40% speedup over K-means+ScaNN" claim.
"""
from __future__ import annotations

import time
from typing import Callable

import numpy as np
import pandas as pd

from repro.index.base import PartitionIndex
from repro.knn.metrics import knn_accuracy
from repro.scann.avq import AnisotropicPQ


class ScannPipeline:
    """partition → candidate set → ScaNN (ADC + exact re-rank)."""

    def __init__(self, pq: AnisotropicPQ, partitioner: PartitionIndex | None = None):
        self.pq = pq
        self.partitioner = partitioner
        self._members: list[np.ndarray] | None = None

    def fit(self, x: np.ndarray) -> "ScannPipeline":
        self.pq.fit(np.asarray(x, dtype=np.float64))
        if self.partitioner is not None:
            self._members = self.partitioner.bin_members()
        return self

    def search(self, query: np.ndarray, k: int, *, n_probes: int = 1, rerank: int = 100) -> np.ndarray:
        if self.partitioner is None:
            return self.pq.search(query, k, rerank=rerank)
        order = self.partitioner.probe_matrix(np.asarray(query)[None])[0][:n_probes]
        subset = np.concatenate([self._members[b] for b in order])
        return self.pq.search(query, k, subset=subset, rerank=rerank)

    def batch_search(
        self, queries: np.ndarray, k: int, *, n_probes: int = 1, rerank: int = 100
    ) -> np.ndarray:
        """Batched online phase: one vectorized probe-matrix pass for the
        whole query set (how a serving system amortizes model inference),
        then the per-query candidate ADC scan + re-rank. Returns (n_q, k)
        ids padded with -1."""
        queries = np.asarray(queries, dtype=np.float64)
        out = np.full((len(queries), k), -1, dtype=np.int64)
        if self.partitioner is None:
            for i, q in enumerate(queries):
                res = self.pq.search(q, k, rerank=rerank)
                out[i, : len(res)] = res
            return out
        orders = self.partitioner.probe_matrix(queries)[:, :n_probes]
        for i, (q, row) in enumerate(zip(queries, orders)):
            subset = np.concatenate([self._members[b] for b in row])
            res = self.pq.search(q, k, subset=subset, rerank=rerank)
            out[i, : len(res)] = res
        return out


def recall_time_curve(
    search_fn: Callable[[np.ndarray, int, object], np.ndarray],
    params: list,
    queries: np.ndarray,
    gt_idx: np.ndarray,
    *,
    k: int = 10,
) -> pd.DataFrame:
    """(param, recall, ms_per_query) rows; recall is the paper's Eq. 1.

    A short untimed warmup precedes each timed sweep so first-touch costs
    (codebook tables, cache fill) don't land on the first parameter.
    A ``search_fn`` with attribute ``batched = True`` is called once with the
    whole query matrix and must return an (n_q, k) id array — used by the
    partition+ScaNN pipelines, which amortize model inference over the batch.
    """
    rows = []
    batched = getattr(search_fn, "batched", False)
    for p in params:
        if batched:
            search_fn(queries[: min(20, len(queries))], k, p)
            t0 = time.perf_counter()
            returned = np.asarray(search_fn(queries, k, p))[:, :k]
            ms = (time.perf_counter() - t0) * 1000.0 / len(queries)
        else:
            for q in queries[: min(20, len(queries))]:
                search_fn(q, k, p)
            t0 = time.perf_counter()
            returned = np.full((len(queries), k), -1, dtype=np.int64)
            for i, q in enumerate(queries):
                res = search_fn(q, k, p)
                returned[i, : len(res)] = res[:k]
            ms = (time.perf_counter() - t0) * 1000.0 / len(queries)
        rows.append(
            {"param": p, "recall": knn_accuracy(returned, gt_idx[:, :k]), "ms_per_query": ms}
        )
    return pd.DataFrame(rows)


def time_at_recall(curve: pd.DataFrame, target: float) -> float | None:
    """Interpolated ms/query at which the curve reaches ``target`` recall."""
    c = curve.sort_values("ms_per_query")
    rec = c["recall"].to_numpy()
    ms = c["ms_per_query"].to_numpy()
    if rec[0] >= target:
        return float(ms[0])
    above = np.nonzero(rec >= target)[0]
    if len(above) == 0:
        return None
    hi = above[0]
    lo = hi - 1
    if rec[hi] == rec[lo]:
        return float(ms[hi])
    frac = (target - rec[lo]) / (rec[hi] - rec[lo])
    return float(ms[lo] + frac * (ms[hi] - ms[lo]))


def speedup_at_recall(fast: pd.DataFrame, slow: pd.DataFrame, target: float) -> float | None:
    """Relative speedup (slow_time / fast_time − 1) at the target recall."""
    tf = time_at_recall(fast, target)
    ts = time_at_recall(slow, target)
    if tf is None or ts is None or tf <= 0:
        return None
    return ts / tf - 1.0


def run_pipeline_sweep(
    pipelines: dict[str, tuple[Callable, list]],
    queries: np.ndarray,
    gt_idx: np.ndarray,
    *,
    k: int = 10,
) -> pd.DataFrame:
    """Sweep several named methods; returns long-format rows
    (method, param, recall, ms_per_query) — the Fig. 7 data."""
    frames = []
    for name, (fn, params) in pipelines.items():
        c = recall_time_curve(fn, params, queries, gt_idx, k=k)
        c.insert(0, "method", name)
        frames.append(c)
    return pd.concat(frames, ignore_index=True)
