"""Exact k-NN substrate tests: numpy reference vs naive, Spark build vs
numpy, and a DuckDB SQL oracle check of the neighbor sets."""
import numpy as np
import pandas as pd
import pytest

from repro.knn.exact import (
    knn_matrix_numpy,
    knn_matrix_spark,
    knn_matrix_spark_collect,
    topk_neighbors,
)
from repro.knn.metrics import knn_accuracy
from repro.oracle import assert_equivalent


def naive_topk(queries, data, k, exclude_self=False):
    out = []
    for i, q in enumerate(queries):
        d = np.linalg.norm(data - q, axis=1)
        if exclude_self:
            d[i] = np.inf
        out.append(np.argsort(d, kind="stable")[:k])
    return np.array(out)


class TestTopkNumpy:
    @pytest.mark.parametrize("n,d,k", [(50, 3, 5), (200, 8, 10), (20, 2, 19)])
    def test_matches_naive(self, n, d, k):
        rng = np.random.default_rng(0)
        data = rng.normal(size=(n, d))
        queries = rng.normal(size=(10, d))
        idx, dist = topk_neighbors(queries, data, k)
        naive = naive_topk(queries, data, k)
        # Compare distances (ids can differ under exact ties).
        for i in range(len(queries)):
            np.testing.assert_allclose(
                dist[i], np.linalg.norm(data[naive[i]] - queries[i], axis=1), atol=1e-9
            )

    def test_sorted_ascending(self):
        rng = np.random.default_rng(1)
        data = rng.normal(size=(100, 4))
        _, dist = topk_neighbors(data[:5], data, 10)
        assert (np.diff(dist, axis=1) >= -1e-12).all()

    def test_exclude_self(self):
        rng = np.random.default_rng(2)
        data = rng.normal(size=(30, 3))
        idx, _ = topk_neighbors(data, data, 5, exclude_self=True)
        for i in range(30):
            assert i not in idx[i]

    def test_k_larger_than_n(self):
        data = np.random.default_rng(3).normal(size=(4, 2))
        idx, dist = topk_neighbors(data[:2], data, 10)
        assert idx.shape == (2, 4)


class TestKnnMatrixNumpy:
    def test_matches_naive(self):
        rng = np.random.default_rng(4)
        data = rng.normal(size=(80, 5))
        mat = knn_matrix_numpy(data, 7)
        naive = naive_topk(data, data, 7, exclude_self=True)
        for i in range(80):
            di = np.linalg.norm(data[mat[i]] - data[i], axis=1)
            dn = np.linalg.norm(data[naive[i]] - data[i], axis=1)
            np.testing.assert_allclose(di, dn, atol=1e-9)

    @pytest.mark.parametrize("block", [7, 32, 1000])
    def test_blocking_invariant(self, block):
        rng = np.random.default_rng(5)
        data = rng.normal(size=(60, 4))
        np.testing.assert_array_equal(
            knn_matrix_numpy(data, 5, block=block), knn_matrix_numpy(data, 5)
        )

    def test_shape_caps_at_n_minus_1(self):
        data = np.random.default_rng(6).normal(size=(6, 3))
        assert knn_matrix_numpy(data, 10).shape == (6, 5)


class TestKnnMatrixSpark:
    def test_matches_numpy(self, spark, small_data):
        data, _ = small_data
        sub = data[:300]
        got = knn_matrix_spark_collect(spark, sub, 6)
        ref = knn_matrix_numpy(sub, 6)
        # Distances must agree exactly even if tie ids differ.
        for i in range(len(sub)):
            np.testing.assert_allclose(
                np.linalg.norm(sub[got[i]] - sub[i], axis=1),
                np.linalg.norm(sub[ref[i]] - sub[i], axis=1),
                atol=1e-9,
            )

    def test_ids_cover_range(self, spark):
        data = np.random.default_rng(7).normal(size=(100, 4))
        pdf = knn_matrix_spark(spark, data, 4).toPandas()
        assert sorted(pdf["id"]) == list(range(100))

    def test_oracle_sql_neighbors(self, spark):
        """DuckDB cross-join top-k agrees with the Spark build (first NN)."""
        rng = np.random.default_rng(8)
        data = rng.normal(size=(60, 3))
        knn_df = knn_matrix_spark(spark, data, 1)
        first_nn = knn_df.selectExpr("id", "neighbors[0] as nn")
        points = pd.DataFrame(
            {"id": range(60), "x0": data[:, 0], "x1": data[:, 1], "x2": data[:, 2]}
        )
        sql = """
            SELECT a.id AS id, arg_min(b.id, (a.x0-b.x0)^2 + (a.x1-b.x1)^2 + (a.x2-b.x2)^2) AS nn
            FROM points a JOIN points b ON a.id <> b.id
            GROUP BY a.id
        """
        assert_equivalent(first_nn, sql, points=points)


class TestKnnAccuracy:
    def test_perfect(self):
        t = np.array([[1, 2, 3], [4, 5, 6]])
        assert knn_accuracy(t, t) == 1.0

    def test_half(self):
        truth = np.array([[1, 2], [3, 4]])
        ret = np.array([[1, 9], [8, 4]])
        assert knn_accuracy(ret, truth) == 0.5

    def test_padding_ignored(self):
        truth = np.array([[1, 2]])
        ret = np.array([[1, -1]])
        assert knn_accuracy(ret, truth) == 0.5

    def test_order_invariant(self):
        truth = np.array([[1, 2, 3]])
        assert knn_accuracy(np.array([[3, 1, 2]]), truth) == 1.0
