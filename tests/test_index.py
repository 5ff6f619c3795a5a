"""Index-plumbing tests: PartitionIndex contract, sweep harness,
interpolation, and the Spark lookup path with DuckDB oracle checks."""
import numpy as np
import pandas as pd
import pytest

from repro.index.base import PartitionIndex
from repro.index.lookup import (
    build_lookup_spark,
    candidate_counts_spark,
    candidates_spark,
    lookup_df_from_index,
    probes_df,
    topk_in_candidates_spark,
)
from repro.index.search import candidate_size_at_accuracy, sweep_accuracy, topk_within
from repro.oracle import assert_equivalent


class _FixedIndex(PartitionIndex):
    """Deterministic index for contract tests: bins by id modulo, probes by
    a fixed per-query ranking."""

    def __init__(self, bins, n_bins, probe_rows):
        self.n_bins = n_bins
        self._data_bins = np.asarray(bins)
        self._probe_rows = np.asarray(probe_rows)

    def probe_matrix(self, queries):
        return np.tile(self._probe_rows, (len(queries), 1))


class TestPartitionIndexContract:
    def test_bin_members_partition(self):
        idx = _FixedIndex([0, 1, 2, 0, 1, 2, 0], 3, [0, 1, 2])
        members = idx.bin_members()
        all_ids = np.sort(np.concatenate(members))
        np.testing.assert_array_equal(all_ids, np.arange(7))
        np.testing.assert_array_equal(members[0], [0, 3, 6])

    def test_bin_sizes(self):
        idx = _FixedIndex([0, 0, 1], 3, [0, 1, 2])
        np.testing.assert_array_equal(idx.bin_sizes(), [2, 1, 0])

    def test_candidate_ids_respect_probe_order(self):
        idx = _FixedIndex([0, 1, 0, 1], 2, [1, 0])
        cands = idx.candidate_ids(np.zeros((1, 2)), 1)
        np.testing.assert_array_equal(np.sort(cands[0]), [1, 3])  # bin 1 first

    def test_candidate_ids_grow_with_probes(self):
        idx = _FixedIndex([0, 1, 0, 1], 2, [1, 0])
        c1 = idx.candidate_ids(np.zeros((1, 2)), 1)[0]
        c2 = idx.candidate_ids(np.zeros((1, 2)), 2)[0]
        assert set(c1) <= set(c2) and len(c2) == 4

    def test_unfitted_raises(self):
        class Empty(PartitionIndex):
            n_bins = 2

        with pytest.raises(RuntimeError):
            Empty().data_bins()


class TestTopkWithin:
    def test_exact(self):
        rng = np.random.default_rng(0)
        data = rng.normal(size=(50, 4))
        q = rng.normal(size=4)
        cand = np.arange(50)
        got = topk_within(q, data, cand, 5)
        d = np.linalg.norm(data - q, axis=1)
        np.testing.assert_array_equal(np.sort(d[got]), np.sort(np.sort(d)[:5]))

    def test_empty_candidates(self):
        assert len(topk_within(np.zeros(3), np.zeros((5, 3)), np.empty(0, int), 4)) == 0

    def test_fewer_candidates_than_k(self):
        data = np.random.default_rng(1).normal(size=(3, 2))
        got = topk_within(np.zeros(2), data, np.array([0, 2]), 10)
        assert set(got) == {0, 2}


class TestSweep:
    def test_full_probe_is_exact(self, trained_usp, small_data, small_gt):
        data, queries = small_data
        curve = sweep_accuracy(
            trained_usp, data, queries, small_gt, probe_counts=[trained_usp.n_bins]
        )
        assert curve["accuracy"].iloc[0] == 1.0
        assert curve["mean_candidates"].iloc[0] == len(data)

    def test_monotone_candidates(self, trained_usp, small_data, small_gt):
        data, queries = small_data
        curve = sweep_accuracy(trained_usp, data, queries, small_gt, probe_counts=[1, 2, 4, 8])
        assert (np.diff(curve["mean_candidates"]) >= 0).all()
        assert (np.diff(curve["accuracy"]) >= -1e-9).all()


class TestInterpolation:
    def make_curve(self):
        return pd.DataFrame(
            {"n_probes": [1, 2, 3], "mean_candidates": [100.0, 200.0, 300.0],
             "accuracy": [0.5, 0.8, 1.0]}
        )

    def test_linear_interp(self):
        c = self.make_curve()
        # 0.65 halfway between 0.5 and 0.8 → halfway between 100 and 200.
        assert candidate_size_at_accuracy(c, 0.65) == pytest.approx(150.0)

    def test_below_first_point(self):
        assert candidate_size_at_accuracy(self.make_curve(), 0.3) == 100.0

    def test_unreachable(self):
        c = self.make_curve()
        c["accuracy"] = [0.1, 0.2, 0.3]
        assert candidate_size_at_accuracy(c, 0.9) is None

    def test_exact_hit(self):
        assert candidate_size_at_accuracy(self.make_curve(), 0.8) == pytest.approx(200.0)


class TestSparkLookup:
    @pytest.fixture(scope="class")
    def lookup(self, spark, trained_usp):
        return build_lookup_spark(spark, lookup_df_from_index(spark, trained_usp))

    def test_lookup_matches_index(self, spark, lookup, trained_usp):
        pdf = lookup.toPandas().sort_values("id")
        np.testing.assert_array_equal(pdf["bin"].to_numpy(), trained_usp.data_bins())

    def test_bin_counts_oracle(self, spark, lookup, trained_usp):
        """Per-bin counts via Spark SQL vs DuckDB over the same table."""
        from pyspark.sql import functions as F

        got = lookup.groupBy("bin").agg(F.count("id").alias("n"))
        ref = pd.DataFrame(
            {"id": np.arange(len(trained_usp.data_bins())), "bin": trained_usp.data_bins()}
        )
        assert_equivalent(got, "SELECT bin, count(id) AS n FROM t GROUP BY bin", t=ref)

    def test_candidates_join_matches_numpy(self, spark, lookup, trained_usp, small_data):
        data, queries = small_data
        q = queries[:15]
        pr = probes_df(spark, trained_usp, q, 2)
        cand = candidates_spark(pr, lookup).toPandas()
        numpy_cands = trained_usp.candidate_ids(q, 2)
        for qid in range(15):
            got = np.sort(cand.loc[cand.qid == qid, "id"].to_numpy())
            np.testing.assert_array_equal(got, np.sort(numpy_cands[qid]))

    def test_candidate_counts_oracle(self, spark, lookup, trained_usp, small_data):
        _, queries = small_data
        pr = probes_df(spark, trained_usp, queries[:10], 3)
        cand = candidates_spark(pr, lookup)
        counts = candidate_counts_spark(cand)
        cand_pdf = cand.toPandas()
        assert_equivalent(
            counts,
            "SELECT qid, count(id) AS n_candidates FROM c GROUP BY qid",
            c=cand_pdf,
        )

    def test_spark_topk_matches_numpy(self, spark, lookup, trained_usp, small_data, small_gt):
        data, queries = small_data
        q = queries[:10]
        pr = probes_df(spark, trained_usp, q, trained_usp.n_bins)  # all bins → exact
        cand = candidates_spark(pr, lookup)
        top = topk_in_candidates_spark(spark, cand, data, q, 10).toPandas()
        for qid in range(10):
            got = top.loc[top.qid == qid].sort_values("dist")["id"].to_numpy()
            truth_d = np.sort(np.linalg.norm(data[small_gt[qid]] - q[qid], axis=1))
            np.testing.assert_allclose(
                np.linalg.norm(data[got] - q[qid], axis=1), truth_d, atol=1e-9
            )
