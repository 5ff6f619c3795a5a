"""Common interface for space-partitioning indexes (USP and all baselines).

A partition index knows (i) which bin each data point landed in and (ii) for a
query, a ranking of bins from most to least probable (the multiprobe order of
Algorithm 2). The default candidate-set materialization and the sweep harness
in :mod:`repro.index.search` work against this interface for every method in
the paper's figures/tables.
"""
from __future__ import annotations

import numpy as np


class PartitionIndex:
    """Abstract base: subclasses set ``n_bins`` and ``_data_bins`` after fit
    and implement :meth:`probe_matrix`."""

    n_bins: int
    _data_bins: np.ndarray | None = None

    # -- partition side ----------------------------------------------------
    def data_bins(self) -> np.ndarray:
        """Bin id of every indexed data point (the partition R of X)."""
        if self._data_bins is None:
            raise RuntimeError("index not fitted")
        return self._data_bins

    def bin_members(self) -> list[np.ndarray]:
        """Lookup table bin → sorted point ids (Algorithm 1, Step 3)."""
        bins = self.data_bins()
        order = np.argsort(bins, kind="stable")
        sorted_bins = bins[order]
        members: list[np.ndarray] = []
        for b in range(self.n_bins):
            lo = np.searchsorted(sorted_bins, b, side="left")
            hi = np.searchsorted(sorted_bins, b, side="right")
            members.append(order[lo:hi])
        return members

    # -- query side --------------------------------------------------------
    def probe_matrix(self, queries: np.ndarray) -> np.ndarray:  # pragma: no cover
        """(n_q, n_bins) array: bins ranked most→least probable per query."""
        raise NotImplementedError

    def candidate_ids(self, queries: np.ndarray, n_probes: int) -> list[np.ndarray]:
        """Candidate set C(q) per query from its top ``n_probes`` bins."""
        members = self.bin_members()
        order = self.probe_matrix(queries)[:, :n_probes]
        return [
            np.concatenate([members[b] for b in row]) if len(row) else np.empty(0, int)
            for row in order
        ]

    def bin_sizes(self) -> np.ndarray:
        return np.bincount(self.data_bins(), minlength=self.n_bins)
