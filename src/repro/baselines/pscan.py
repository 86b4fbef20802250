"""PSCAN — the paper's parallel optimized sequential scan (their
UCR-Suite adaptation): squared distances, early abandoning, SIMD
(vectorized blocks here), multi-threading (Spark partitions + the
parallel-CPU accounting), and double buffering (I/O overlapped with
compute, flagged for the cost model).
"""
from __future__ import annotations

import pickle
import time

import numpy as np

from repro.core.config import IndexConfig
from repro.core.hercules_query import KnnSet
from repro.core.metrics import BuildStats, QueryStats
from repro.core.series import SERIES_DTYPE, ed2_early_abandon


class PscanIndex:
    """Not an index: the raw file plus the scan algorithm. Kept behind
    the same interface so the harness treats all methods uniformly."""

    # Series per vectorized sub-block: the BSF is refreshed between
    # blocks, so small blocks approximate UCR's per-series early
    # abandoning while keeping the kernels SIMD-shaped.
    BLOCK = 64

    def __init__(self, X: np.ndarray, ids: np.ndarray, cfg: IndexConfig,
                 build_stats: BuildStats):
        self.X = X
        self.ids = ids
        self.cfg = cfg
        self.build_stats = build_stats
        self.length = X.shape[1]

    @classmethod
    def build(cls, X: np.ndarray, ids: np.ndarray, cfg: IndexConfig) -> "PscanIndex":
        X = np.ascontiguousarray(X, dtype=SERIES_DTYPE)
        stats = BuildStats(n_series=len(X), lrd_bytes=X.nbytes)
        return cls(X, np.asarray(ids, dtype=np.int64), cfg, stats)

    def knn(
        self, q: np.ndarray, k: int, *, bsf0: float | None = None,
        phase: str = "full",
    ) -> tuple[list, QueryStats]:
        """A scan has no approximate phase; ``bsf0`` seeds early
        abandoning when the distributed protocol provides one."""
        q = np.asarray(q, dtype=np.float64).ravel()
        n = len(self.X)
        stats = QueryStats(n_series=n, n_leaves=1, overlap_io=True)
        if phase == "approx":
            stats.path = "approx"
            return [], stats
        res = KnnSet(k, cap2=np.inf if bsf0 is None else float(bsf0) ** 2)
        t0 = time.perf_counter()
        for start in range(0, n, self.BLOCK):
            block = self.X[start : start + self.BLOCK]
            d2, touched = ed2_early_abandon(q, block, res.bsf2)
            stats.points_touched += touched
            stats.ops_parallel += touched  # SIMD + multithreaded scan
            stats.ed_calcs += len(block)
            mask = d2 < res.bsf2
            res.add_block(d2[mask], self.ids[start : start + self.BLOCK][mask])
        stats.series_accessed = n
        stats.seq_bytes = self.X.nbytes
        stats.seeks = 1
        stats.eapca_pr = 0.0
        stats.sax_pr = 0.0
        stats.path = "pscan"
        # The scan is fully data-parallel (SIMD + threads in the paper).
        stats.cpu_parallel_s = time.perf_counter() - t0
        return res.sorted(), stats

    def save(self, path: str) -> None:
        import os

        os.makedirs(path, exist_ok=True)
        with open(os.path.join(path, "pscan.pkl"), "wb") as f:
            pickle.dump(self, f)

    @classmethod
    def load(cls, path: str) -> "PscanIndex":
        import os

        with open(os.path.join(path, "pscan.pkl"), "rb") as f:
            return pickle.load(f)
