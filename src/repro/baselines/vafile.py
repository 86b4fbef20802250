"""VA+file — vector-approximation file over a DFT rotation
(Ferhatosmanoglu et al., CIKM'00; the DFT variant from the Lernaean
Hydra evaluation the paper uses).

Build: project each series onto an orthonormal truncated real-DFT basis
(16 coefficients, Parseval => truncated-space ED lower-bounds series
ED), allocate quantization bits per dimension proportionally to the
dimension's variance, and cut each dimension into equi-populated cells
(the "+": non-uniform, data-adaptive cell boundaries; we use quantiles
where the original trains Lloyd's algorithm — same adaptivity, simpler,
documented in DESIGN.md).

Query (VA-SSA): scan the approximation file computing a per-series
lower bound from the cell intervals; visit candidates in ascending
lower-bound order, fetching raw series (one random I/O each, the
skip-sequential profile) until the next lower bound exceeds the k-th
best distance.
"""
from __future__ import annotations

import pickle
import time

import numpy as np

from repro.core.config import IndexConfig
from repro.core.hercules_query import KnnSet
from repro.core.metrics import BuildStats, QueryStats
from repro.core.series import SERIES_DTYPE, ed2_single


def dft_basis(length: int, n_dims: int) -> np.ndarray:
    """Orthonormal real-DFT basis rows (n_dims, length).

    Rows: constant, then cos/sin pairs of increasing frequency — an
    orthonormal family, so the projection is an isometry onto its span
    and distances in the truncated space lower-bound series distances.
    """
    t = np.arange(length)
    rows = [np.full(length, 1.0 / np.sqrt(length))]
    freq = 1
    while len(rows) < n_dims:
        c = np.cos(2 * np.pi * freq * t / length)
        s = np.sin(2 * np.pi * freq * t / length)
        for v in (c, s):
            nrm = np.linalg.norm(v)
            if nrm > 1e-12 and len(rows) < n_dims:
                rows.append(v / nrm)
        freq += 1
    return np.asarray(rows)


def allocate_bits(variances: np.ndarray, total_bits: int) -> np.ndarray:
    """Greedy variance-proportional bit allocation (VA+file style):
    repeatedly grant one bit to the dimension with the highest
    remaining variance, halving it per granted bit."""
    v = np.asarray(variances, dtype=np.float64).copy()
    bits = np.zeros(len(v), dtype=np.int64)
    for _ in range(total_bits):
        i = int(np.argmax(v))
        bits[i] += 1
        v[i] /= 4.0  # one more bit halves the cell width => quarter variance
    return bits


class VAFileIndex:
    """One partition's VA+file."""

    def __init__(self, basis, bounds, cells, feats, X, ids, cfg, build_stats):
        self.basis = basis            # (d, length)
        self.bounds = bounds          # list of per-dim boundary arrays
        self.cells = cells            # (n, d) int cell index per dim
        self.feats = feats            # (n, d) float features (not used at query)
        self.X = X
        self.ids = ids
        self.cfg = cfg
        self.build_stats = build_stats
        self.length = X.shape[1]

    @classmethod
    def build(cls, X: np.ndarray, ids: np.ndarray, cfg: IndexConfig) -> "VAFileIndex":
        X = np.ascontiguousarray(X, dtype=SERIES_DTYPE)
        ids = np.asarray(ids, dtype=np.int64)
        n, length = X.shape
        t0 = time.perf_counter()
        d = min(cfg.vafile_dims, length)
        basis = dft_basis(length, d)
        feats = X.astype(np.float64) @ basis.T
        bits = allocate_bits(feats.var(axis=0), d * cfg.vafile_bits_per_dim)
        bounds = []
        cells = np.zeros((n, d), dtype=np.int64)
        for j in range(d):
            n_cells = 1 << int(bits[j])
            if n_cells == 1:
                bounds.append(np.empty(0))
                continue
            qs = np.quantile(feats[:, j], np.linspace(0, 1, n_cells + 1)[1:-1])
            qs = np.unique(qs)
            bounds.append(qs)
            cells[:, j] = np.searchsorted(qs, feats[:, j], side="right")
        stats = BuildStats(
            n_series=n,
            build_cpu_s=time.perf_counter() - t0,
            lrd_bytes=X.nbytes,
            lsd_bytes=int(cells.nbytes // 8),  # ~1 byte/dim in the real format
        )
        return cls(basis, bounds, cells, feats, X, ids, cfg, stats)

    def _cell_lb2(self, qf: np.ndarray) -> np.ndarray:
        """Per-series squared LB: distance from the query's feature
        vector to each series' cell box, per dimension."""
        n, d = self.cells.shape
        total = np.zeros(n)
        for j in range(d):
            b = self.bounds[j]
            if b.size == 0:
                continue  # 0-bit dim: cell spans everything, LB contribution 0
            lo = np.concatenate(([-np.inf], b))[self.cells[:, j]]
            hi = np.concatenate((b, [np.inf]))[self.cells[:, j]]
            diff = np.maximum(np.maximum(lo - qf[j], qf[j] - hi), 0.0)
            total += diff * diff
        return total

    def knn(
        self, q: np.ndarray, k: int, *, bsf0: float | None = None,
        phase: str = "full",
    ) -> tuple[list, QueryStats]:
        """VA+file has no approximate phase: round one of the
        distributed protocol returns nothing, and ``bsf0`` (if another
        round supplied one) just seeds the refinement bound."""
        q = np.asarray(q, dtype=np.float64).ravel()
        stats = QueryStats(n_series=len(self.X), n_leaves=1)
        if phase == "approx":
            stats.path = "approx"
            return [], stats
        res = KnnSet(k, cap2=np.inf if bsf0 is None else float(bsf0) ** 2)
        t0 = time.perf_counter()
        qf = q @ self.basis.T
        # Phase 1: sequential scan of the (small) approximation file.
        # Single-threaded (the paper runs VA+file as the best
        # skip-sequential — serial — method); linear CPU in n.
        lbs = self._cell_lb2(qf)
        stats.lb_sax_calcs += len(self.X)  # VA lower bounds play LB_SAX's role
        stats.ops_serial += len(self.X) * self.cells.shape[1]
        # candidate ordering: ~n log n comparisons
        stats.ops_serial += len(self.X) * max(1, int(np.log2(max(2, len(self.X)))))
        stats.seq_bytes += self.build_stats.lsd_bytes
        stats.seeks += 1
        # Phase 2 (VA-SSA): ascending-LB refinement with random reads.
        order = np.argsort(lbs, kind="stable")
        accessed = 0
        for pos in order:
            if lbs[pos] >= res.bsf2:
                break
            d2 = float(ed2_single(q, self.X[pos][None, :])[0])
            accessed += 1
            stats.seeks += 1
            stats.seq_bytes += self.length * 4
            stats.points_touched += self.length
            stats.ops_serial += self.length
            stats.ed_calcs += 1
            if d2 < res.bsf2:
                res.add(d2, int(self.ids[pos]))
        stats.series_accessed = accessed
        stats.scl_size = accessed
        stats.sax_pr = 1.0 - accessed / max(1, len(self.X))
        stats.eapca_pr = 1.0
        stats.path = "vafile_ssa"
        stats.cpu_serial_s = time.perf_counter() - t0
        return res.sorted(), stats

    def save(self, path: str) -> None:
        import os

        os.makedirs(path, exist_ok=True)
        with open(os.path.join(path, "vafile.pkl"), "wb") as f:
            pickle.dump(self, f)

    @classmethod
    def load(cls, path: str) -> "VAFileIndex":
        import os

        with open(os.path.join(path, "vafile.pkl"), "rb") as f:
            return pickle.load(f)
