"""Hercules exact k-NN query answering (Section 3.4, Algorithms 10-14).

Four phases over one partition's index:
  1. ``Approx-kNN`` — priority-queue tree search visiting at most
     ``L_max`` leaves, computing real distances (initial BSF_k).
  2. ``FindCandidateLeaves`` — resume the priority queue without real
     distances, building LCList (sorted by LRDFile position). If the
     EAPCA pruning ratio is below ``EAPCA_TH``, fall back to a
     single-thread skip-sequential scan of the candidate leaves.
  3. ``FindCandidateSeries`` — LB_SAX filter over the candidate leaves'
     iSAX summaries (in-memory LSDFile), building SCList. If the SAX
     pruning ratio is below ``SAX_TH``, skip-sequential scan instead.
  4. ``ComputeResults`` — refine SCList with real distances.

Phases 1-2 are single-threaded in the paper, 3-4 multi-threaded; the
:class:`~repro.core.metrics.QueryStats` counters split CPU time
accordingly so the cost model can apply the paper's thread count.

Modes implement the Figure 12b ablation:
  ``hercules`` (full), ``nosax`` (EAPCA-only pruning), ``nothresh``
  (never fall back to skip-sequential), ``nopara`` (all CPU accounted
  single-threaded).
"""
from __future__ import annotations

import heapq
import time
from itertools import count

import numpy as np

from . import sax as sx
from .eapca import lb_eapca2
from .hercules_index import HerculesPartitionIndex
from .metrics import QueryStats
from .series import PrefixStats, ed2_early_abandon, ed2_single
from .tree import Node

MODES = ("hercules", "nosax", "nothresh", "nopara")


class KnnSet:
    """The ``Results`` array: k best-so-far answers as a bounded max-heap.

    Deduplicates by series id — a series scanned by both the approximate
    phase and a later refinement phase (e.g. ParIS+'s SIMS re-scans the
    approximate leaf) must occupy one result slot, not two.

    ``cap2`` seeds the pruning bound with an externally-achieved squared
    distance (the *global* BSF of the distributed two-round search —
    the paper's shared-memory BSF_k). Pruning may then start before k
    local results exist; the partition that achieved the cap already
    reported that answer in round one, so global exactness holds.
    """

    __slots__ = ("k", "_heap", "_members", "cap2")

    def __init__(self, k: int, cap2: float = np.inf):
        self.k = k
        self.cap2 = cap2
        self._heap: list[tuple[float, int]] = []  # (-d2, orig_id)
        self._members: set[int] = set()

    @property
    def bsf2(self) -> float:
        """Squared distance of the k-th best-so-far answer, capped by an
        external global bound (inf until either exists)."""
        kth = -self._heap[0][0] if len(self._heap) == self.k else np.inf
        return min(kth, self.cap2)

    def add(self, d2: float, orig_id: int) -> bool:
        if orig_id in self._members:
            return False
        if len(self._heap) < self.k:
            heapq.heappush(self._heap, (-d2, orig_id))
            self._members.add(orig_id)
            return True
        if d2 < -self._heap[0][0]:
            _, evicted = heapq.heapreplace(self._heap, (-d2, orig_id))
            self._members.discard(evicted)
            self._members.add(orig_id)
            return True
        return False

    def add_block(self, d2s: np.ndarray, orig_ids: np.ndarray) -> None:
        """Fold a block of exact distances into the result set."""
        for d2, oid in zip(d2s, orig_ids):
            if d2 < self.bsf2:
                self.add(float(d2), int(oid))

    def sorted(self) -> list[tuple[float, int]]:
        """Final answers as ``(distance, orig_id)`` ascending."""
        return sorted((np.sqrt(-nd), oid) for nd, oid in self._heap)


class HerculesSearcher:
    """Answers exact k-NN queries on one :class:`HerculesPartitionIndex`."""

    def __init__(self, index: HerculesPartitionIndex):
        self.index = index
        self.cfg = index.cfg
        self.leaves = index.leaves
        self.n_leaves = len(self.leaves)
        self.n = index.lrd.shape[0]
        self.length = index.lrd.shape[1]
        self.series_bytes = self.length * 4

    # ------------------------------------------------------------ bounds
    def _lb_eapca2(self, qps: PrefixStats, node: Node, stats: QueryStats) -> float:
        mu, sd = qps.seg_stats_multi(node.ends)
        stats.lb_eapca_calcs += 1
        # 2 ops per segment (mean + std interval terms); tree search is
        # single-threaded (phases 1-2).
        stats.ops_serial += 2 * len(node.ends)
        return lb_eapca2(mu[0], sd[0], node.ends, node.syn)

    # ------------------------------------------------------------- leaf IO
    def _read_leaf(self, leaf: Node, stats: QueryStats, *, sequential_after: int) -> np.ndarray:
        """Read a leaf's raw series from LRDFile, counting I/O.

        ``sequential_after`` is the LRDFile position right after the
        previously-read leaf; an adjacent leaf continues the same
        sequential run (no extra seek) — the LRDFile layout's payoff.
        """
        if leaf.file_start != sequential_after:
            stats.seeks += 1
        stats.seq_bytes += leaf.file_count * self.series_bytes
        stats.series_accessed += leaf.file_count
        return self.index.lrd[leaf.file_start : leaf.file_start + leaf.file_count]

    def _scan_leaf_block(
        self, q: np.ndarray, leaf: Node, res: KnnSet, stats: QueryStats, prev_end: int,
        *, serial: bool = True,
    ) -> None:
        block = self._read_leaf(leaf, stats, sequential_after=prev_end)
        d2, touched = ed2_early_abandon(q, block, res.bsf2)
        stats.points_touched += touched
        if serial:
            stats.ops_serial += touched
        else:
            stats.ops_parallel += touched
        stats.ed_calcs += leaf.file_count
        pos = np.arange(leaf.file_start, leaf.file_start + leaf.file_count)
        mask = d2 < res.bsf2
        res.add_block(d2[mask], self.index.orig_ids[pos[mask]])

    # -------------------------------------------------------------- query
    def knn(
        self, q: np.ndarray, k: int, *, mode: str = "hercules",
        bsf0: float | None = None, phase: str = "full",
    ) -> tuple[list, QueryStats]:
        """Exact-kNN (Algorithm 10). Returns ``([(dist, orig_id)], stats)``.

        ``phase`` supports the distributed two-round protocol that
        replicates the paper's shared-memory BSF_k across Spark
        partitions: ``"approx"`` runs Approx-kNN only (round one),
        ``"exact"`` skips it and starts pruning from the global bound
        ``bsf0`` (round two); ``"full"`` is the single-node behaviour.
        """
        if mode not in MODES:
            raise ValueError(f"mode must be one of {MODES}")
        if phase not in ("full", "approx", "exact"):
            raise ValueError(f"unknown phase {phase!r}")
        q = np.asarray(q, dtype=np.float64).ravel()
        stats = QueryStats(n_leaves=self.n_leaves, n_series=self.n)
        res = KnnSet(k, cap2=np.inf if bsf0 is None else float(bsf0) ** 2)
        qps = PrefixStats(q)
        q_paa = qps.seg_stats_multi(self.index.sax_ends)[0][0]
        tick = count()  # heap tie-breaker

        t0 = time.perf_counter()
        pq: list[tuple[float, int, Node]] = []
        root = self.index.tree.root
        heapq.heappush(pq, (self._lb_eapca2(qps, root, stats), next(tick), root))

        # ---- Phase 1: Approx-kNN (Algorithm 11)
        lmax = self.cfg.scaled_lmax(self.n_leaves)
        visited = 0
        prev_end = -1
        while phase != "exact" and pq and visited < lmax:
            lb, _, node = heapq.heappop(pq)
            if lb > res.bsf2:
                pq.clear()  # every remaining node has a larger bound
                break
            if node.is_leaf:
                self._scan_leaf_block(q, node, res, stats, prev_end)
                prev_end = node.file_start + node.file_count
                visited += 1
            else:
                for child in (node.left, node.right):
                    clb = self._lb_eapca2(qps, child, stats)
                    if clb < res.bsf2:
                        heapq.heappush(pq, (clb, next(tick), child))
        stats.leaves_visited_approx = visited
        if phase == "approx":
            stats.path = "approx"
            stats.cpu_serial_s += time.perf_counter() - t0
            return res.sorted(), stats

        # ---- Phase 2: FindCandidateLeaves (Algorithm 12)
        lclist: list[tuple[float, Node]] = []
        while pq:
            lb, _, node = heapq.heappop(pq)
            if lb > res.bsf2:
                break
            if node.is_leaf:
                lclist.append((lb, node))
            else:
                for child in (node.left, node.right):
                    clb = self._lb_eapca2(qps, child, stats)
                    if clb < res.bsf2:
                        heapq.heappush(pq, (clb, next(tick), child))
        lclist.sort(key=lambda t: t[1].file_start)
        stats.lcl_size = len(lclist)
        stats.eapca_pr = 1.0 - len(lclist) / max(1, self.n_leaves)
        stats.cpu_serial_s += time.perf_counter() - t0

        use_thresholds = mode != "nothresh"
        if use_thresholds and stats.eapca_pr < self.cfg.eapca_th:
            # EAPCA pruning too weak: single-thread skip-sequential scan.
            stats.path = "eapca_skipseq"
            self._skip_sequential(q, lclist, res, stats)
            return self._finish(res, stats, mode)

        if mode == "nosax":
            # Ablation: no iSAX filter — refine every candidate leaf's
            # series with real distances (multi-threaded in the paper).
            stats.path = "nosax_refine"
            t1 = time.perf_counter()
            prev_end = -1
            for lb, leaf in lclist:
                if lb >= res.bsf2:
                    continue
                self._scan_leaf_block(q, leaf, res, stats, prev_end, serial=False)
                prev_end = leaf.file_start + leaf.file_count
            stats.cpu_parallel_s += time.perf_counter() - t1
            return self._finish(res, stats, mode)

        # ---- Phase 3: FindCandidateSeries (Algorithm 13)
        t1 = time.perf_counter()
        bsf2 = res.bsf2
        cand_pos: list[np.ndarray] = []
        cand_lb: list[np.ndarray] = []
        for lb, leaf in lclist:
            sl = slice(leaf.file_start, leaf.file_start + leaf.file_count)
            lbs = sx.lb_sax2(q_paa, self.index.lsd[sl], self.index.sax_lens, self.cfg.sax_card)
            stats.lb_sax_calcs += leaf.file_count
            stats.ops_parallel += leaf.file_count * self.cfg.sax_segments
            keep = lbs < bsf2
            if keep.any():
                cand_pos.append(np.arange(sl.start, sl.stop)[keep])
                cand_lb.append(lbs[keep])
        scl_pos = np.concatenate(cand_pos) if cand_pos else np.empty(0, dtype=np.int64)
        scl_lb = np.concatenate(cand_lb) if cand_lb else np.empty(0)
        stats.scl_size = int(scl_pos.size)
        stats.sax_pr = 1.0 - scl_pos.size / max(1, self.n)
        stats.cpu_parallel_s += time.perf_counter() - t1

        if use_thresholds and stats.sax_pr < self.cfg.sax_th:
            # SAX pruning too weak: single-thread skip-sequential scan.
            stats.path = "sax_skipseq"
            self._skip_sequential(q, lclist, res, stats)
            return self._finish(res, stats, mode)

        # ---- Phase 4: ComputeResults (Algorithm 14)
        # Processed in vectorized blocks (the BSF refreshes between
        # blocks). I/O accounting follows the paper's own cost argument
        # (Section 3.4): the multi-threaded refinement "incurs as many
        # random I/O operations as the number of non-pruned series" —
        # concurrent threads interleave reads, so each series read is a
        # random access, which is exactly why the SAX_TH fallback to the
        # single-thread skip-sequential scan exists.
        stats.path = "refine"
        t2 = time.perf_counter()
        order = np.argsort(scl_pos, kind="stable")
        scl_pos, scl_lb = scl_pos[order], scl_lb[order]
        BLOCK = 64
        for start in range(0, scl_pos.size, BLOCK):
            pos = scl_pos[start : start + BLOCK]
            pos = pos[scl_lb[start : start + BLOCK] < res.bsf2]
            if pos.size == 0:
                continue
            stats.seeks += int(pos.size)
            stats.seq_bytes += pos.size * self.series_bytes
            stats.series_accessed += int(pos.size)
            stats.points_touched += int(pos.size) * self.length
            stats.ops_parallel += int(pos.size) * self.length
            d2 = ed2_single(q, self.index.lrd[pos])
            stats.ed_calcs += pos.size
            mask = d2 < res.bsf2
            res.add_block(d2[mask], self.index.orig_ids[pos[mask]])
        stats.cpu_parallel_s += time.perf_counter() - t2
        return self._finish(res, stats, mode)

    # ----------------------------------------------------------- helpers
    def _skip_sequential(
        self, q: np.ndarray, lclist: list[tuple[float, Node]], res: KnnSet, stats: QueryStats
    ) -> None:
        """Single-thread skip-sequential scan over candidate leaves in
        LRDFile order (the low-pruning fallback of Algorithm 10)."""
        t0 = time.perf_counter()
        prev_end = -1
        for lb, leaf in lclist:  # already sorted by file position
            if lb >= res.bsf2:
                continue
            self._scan_leaf_block(q, leaf, res, stats, prev_end)
            prev_end = leaf.file_start + leaf.file_count
        stats.cpu_serial_s += time.perf_counter() - t0

    def _finish(self, res: KnnSet, stats: QueryStats, mode: str) -> tuple[list, QueryStats]:
        if mode == "nopara":
            stats.cpu_serial_s += stats.cpu_parallel_s
            stats.cpu_parallel_s = 0.0
            stats.ops_serial += stats.ops_parallel
            stats.ops_parallel = 0.0
        return res.sorted(), stats
