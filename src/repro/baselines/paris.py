"""ParIS+ — the iSAX-family parallel disk-based index (Peng et al., TKDE'21).

Index: an iSAX tree whose root fans out on the 16-bit vector of leading
symbol bits (one per segment); nodes split by *increasing the
cardinality* of one segment (round-robin over the segment with the
fewest bits), the iSAX2 splitting rule. Only the iSAX summaries are
inserted into the tree — raw data stays in the original file order
(this is why ParIS+ builds fast but answers hard queries slowly: the
neighbors of a query are scattered across the raw file).

Query: a parallel version of ADS+ SIMS —
  1. approximate search descends the tree along the query's iSAX bits
     and computes real distances for the matching leaf (initial BSF);
  2. the *whole* in-memory iSAX summary array is scanned with LB_SAX
     (multi-threaded in the paper);
  3. the non-pruned series are read from the raw file in position order
     (skip-sequential: one random seek per non-contiguous run) and
     refined with early-abandoning real distances.
"""
from __future__ import annotations

import pickle
import time
from dataclasses import dataclass, field

import numpy as np

from repro.core import sax as sx
from repro.core import segmentation as sg
from repro.core.config import IndexConfig
from repro.core.hercules_query import KnnSet
from repro.core.metrics import BuildStats, QueryStats
from repro.core.series import SERIES_DTYPE, ed2_early_abandon, ed2_single

_FULL_BITS = 8  # alphabet 256


@dataclass
class ParisNode:
    """An iSAX tree node: per-segment (prefix, bits) plus member rows."""

    prefix: np.ndarray            # per-segment symbol prefix (at `bits` each)
    bits: np.ndarray              # per-segment cardinality in bits (>= 1)
    rows: np.ndarray | None = None  # leaf: positions into the raw file
    children: dict | None = None    # internal: next-bit of split segment -> node
    split_seg: int = -1

    @property
    def is_leaf(self) -> bool:
        return self.children is None


def _prefix_intervals(prefix: np.ndarray, bits: np.ndarray, card: int):
    """Value interval of each segment's symbol prefix.

    A prefix ``p`` at ``b`` bits covers full-cardinality symbols
    ``[p << (8-b), (p+1) << (8-b))``; its value interval spans from the
    lower breakpoint of the first to the upper breakpoint of the last.
    """
    lo_tab, hi_tab = sx.symbol_intervals(card)
    shift = _FULL_BITS - bits
    first = prefix << shift
    last = ((prefix + 1) << shift) - 1
    return lo_tab[first], hi_tab[last]


def lb_prefix2(q_paa: np.ndarray, node: ParisNode, seg_lens: np.ndarray, card: int) -> float:
    """LB_SAX between a query PAA and an iSAX node's prefix box."""
    lo, hi = _prefix_intervals(node.prefix, node.bits, card)
    d = np.maximum(np.maximum(lo - q_paa, q_paa - hi), 0.0)
    return float(np.sum(d * d * seg_lens))


class ParisIndex:
    """One partition's ParIS+ index."""

    def __init__(self, root_children: dict, sax_arr: np.ndarray, X: np.ndarray,
                 ids: np.ndarray, cfg: IndexConfig, build_stats: BuildStats):
        self.root_children = root_children    # 16-bit signature tuple -> node
        self.sax = sax_arr                    # (n, w) uint8, original order
        self.X = X
        self.ids = ids
        self.cfg = cfg
        self.build_stats = build_stats
        self.length = X.shape[1]
        self.sax_ends = sx.paa_ends(self.length, cfg.sax_segments)
        self.seg_lens = sg.lens(self.sax_ends).astype(np.float64)

    # ------------------------------------------------------------- build
    @classmethod
    def build(cls, X: np.ndarray, ids: np.ndarray, cfg: IndexConfig) -> "ParisIndex":
        X = np.ascontiguousarray(X, dtype=SERIES_DTYPE)
        ids = np.asarray(ids, dtype=np.int64)
        n = X.shape[0]
        t0 = time.perf_counter()
        stats = BuildStats(n_series=n)
        S = sx.sax(X, cfg.sax_segments, cfg.sax_card)
        w = S.shape[1]
        # Root subtrees keyed by the vector of leading bits. Each subtree
        # is built independently (one thread per subtree in the paper).
        first_bits = (S >> (_FULL_BITS - 1)).astype(np.uint8)
        sigs = [tuple(b) for b in first_bits]
        groups: dict[tuple, list[int]] = {}
        for i, s in enumerate(sigs):
            groups.setdefault(s, []).append(i)
        root_children = {}
        for s, rows in groups.items():
            prefix = np.asarray(s, dtype=np.int64)
            bits = np.ones(w, dtype=np.int64)
            node = ParisNode(prefix, bits, rows=np.asarray(rows, dtype=np.int64))
            _split_recursive(node, S, cfg.paris_leaf_size, stats)
            root_children[s] = node
        stats.n_leaves = _count_leaves(root_children.values())
        stats.build_cpu_s = time.perf_counter() - t0
        stats.lrd_bytes = X.nbytes
        stats.lsd_bytes = S.nbytes
        return cls(root_children, S, X, ids, cfg, stats)

    # ------------------------------------------------------------- query
    def knn(
        self, q: np.ndarray, k: int, *, bsf0: float | None = None,
        phase: str = "full",
    ) -> tuple[list, QueryStats]:
        """``phase``/``bsf0`` implement the distributed two-round
        protocol (see ``HerculesSearcher.knn``)."""
        q = np.asarray(q, dtype=np.float64).ravel()
        stats = QueryStats(n_series=len(self.X), n_leaves=max(1, self.build_stats.n_leaves))
        res = KnnSet(k, cap2=np.inf if bsf0 is None else float(bsf0) ** 2)
        q_paa = sx.paa(q[None, :], self.cfg.sax_segments)[0]
        q_sax = sx.sax_from_paa(q_paa, self.cfg.sax_card).astype(np.int64)

        # --- approximate search: descend along the query's iSAX bits.
        t0 = time.perf_counter()
        sig = tuple((q_sax >> (_FULL_BITS - 1)).astype(np.uint8))
        node = self.root_children.get(sig) if phase != "exact" else None
        if node is None and phase != "exact" and self.root_children:
            # No matching subtree: take the one with the smallest LB.
            node = min(
                self.root_children.values(),
                key=lambda c: lb_prefix2(q_paa, c, self.seg_lens, self.cfg.sax_card),
            )
            stats.ops_serial += len(self.root_children) * self.cfg.sax_segments
        while node is not None and not node.is_leaf:
            b = int(node.bits[node.split_seg]) + 1  # child cardinality bits
            child_bit = int((q_sax[node.split_seg] >> (_FULL_BITS - b)) & 1)
            node = node.children.get(child_bit) or next(iter(node.children.values()))
        if node is not None:
            rows = np.sort(node.rows)
            self._read_rows(rows, stats)
            d2 = ed2_single(q, self.X[rows])
            stats.ed_calcs += rows.size
            stats.points_touched += rows.size * self.length
            stats.ops_serial += rows.size * self.length  # approx phase: 1 thread
            res.add_block(d2[d2 < res.bsf2], self.ids[rows[d2 < res.bsf2]])
            stats.leaves_visited_approx = 1
        stats.cpu_serial_s += time.perf_counter() - t0
        if phase == "approx":
            stats.path = "approx"
            return res.sorted(), stats

        # --- SIMS: scan the full in-memory summary array with LB_SAX.
        t1 = time.perf_counter()
        lbs = sx.lb_sax2(q_paa, self.sax, self.seg_lens, self.cfg.sax_card)
        stats.lb_sax_calcs += len(self.X)
        # SIMS scans the WHOLE summary array — ParIS+'s linear CPU floor
        # (multi-threaded in the paper).
        stats.ops_parallel += len(self.X) * self.cfg.sax_segments
        bsf2 = res.bsf2
        cand = np.nonzero(lbs < bsf2)[0]
        stats.scl_size = int(cand.size)
        stats.sax_pr = 1.0 - cand.size / max(1, len(self.X))
        stats.eapca_pr = 1.0  # no EAPCA in ParIS+
        stats.cpu_parallel_s += time.perf_counter() - t1

        # --- skip-sequential refinement over the raw file, in position
        # order. Vectorized blocks (the BSF refreshes between blocks)
        # keep the kernels SIMD-shaped, as in the paper's implementation.
        t2 = time.perf_counter()
        BLOCK = 64
        for start in range(0, cand.size, BLOCK):
            rows = cand[start : start + BLOCK]
            rows = rows[lbs[rows] < res.bsf2]
            if rows.size == 0:
                continue
            self._read_rows(rows, stats)
            d2, touched = ed2_early_abandon(q, self.X[rows], res.bsf2)
            stats.points_touched += touched
            stats.ops_parallel += touched
            stats.ed_calcs += rows.size
            mask = d2 < res.bsf2
            res.add_block(d2[mask], self.ids[rows[mask]])
        stats.path = "paris_sims"
        stats.cpu_parallel_s += time.perf_counter() - t2
        return res.sorted(), stats

    def _read_rows(self, rows: np.ndarray, stats: QueryStats) -> None:
        """Count raw-file I/O: one random access per series read.

        ParIS+'s multi-threaded refinement reads scattered positions of
        the original-order raw file concurrently — the paper's Fig. 10/11
        analysis attributes its collapse on hard workloads and large k to
        exactly this per-series random I/O profile."""
        if rows.size == 0:
            return
        stats.seeks += int(rows.size)
        stats.seq_bytes += rows.size * self.length * 4
        stats.series_accessed += int(rows.size)

    # ----------------------------------------------------------- persist
    def save(self, path: str) -> None:
        import os

        os.makedirs(path, exist_ok=True)
        with open(os.path.join(path, "paris.pkl"), "wb") as f:
            pickle.dump(self, f)

    @classmethod
    def load(cls, path: str) -> "ParisIndex":
        import os

        with open(os.path.join(path, "paris.pkl"), "rb") as f:
            return pickle.load(f)


def _split_recursive(node: ParisNode, S: np.ndarray, leaf_size: int, stats: BuildStats) -> None:
    """iSAX2 node splitting: raise the cardinality of the segment with
    the fewest bits (ties: lowest index) until leaves fit."""
    if node.rows.size <= leaf_size:
        return
    seg = int(np.argmin(node.bits))
    if node.bits[seg] >= _FULL_BITS:
        return  # cannot split further: oversized leaf allowed
    b = int(node.bits[seg]) + 1
    next_bit = (S[node.rows, seg].astype(np.int64) >> (_FULL_BITS - b)) & 1
    children = {}
    for bit in (0, 1):
        rows = node.rows[next_bit == bit]
        if rows.size == 0:
            continue
        prefix = node.prefix.copy()
        bits = node.bits.copy()
        prefix[seg] = (prefix[seg] << 1) | bit
        bits[seg] = b
        child = ParisNode(prefix, bits, rows=rows)
        children[bit] = child
    node.children = children
    node.split_seg = seg
    node.rows = None
    stats.n_splits += 1
    for child in children.values():
        _split_recursive(child, S, leaf_size, stats)


def _count_leaves(nodes) -> int:
    cnt = 0
    stack = list(nodes)
    while stack:
        n = stack.pop()
        if n.is_leaf:
            cnt += 1
        else:
            stack.extend(n.children.values())
    return cnt
