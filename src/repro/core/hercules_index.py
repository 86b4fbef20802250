"""Hercules index construction and writing for one partition
(Section 3.3, Algorithms 1-9).

Index *building* inserts series into the EAPCA tree with leaf-only
synopsis updates, processing the input in DBuffer-sized batches and
accounting HBuffer occupancy / flush events exactly as the
coordinator + InsertWorker + FlushCoordinator protocol would schedule
them (one Python worker per Spark partition executes the schedule the
multi-threaded protocol produces; synchronization operations are
counted for the ablation cost model — see DESIGN.md §4).

Index *writing* materializes:
  * ``LRDFile`` — raw series, leaves contiguous in inorder order;
  * ``LSDFile`` — iSAX summaries in the same order;
  * the tree with internal-node synopses computed bottom-up
    (HSplitSynopsis for horizontally-split segments, raw-data passes for
    vertically-split segments, Algorithms 8-9).

Build variants (for the Figure 12a ablation):
  * ``hercules``     — leaf-only updates, parallel index writing;
  * ``nowpara``      — leaf-only updates, *serial* index writing (the
                       difference shows up in the cost model's
                       ``write_parallel_cpu_s`` accounting);
  * ``dstree_path``  — DSTree*/DSTree*P behaviour: synopses of the whole
                       root-to-leaf path updated at every insert (real
                       extra CPU, one lock per path node).
"""
from __future__ import annotations

import json
import os
import pickle
import time
from dataclasses import dataclass

import numpy as np

from . import sax as sx
from . import segmentation as sg
from .config import IndexConfig
from .eapca import Synopsis
from .metrics import BuildStats
from .series import SERIES_DTYPE, PrefixStats
from .tree import HerculesTree, Node

SERIES_BYTES_PER_POINT = 4  # float32, as in the paper (single precision)


@dataclass
class _FlushState:
    """HBuffer occupancy accounting for the flush protocol (Alg.3/4)."""

    region_bytes: int
    flush_at_full_regions: int
    occupancy: int = 0
    full_regions: int = 0

    def add(self, nbytes: int) -> bool:
        """Account an insert; returns True when a flush must happen."""
        self.occupancy += nbytes
        self.full_regions = self.occupancy // max(1, self.region_bytes)
        return self.full_regions >= self.flush_at_full_regions

    def reset(self) -> int:
        """Flush: returns bytes written, clears occupancy."""
        n, self.occupancy, self.full_regions = self.occupancy, 0, 0
        return n


class HerculesPartitionIndex:
    """One partition's materialized Hercules index.

    Attributes
    ----------
    tree : HerculesTree
        Index tree with leaf ``file_start``/``file_count`` set and
        internal synopses populated (after writing).
    lrd : np.ndarray (n, length) float32
        LRDFile contents (leaf-clustered raw series).
    lsd : np.ndarray (n, w) uint8
        LSDFile contents (iSAX summaries, same order as ``lrd``).
    orig_ids : np.ndarray (n,) int64
        Original series id at each LRDFile position.
    """

    def __init__(
        self,
        tree: HerculesTree,
        lrd: np.ndarray,
        lsd: np.ndarray,
        orig_ids: np.ndarray,
        cfg: IndexConfig,
        build_stats: BuildStats,
    ):
        self.tree = tree
        self.lrd = lrd
        self.lsd = lsd
        self.orig_ids = orig_ids
        self.cfg = cfg
        self.build_stats = build_stats
        self.length = lrd.shape[1]
        self.sax_ends = sx.paa_ends(self.length, cfg.sax_segments)
        self.sax_lens = sg.lens(self.sax_ends)
        self.leaves = tree.leaves_inorder()

    # ------------------------------------------------------------- build
    @classmethod
    def build(
        cls,
        X: np.ndarray,
        ids: np.ndarray,
        cfg: IndexConfig,
        *,
        variant: str = "hercules",
    ) -> "HerculesPartitionIndex":
        """Build + write the index over series matrix ``X`` (n, length)."""
        if variant not in ("hercules", "nowpara", "dstree_path"):
            raise ValueError(f"unknown build variant: {variant}")
        X = np.ascontiguousarray(X, dtype=SERIES_DTYPE)
        ids = np.asarray(ids, dtype=np.int64)
        n, length = X.shape

        t0 = time.perf_counter()
        ps = PrefixStats(X)
        tree = HerculesTree(
            length, cfg, update_path_synopses=(variant == "dstree_path")
        )
        stats = tree.stats
        series_bytes = length * SERIES_BYTES_PER_POINT
        flush = _FlushState(
            region_bytes=max(series_bytes, cfg.hbuffer_bytes // max(1, cfg.num_insert_workers)),
            flush_at_full_regions=cfg.flush_threshold,
        )

        # Coordinator/DBuffer schedule (Alg.1/2): batches of db_size.
        touched: set[int] = set()
        for start in range(0, n, cfg.db_size):
            stats.barrier_entries += 1  # DBarrier per DBuffer half
            for row in range(start, min(start + cfg.db_size, n)):
                leaf = tree.insert(row, ps)
                touched.add(leaf.node_id)
                if flush.add(series_bytes):
                    # Flush phase (Alg.3/4): HBuffer to disk, SBuffers reset.
                    stats.n_flushes += 1
                    stats.flushed_bytes += flush.reset()
                    stats.barrier_entries += 2  # ContinueBarrier + FlushBarrier
                    for node in tree.leaves_inorder():
                        node.flushed_count += node.sbuffer_len
                        node.sbuffer_len = 0
        stats.build_cpu_s = time.perf_counter() - t0
        stats.n_series = n

        # Index writing (Alg.6-9).
        t1 = time.perf_counter()
        leaves = tree.leaves_inorder()
        order = np.concatenate(
            [np.asarray(leaf.series, dtype=np.int64) for leaf in leaves]
        ) if leaves and leaves[0].series is not None else np.arange(n)
        lrd = np.ascontiguousarray(X[order])
        orig_ids = ids[order]
        pos = 0
        for leaf in leaves:
            leaf.file_start = pos
            leaf.file_count = len(leaf.series)
            pos += leaf.file_count
            leaf.series = None  # raw rows now live in LRDFile order

        # iSAX summaries of all series, LRDFile order (WriteIndexWorker).
        t_par0 = time.perf_counter()
        lsd = sx.sax(lrd, cfg.sax_segments, cfg.sax_card)
        _update_internal_synopses(tree, lrd, stats)
        write_parallel = time.perf_counter() - t_par0

        stats.write_cpu_s = time.perf_counter() - t1
        stats.write_parallel_cpu_s = write_parallel
        stats.n_leaves = len(leaves)
        stats.n_internal = sum(1 for nd in tree.nodes_preorder() if not nd.is_leaf)
        stats.lrd_bytes = lrd.nbytes
        stats.lsd_bytes = lsd.nbytes
        return cls(tree, lrd, lsd, orig_ids, cfg, stats)

    # ----------------------------------------------------------- persist
    def save(self, path: str) -> None:
        """Materialize HTree / LRDFile / LSDFile under ``path``."""
        os.makedirs(path, exist_ok=True)
        self.lrd.tofile(os.path.join(path, "lrd.bin"))
        self.lsd.tofile(os.path.join(path, "lsd.bin"))
        with open(os.path.join(path, "tree.pkl"), "wb") as f:
            pickle.dump(self.tree.to_state(), f)
        meta = {
            "n": int(self.lrd.shape[0]),
            "length": int(self.lrd.shape[1]),
            "sax_segments": int(self.lsd.shape[1]),
            "cfg": self.cfg.to_json(),
            "orig_ids": self.orig_ids.tolist(),
            "build_stats": self.build_stats.to_dict(),
        }
        with open(os.path.join(path, "meta.json"), "w") as f:
            json.dump(meta, f)

    @classmethod
    def load(cls, path: str) -> "HerculesPartitionIndex":
        with open(os.path.join(path, "meta.json")) as f:
            meta = json.load(f)
        cfg = IndexConfig.from_json(meta["cfg"])
        n, length = meta["n"], meta["length"]
        lrd = np.fromfile(os.path.join(path, "lrd.bin"), dtype=SERIES_DTYPE).reshape(
            n, length
        )
        lsd = np.fromfile(os.path.join(path, "lsd.bin"), dtype=np.uint8).reshape(
            n, meta["sax_segments"]
        )
        with open(os.path.join(path, "tree.pkl"), "rb") as f:
            tree = HerculesTree.from_state(pickle.load(f), cfg)
        bs = BuildStats(**meta["build_stats"])
        return cls(tree, lrd, lsd, np.asarray(meta["orig_ids"], dtype=np.int64), cfg, bs)


def _update_internal_synopses(
    tree: HerculesTree, lrd: np.ndarray, stats: BuildStats
) -> None:
    """Bottom-up internal-synopsis computation (Algorithms 8-9).

    Postorder over internal nodes: for segments present identically in
    both children, merge the children's synopses (HSplitSynopsis); for a
    vertically-split segment (absent from the children's finer
    segmentation as a single piece), compute min/max mean/std from the
    node's raw series — vectorized over the node's contiguous LRDFile
    range, which is the batch form of VSplitSynopsis' per-series pass.
    """
    ps: PrefixStats | None = None
    for node in tree.nodes_postorder():
        if node.is_leaf:
            continue
        # Subtree LRDFile range: leaves are contiguous under each node.
        lo = _leftmost_leaf(node).file_start
        hi_leaf = _rightmost_leaf(node)
        hi = hi_leaf.file_start + hi_leaf.file_count
        node.file_start, node.file_count = lo, hi - lo

        child_ends = node.left.ends
        merged = node.left.syn.merge(node.right.syn)
        if node.policy.kind == "H":
            node.syn = merged
            stats.synopsis_updates += 1
            continue
        # V-split: all segments except the split one map 1:1 to child
        # segments (split segment index s maps to child segments s, s+1).
        s = node.policy.seg
        m = len(node.ends)
        keep = np.concatenate((np.arange(s), np.arange(s + 1, m)))
        child_keep = np.concatenate((np.arange(s), np.arange(s + 2, m + 1)))
        syn = Synopsis.empty(m)
        for arr, carr in (
            (syn.mu_min, merged.mu_min), (syn.mu_max, merged.mu_max),
            (syn.sd_min, merged.sd_min), (syn.sd_max, merged.sd_max),
        ):
            arr[keep] = carr[child_keep]
        if ps is None:
            ps = PrefixStats(lrd)
        a = 0 if s == 0 else int(node.ends[s - 1])
        b = int(node.ends[s])
        rows = np.arange(lo, hi)
        mu, sd = ps.seg_mean_std(a, b, rows)
        syn.mu_min[s], syn.mu_max[s] = mu.min(), mu.max()
        syn.sd_min[s], syn.sd_max[s] = sd.min(), sd.max()
        node.syn = syn
        stats.synopsis_updates += 1


def _leftmost_leaf(node: Node) -> Node:
    while not node.is_leaf:
        node = node.left
    return node


def _rightmost_leaf(node: Node) -> Node:
    while not node.is_leaf:
        node = node.right
    return node
