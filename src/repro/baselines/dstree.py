"""DSTree* — the optimized DSTree baseline (Wang et al., PVLDB'13).

Shares the EAPCA tree/split machinery with Hercules (that is the
paper's own relationship: Hercules adopts DSTree's segmentation) but
differs in exactly the ways the paper calls out:

* internal-node synopses are maintained **during inserts** (root-to-leaf
  path updates — the synchronization cost the ablation's DSTree*P
  measures), instead of Hercules' leaf-only updates + write-phase pass;
* each leaf's raw data lives in its **own file**, so every leaf visited
  at query time costs one random seek (no LRDFile clustering);
* **no iSAX filter**, no adaptive thresholds: queries run the classic
  single-thread priority-queue exact search with LB_EAPCA only.
"""
from __future__ import annotations

import heapq
import pickle
import time
from itertools import count

import numpy as np

from repro.core.config import IndexConfig
from repro.core.eapca import lb_eapca2
from repro.core.hercules_query import KnnSet
from repro.core.metrics import BuildStats, QueryStats
from repro.core.series import SERIES_DTYPE, PrefixStats, ed2_early_abandon
from repro.core.tree import HerculesTree, Node


class DSTreeIndex:
    """One partition's DSTree* index."""

    def __init__(self, tree: HerculesTree, X: np.ndarray, ids: np.ndarray,
                 cfg: IndexConfig, build_stats: BuildStats):
        self.tree = tree
        self.X = X
        self.ids = ids
        self.cfg = cfg
        self.build_stats = build_stats
        self.length = X.shape[1]
        self.leaves = tree.leaves_inorder()

    @classmethod
    def build(cls, X: np.ndarray, ids: np.ndarray, cfg: IndexConfig) -> "DSTreeIndex":
        X = np.ascontiguousarray(X, dtype=SERIES_DTYPE)
        ids = np.asarray(ids, dtype=np.int64)
        n, length = X.shape
        t0 = time.perf_counter()
        ps = PrefixStats(X)
        tree = HerculesTree(length, cfg, update_path_synopses=True)
        for start in range(0, n, cfg.db_size):
            tree.stats.barrier_entries += 1
            for row in range(start, min(start + cfg.db_size, n)):
                tree.insert(row, ps)
        stats = tree.stats
        stats.build_cpu_s = time.perf_counter() - t0
        # "Index writing" for DSTree is just materializing the leaf files.
        t1 = time.perf_counter()
        stats.n_series = n
        stats.n_leaves = sum(1 for _ in tree.leaves_inorder())
        stats.n_internal = stats.n_leaves - 1
        stats.lrd_bytes = X.nbytes
        stats.write_cpu_s = time.perf_counter() - t1
        return cls(tree, X, ids, cfg, stats)

    # ------------------------------------------------------------- query
    def _lb(self, qps: PrefixStats, node: Node, stats: QueryStats) -> float:
        mu, sd = qps.seg_stats_multi(node.ends)
        stats.lb_eapca_calcs += 1
        stats.ops_serial += 2 * len(node.ends)
        return lb_eapca2(mu[0], sd[0], node.ends, node.syn)

    def _visit_leaf(self, q: np.ndarray, leaf: Node, res: KnnSet, stats: QueryStats):
        """ED over a leaf's file: one random seek + a sequential read of
        that leaf file (DSTree's leaf-per-file layout)."""
        rows = np.asarray(leaf.series, dtype=np.int64)
        stats.seeks += 1
        stats.seq_bytes += rows.size * self.length * 4
        stats.series_accessed += rows.size
        d2, touched = ed2_early_abandon(q, self.X[rows], res.bsf2)
        stats.points_touched += touched
        stats.ops_serial += touched  # DSTree* queries are single-threaded
        stats.ed_calcs += rows.size
        mask = d2 < res.bsf2
        res.add_block(d2[mask], self.ids[rows[mask]])

    def knn(
        self, q: np.ndarray, k: int, *, bsf0: float | None = None,
        phase: str = "full",
    ) -> tuple[list, QueryStats]:
        """Classic exact DSTree search: approximate descent to the
        query's home leaf, then best-first priority-queue traversal with
        LB_EAPCA pruning. Entirely single-threaded in the paper.

        ``phase``/``bsf0`` implement the distributed two-round protocol
        (see :meth:`HerculesSearcher.knn`).
        """
        q = np.asarray(q, dtype=np.float64).ravel()
        stats = QueryStats(n_leaves=len(self.leaves), n_series=len(self.X))
        res = KnnSet(k, cap2=np.inf if bsf0 is None else float(bsf0) ** 2)
        qps = PrefixStats(q)
        t0 = time.perf_counter()

        home = None
        if phase != "exact":
            # Approximate phase: route to the home leaf for an initial BSF.
            node = self.tree.root
            while not node.is_leaf:
                p = node.policy
                ln = p.route_end - p.route_start
                s = qps.cs[0, p.route_end] - qps.cs[0, p.route_start]
                mu = s / ln
                if p.stat == "mean":
                    v = mu
                else:
                    s2 = qps.cs2[0, p.route_end] - qps.cs2[0, p.route_start]
                    v = float(np.sqrt(max(s2 / ln - mu * mu, 0.0)))
                node = node.left if v < p.threshold else node.right
            home = node
            self._visit_leaf(q, home, res, stats)
            stats.leaves_visited_approx = 1
        if phase == "approx":
            stats.path = "approx"
            stats.cpu_serial_s = time.perf_counter() - t0
            return res.sorted(), stats

        # Exact phase: best-first with LB_EAPCA.
        tick = count()
        pq = [(self._lb(qps, self.tree.root, stats), next(tick), self.tree.root)]
        visited_leaves = 1 if home is not None else 0
        while pq:
            lb, _, node = heapq.heappop(pq)
            if lb > res.bsf2:
                break
            if node.is_leaf:
                if node is home:
                    continue
                self._visit_leaf(q, node, res, stats)
                visited_leaves += 1
            else:
                for child in (node.left, node.right):
                    clb = self._lb(qps, child, stats)
                    if clb < res.bsf2:
                        heapq.heappush(pq, (clb, next(tick), child))
        stats.lcl_size = visited_leaves
        stats.eapca_pr = 1.0 - visited_leaves / max(1, len(self.leaves))
        stats.sax_pr = 1.0  # no SAX filter
        stats.path = "dstree"
        stats.cpu_serial_s = time.perf_counter() - t0
        return res.sorted(), stats

    # ----------------------------------------------------------- persist
    def save(self, path: str) -> None:
        import os

        os.makedirs(path, exist_ok=True)
        leaf_rows = [np.asarray(l.series, dtype=np.int64) for l in self.leaves]
        with open(os.path.join(path, "dstree.pkl"), "wb") as f:
            pickle.dump(
                {
                    "tree": self.tree.to_state(),
                    "cfg": self.cfg.to_json(),
                    "X": self.X,
                    "ids": self.ids,
                    "leaf_rows": leaf_rows,
                    "stats": self.build_stats.to_dict(),
                },
                f,
            )

    @classmethod
    def load(cls, path: str) -> "DSTreeIndex":
        import os

        with open(os.path.join(path, "dstree.pkl"), "rb") as f:
            d = pickle.load(f)
        cfg = IndexConfig.from_json(d["cfg"])
        tree = HerculesTree.from_state(d["tree"], cfg)
        # Reattach leaf membership (serialization drops series lists).
        for leaf, rows in zip(tree.leaves_inorder(), d["leaf_rows"]):
            leaf.series = list(rows)
        return cls(tree, d["X"], d["ids"], cfg, BuildStats(**d["stats"]))
