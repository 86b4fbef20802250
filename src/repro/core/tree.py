"""The Hercules index tree: an unbalanced binary EAPCA tree with
data-adaptive H-splits and V-splits (Section 3.2, Figure 2).

The same tree structure backs the DSTree* baseline (which shares the
EAPCA segmentation and split heuristic but not the iSAX filter, the
LRDFile layout, or the adaptive query pipeline).

Nodes are stored with parent/child references; (de)serialization is
iterative (preorder record list) so deep unbalanced trees never hit the
interpreter recursion limit.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator, Optional

import numpy as np

from . import segmentation as sg
from .config import IndexConfig
from .eapca import Synopsis, qos
from .metrics import BuildStats
from .series import PrefixStats


@dataclass
class SplitPolicy:
    """How an internal node routes series to its children.

    ``kind`` is ``'H'`` or ``'V'``. Routing compares the series'
    ``stat`` ('mean' | 'std') over the absolute range
    ``[route_start, route_end)`` against ``threshold``: strictly smaller
    goes left. For a V-split, ``vpoint`` is the new boundary inserted in
    segment ``seg`` and the H-split is applied to the ``vside`` ('L'|'R')
    sub-segment; children adopt the refined segmentation.
    """

    kind: str
    seg: int
    stat: str
    threshold: float
    route_start: int
    route_end: int
    vpoint: Optional[int] = None
    vside: Optional[str] = None


class Node:
    """A Hercules tree node (leaf or internal)."""

    __slots__ = (
        "node_id", "ends", "syn", "is_leaf", "left", "right", "parent",
        "policy", "series", "size", "file_start", "file_count",
        "flushed_count", "sbuffer_len",
    )

    def __init__(self, node_id: int, ends: np.ndarray):
        self.node_id = node_id
        self.ends = ends
        self.syn: Optional[Synopsis] = Synopsis.empty(len(ends))
        self.is_leaf = True
        self.left: Optional[Node] = None
        self.right: Optional[Node] = None
        self.parent: Optional[Node] = None
        self.policy: Optional[SplitPolicy] = None
        self.series: Optional[list[int]] = []   # leaf: row indices into X
        self.size = 0                            # series in subtree
        self.file_start = -1                     # position in LRDFile (leaf)
        self.file_count = 0
        self.flushed_count = 0                   # leaf series already flushed
        self.sbuffer_len = 0                     # in-memory (SBuffer) series

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        tag = "leaf" if self.is_leaf else "internal"
        return f"<Node {self.node_id} {tag} size={self.size} m={len(self.ends)}>"


def _route_stat(ps: PrefixStats, row: int, a: int, b: int, stat: str) -> float:
    """Scalar mean or std of one series over ``[a, b)`` (O(1))."""
    ln = b - a
    s = ps.cs[row, b] - ps.cs[row, a]
    mu = s / ln
    if stat == "mean":
        return mu
    s2 = ps.cs2[row, b] - ps.cs2[row, a]
    return float(np.sqrt(max(s2 / ln - mu * mu, 0.0)))


class HerculesTree:
    """Unbalanced binary EAPCA tree with leaf-only synopsis maintenance.

    ``update_path_synopses=True`` reproduces the DSTree*/DSTree*P
    behaviour used by the ablation study: every insert also folds the
    series' stats into every internal node on the root-to-leaf path
    (extra CPU + one lock per path node instead of one per leaf).
    """

    def __init__(self, length: int, cfg: IndexConfig, *, update_path_synopses: bool = False):
        self.length = length
        self.cfg = cfg
        self.update_path_synopses = update_path_synopses
        self._next_id = 0
        self.root = self._new_node(sg.initial(length, cfg.init_segments))
        self.stats = BuildStats()

    # ------------------------------------------------------------- build
    def _new_node(self, ends: np.ndarray) -> Node:
        n = Node(self._next_id, ends)
        self._next_id += 1
        return n

    def route_to_leaf(self, row: int, ps: PrefixStats, *, count: bool = True) -> Node:
        """Descend from the root using split policies (RouteToLeaf)."""
        node = self.root
        while not node.is_leaf:
            p = node.policy
            v = _route_stat(ps, row, p.route_start, p.route_end, p.stat)
            node = node.left if v < p.threshold else node.right
            if count:
                self.stats.insert_node_visits += 1
        return node

    def insert(self, row: int, ps: PrefixStats) -> Node:
        """InsertSeriesToNode (Algorithm 5) for one series row.

        Returns the leaf that received the series (post-split leaf).
        """
        node = self.root
        while not node.is_leaf:
            p = node.policy
            v = _route_stat(ps, row, p.route_start, p.route_end, p.stat)
            if self.update_path_synopses:
                mu, sd = ps.seg_stats_multi(node.ends, np.array([row]))
                node.syn.update(mu[0], sd[0])
                self.stats.synopsis_updates += 1
                self.stats.lock_acquisitions += 1
            node.size += 1
            node = node.left if v < p.threshold else node.right
            self.stats.insert_node_visits += 1
        # leaf: lock, update synopsis, append (Alg.5 lines 2-8)
        self.stats.lock_acquisitions += 1
        mu, sd = ps.seg_stats_multi(node.ends, np.array([row]))
        node.syn.update(mu[0], sd[0])
        self.stats.synopsis_updates += 1
        node.series.append(row)
        node.size += 1
        node.sbuffer_len += 1
        if len(node.series) >= self.cfg.leaf_size:
            self._split(node, ps)
        return node

    # ------------------------------------------------------------- split
    def _split(self, node: Node, ps: PrefixStats) -> None:
        """Split a full leaf per getBestSplitPolicy (Alg.5 lines 9-14)."""
        rows = np.asarray(node.series, dtype=np.int64)
        policy, child_ends, left_mask = self._best_policy(node, rows, ps)
        self.stats.n_splits += 1
        if policy.kind == "V":
            self.stats.n_vsplits += 1
        if node.flushed_count > 0:
            # Split of a leaf whose data was flushed: the paper re-reads
            # it from disk (Alg.5 line 12) — count the I/O.
            self.stats.split_disk_reads += 1
            self.stats.split_disk_bytes += node.flushed_count * self.length * 4

        left = self._new_node(child_ends)
        right = self._new_node(child_ends)
        lrows, rrows = rows[left_mask], rows[~left_mask]
        for child, crows in ((left, lrows), (right, rrows)):
            child.parent = node
            child.series = list(crows)
            child.size = len(crows)
            child.sbuffer_len = len(crows)
            child.syn = Synopsis.from_stats(ps, child_ends, crows)
            self.stats.synopsis_updates += len(crows)
        node.left, node.right = left, right
        node.policy = policy
        node.is_leaf = False
        node.series = None
        node.sbuffer_len = 0
        node.flushed_count = 0

    def _best_policy(
        self, node: Node, rows: np.ndarray, ps: PrefixStats
    ) -> tuple[SplitPolicy, np.ndarray, np.ndarray]:
        """DSTree's split heuristic: among H-splits (mean/std of each
        segment) and V-splits (bisect a segment, H-split one half), pick
        the candidate maximizing the QoS *reduction* — the parent's QoS
        evaluated under the candidate's child segmentation minus the
        size-weighted child QoS (comparing raw child QoS across different
        segmentations would penalize V-splits for merely revealing
        variance the coarse segmentation hides). Candidates are evaluated
        exactly on the node's series (see DESIGN.md §4).
        Returns ``(policy, child_ends, left_mask)``.
        """
        ends = node.ends
        bounds = np.concatenate(([0], ends))
        mu, sd = ps.seg_stats_multi(ends, rows)
        best: tuple[float, SplitPolicy, np.ndarray, np.ndarray] | None = None
        _seg_cache: dict[int, tuple] = {}

        def child_stats(child_ends: np.ndarray, key: int):
            if key not in _seg_cache:
                cmu, csd = ps.seg_stats_multi(child_ends, rows)
                parent_syn = Synopsis(cmu.min(0), cmu.max(0), csd.min(0), csd.max(0))
                _seg_cache[key] = (cmu, csd, qos(child_ends, parent_syn))
            return _seg_cache[key]

        def consider(policy: SplitPolicy, child_ends: np.ndarray, vals: np.ndarray, key: int):
            nonlocal best
            mask = vals < policy.threshold
            nl = int(mask.sum())
            if nl == 0 or nl == len(vals):
                return
            cmu, csd, parent_qos = child_stats(child_ends, key)
            weighted = 0.0
            for m in (mask, ~mask):
                syn = Synopsis(cmu[m].min(0), cmu[m].max(0), csd[m].min(0), csd[m].max(0))
                weighted += m.sum() * qos(child_ends, syn)
            benefit = len(vals) * parent_qos - weighted
            if best is None or benefit > best[0]:
                best = (benefit, policy, child_ends, mask)

        for i in range(len(ends)):
            a, b = int(bounds[i]), int(bounds[i + 1])
            for stat, vals in (("mean", mu[:, i]), ("std", sd[:, i])):
                thr = (vals.min() + vals.max()) / 2.0
                consider(
                    SplitPolicy("H", i, stat, float(thr), a, b),
                    ends, vals, key=-1,
                )
            # V-split candidates: bisect segment i, H-split either half.
            if b - a >= 2 and len(ends) < self.cfg.max_segments:
                p = (a + b) // 2
                child_ends = sg.vsplit(ends, i, p)
                for side, (sa, sb) in (("L", (a, p)), ("R", (p, b))):
                    smu, ssd = ps.seg_mean_std(sa, sb, rows)
                    for stat, vals in (("mean", smu), ("std", ssd)):
                        thr = (vals.min() + vals.max()) / 2.0
                        consider(
                            SplitPolicy("V", i, stat, float(thr), sa, sb, p, side),
                            child_ends, vals, key=i,
                        )

        if best is not None:
            _, policy, child_ends, mask = best
            return policy, child_ends, mask
        # Degenerate fallback (e.g. all-identical series): median split on
        # the first segment's mean; future equal-stat series route right.
        vals = mu[:, 0]
        thr = float(np.median(vals))
        mask = np.zeros(len(rows), dtype=bool)
        mask[: len(rows) // 2] = True
        policy = SplitPolicy("H", 0, "mean", thr, 0, int(ends[0]))
        return policy, ends, mask

    # --------------------------------------------------------- traversal
    def leaves_inorder(self) -> list[Node]:
        """Leaves in inorder-traversal order — the LRDFile layout."""
        out: list[Node] = []
        stack: list[tuple[Node, bool]] = [(self.root, False)]
        while stack:
            node, expanded = stack.pop()
            if node.is_leaf:
                out.append(node)
            elif expanded:
                pass
            else:
                stack.append((node.right, False))
                stack.append((node.left, False))
        return out

    def nodes_postorder(self) -> Iterator[Node]:
        stack: list[tuple[Node, bool]] = [(self.root, False)]
        while stack:
            node, expanded = stack.pop()
            if expanded or node.is_leaf:
                yield node
            else:
                stack.append((node, True))
                stack.append((node.right, False))
                stack.append((node.left, False))

    def nodes_preorder(self) -> Iterator[Node]:
        stack = [self.root]
        while stack:
            node = stack.pop()
            yield node
            if not node.is_leaf:
                stack.append(node.right)
                stack.append(node.left)

    @property
    def n_leaves(self) -> int:
        return sum(1 for _ in self.leaves_inorder())

    # ------------------------------------------------------ serialization
    def to_state(self) -> dict:
        """Iterative preorder serialization (no recursion, plain arrays)."""
        records = []
        for node in self.nodes_preorder():
            p = node.policy
            records.append(
                {
                    "node_id": node.node_id,
                    "ends": node.ends.tolist(),
                    "is_leaf": node.is_leaf,
                    "size": node.size,
                    "file_start": node.file_start,
                    "file_count": node.file_count,
                    "syn": None
                    if node.syn is None
                    else [
                        node.syn.mu_min.tolist(), node.syn.mu_max.tolist(),
                        node.syn.sd_min.tolist(), node.syn.sd_max.tolist(),
                    ],
                    "policy": None
                    if p is None
                    else [p.kind, p.seg, p.stat, p.threshold,
                          p.route_start, p.route_end, p.vpoint, p.vside],
                    "left": None if node.left is None else node.left.node_id,
                    "right": None if node.right is None else node.right.node_id,
                }
            )
        return {"length": self.length, "records": records}

    @classmethod
    def from_state(cls, state: dict, cfg: IndexConfig) -> "HerculesTree":
        tree = cls.__new__(cls)
        tree.length = state["length"]
        tree.cfg = cfg
        tree.update_path_synopses = False
        tree.stats = BuildStats()
        nodes: dict[int, Node] = {}
        for r in state["records"]:
            n = Node(r["node_id"], np.asarray(r["ends"], dtype=np.int64))
            n.is_leaf = r["is_leaf"]
            n.size = r["size"]
            n.file_start = r["file_start"]
            n.file_count = r["file_count"]
            n.series = None
            if r["syn"] is not None:
                a, b, c, d = (np.asarray(x) for x in r["syn"])
                n.syn = Synopsis(a, b, c, d)
            if r["policy"] is not None:
                n.policy = SplitPolicy(*r["policy"])
            nodes[n.node_id] = n
        for r in state["records"]:
            n = nodes[r["node_id"]]
            if r["left"] is not None:
                n.left = nodes[r["left"]]
                n.left.parent = n
            if r["right"] is not None:
                n.right = nodes[r["right"]]
                n.right.parent = n
        tree.root = state["records"][0]["node_id"]
        tree.root = nodes[tree.root]
        tree._next_id = 1 + max(nodes)
        return tree
