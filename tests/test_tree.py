"""Unit tests for the Hercules EAPCA tree: inserts, splits, routing."""
import numpy as np
import pytest

from repro.core import segmentation as sg
from repro.core.config import IndexConfig
from repro.core.series import PrefixStats
from repro.core.tree import HerculesTree
from repro.workloads.generators import random_walk


def build_tree(n=300, length=32, leaf_size=20, seed=0, **kw):
    X = random_walk(n, length, seed)
    ps = PrefixStats(X)
    cfg = IndexConfig(leaf_size=leaf_size, init_segments=kw.pop("init_segments", 1),
                      max_segments=kw.pop("max_segments", 8))
    tree = HerculesTree(length, cfg, **kw)
    for i in range(n):
        tree.insert(i, ps)
    return tree, X, ps


class TestInsertAndSplit:
    def test_all_series_in_leaves(self):
        tree, X, _ = build_tree()
        rows = []
        for leaf in tree.leaves_inorder():
            rows.extend(leaf.series)
        assert sorted(rows) == list(range(len(X)))

    def test_leaf_capacity_respected(self):
        tree, _, _ = build_tree()
        for leaf in tree.leaves_inorder():
            assert 0 < len(leaf.series) < tree.cfg.leaf_size

    def test_tree_splits_happened(self):
        tree, _, _ = build_tree()
        assert tree.stats.n_splits >= 1
        assert not tree.root.is_leaf

    def test_sizes_consistent(self):
        tree, X, _ = build_tree()
        for node in tree.nodes_postorder():
            if node.is_leaf:
                assert node.size == len(node.series)
            else:
                assert node.size == node.left.size + node.right.size
        assert tree.root.size == len(X)

    def test_routing_consistent_with_membership(self):
        """Every series re-routes to the leaf that contains it."""
        tree, X, ps = build_tree()
        member = {}
        for leaf in tree.leaves_inorder():
            for r in leaf.series:
                member[r] = leaf.node_id
        for r in range(len(X)):
            assert tree.route_to_leaf(r, ps, count=False).node_id == member[r]

    def test_leaf_synopsis_bounds_members(self):
        tree, _, ps = build_tree()
        for leaf in tree.leaves_inorder():
            rows = np.asarray(leaf.series)
            mu, sd = ps.seg_stats_multi(leaf.ends, rows)
            for i in range(len(rows)):
                assert leaf.syn.contains(mu[i], sd[i])

    def test_vsplits_refine_segmentation(self):
        tree, _, _ = build_tree()
        for node in tree.nodes_preorder():
            if not node.is_leaf:
                child = node.left
                assert sg.is_refinement(child.ends, node.ends)
                assert child.ends[-1] == tree.length
                if node.policy.kind == "V":
                    assert len(child.ends) == len(node.ends) + 1
                else:
                    assert len(child.ends) == len(node.ends)

    def test_max_segments_cap(self):
        tree, _, _ = build_tree(max_segments=4)
        for node in tree.nodes_preorder():
            assert len(node.ends) <= 4

    def test_children_nonempty(self):
        tree, _, _ = build_tree()
        for node in tree.nodes_preorder():
            if not node.is_leaf:
                assert node.left.size > 0
                assert node.right.size > 0

    def test_znormed_data_forces_vsplit_first(self):
        """With one initial segment, z-normed series have mu=0, sd=1 —
        only a V-split can separate them."""
        tree, _, _ = build_tree(n=50, leaf_size=20)
        assert tree.root.policy.kind == "V"

    def test_identical_series_fallback(self):
        """Degenerate all-identical data still splits without looping."""
        X = np.tile(random_walk(1, 16, 3), (30, 1))
        ps = PrefixStats(X)
        cfg = IndexConfig(leaf_size=10, init_segments=2)
        tree = HerculesTree(16, cfg)
        for i in range(30):
            tree.insert(i, ps)
        assert sum(len(l.series) for l in tree.leaves_inorder()) == 30


class TestPathSynopses:
    def test_dstree_variant_counts_more_locks(self):
        t_leaf, _, _ = build_tree(update_path_synopses=False)
        t_path, _, _ = build_tree(update_path_synopses=True)
        assert t_path.stats.lock_acquisitions > t_leaf.stats.lock_acquisitions
        assert t_path.stats.synopsis_updates > t_leaf.stats.synopsis_updates


class TestTraversal:
    def test_inorder_leaves_left_to_right(self):
        tree, _, _ = build_tree()
        leaves = tree.leaves_inorder()
        # leftmost leaf is reachable by all-left descent
        node = tree.root
        while not node.is_leaf:
            node = node.left
        assert leaves[0] is node

    def test_postorder_children_before_parents(self):
        tree, _, _ = build_tree()
        seen = set()
        for node in tree.nodes_postorder():
            if not node.is_leaf:
                assert node.left.node_id in seen
                assert node.right.node_id in seen
            seen.add(node.node_id)

    def test_preorder_count_matches(self):
        tree, _, _ = build_tree()
        pre = list(tree.nodes_preorder())
        post = list(tree.nodes_postorder())
        assert len(pre) == len(post)
        assert {n.node_id for n in pre} == {n.node_id for n in post}


class TestSerialization:
    def test_roundtrip_preserves_structure(self):
        tree, _, _ = build_tree(n=150, leaf_size=15)
        cfg = tree.cfg
        state = tree.to_state()
        tree2 = HerculesTree.from_state(state, cfg)
        orig = [(n.node_id, n.is_leaf, n.size, list(n.ends)) for n in tree.nodes_preorder()]
        back = [(n.node_id, n.is_leaf, n.size, list(n.ends)) for n in tree2.nodes_preorder()]
        assert orig == back

    def test_roundtrip_preserves_policies(self):
        tree, _, _ = build_tree(n=150, leaf_size=15)
        tree2 = HerculesTree.from_state(tree.to_state(), tree.cfg)
        for a, b in zip(tree.nodes_preorder(), tree2.nodes_preorder()):
            if a.policy is None:
                assert b.policy is None
            else:
                assert a.policy.kind == b.policy.kind
                assert a.policy.threshold == b.policy.threshold
                assert a.policy.route_start == b.policy.route_start
