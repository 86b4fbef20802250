"""Tests for index construction + writing: LRDFile/LSDFile layout,
internal synopses, flush accounting, build variants, persistence."""
import numpy as np
import pytest

from repro.core import sax as sx
from repro.core.config import IndexConfig
from repro.core.eapca import Synopsis
from repro.core.hercules_index import HerculesPartitionIndex
from repro.core.series import PrefixStats
from repro.workloads.generators import random_walk


def build(n=400, length=32, leaf_size=25, seed=0, variant="hercules", **cfg_kw):
    X = random_walk(n, length, seed)
    cfg = IndexConfig(leaf_size=leaf_size, max_segments=8, sax_segments=8,
                      db_size=64, **cfg_kw)
    ids = np.arange(1000, 1000 + n)
    return HerculesPartitionIndex.build(X, ids, cfg, variant=variant), X, ids


class TestLayout:
    def test_lrd_contains_all_series(self):
        idx, X, ids = build()
        assert idx.lrd.shape == X.shape
        # Every original series appears exactly once in LRDFile.
        assert sorted(idx.orig_ids.tolist()) == sorted(ids.tolist())

    def test_lrd_rows_match_originals(self):
        idx, X, ids = build()
        id_to_row = {i: r for r, i in enumerate(ids)}
        for pos in range(0, len(ids), 37):
            orig = X[id_to_row[idx.orig_ids[pos]]]
            assert np.array_equal(idx.lrd[pos], orig)

    def test_leaves_contiguous_inorder(self):
        idx, _, _ = build()
        pos = 0
        for leaf in idx.leaves:
            assert leaf.file_start == pos
            assert leaf.file_count > 0
            pos += leaf.file_count
        assert pos == idx.lrd.shape[0]

    def test_lsd_matches_sax_of_lrd(self):
        idx, _, _ = build()
        expect = sx.sax(idx.lrd, idx.cfg.sax_segments, idx.cfg.sax_card)
        assert np.array_equal(idx.lsd, expect)

    def test_internal_file_ranges_cover_children(self):
        idx, _, _ = build()
        for node in idx.tree.nodes_preorder():
            if not node.is_leaf:
                assert node.file_start == node.left.file_start
                end = node.right.file_start + node.right.file_count
                assert node.file_start + node.file_count == end


class TestInternalSynopses:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_every_node_synopsis_bounds_subtree(self, seed):
        """After index writing, every node's synopsis (under its own
        segmentation) must contain every series of its subtree — the
        invariant that makes LB_EAPCA admissible at internal nodes."""
        idx, _, _ = build(seed=seed)
        ps = PrefixStats(idx.lrd)
        for node in idx.tree.nodes_preorder():
            rows = np.arange(node.file_start, node.file_start + node.file_count)
            mu, sd = ps.seg_stats_multi(node.ends, rows)
            for i in range(len(rows)):
                assert node.syn.contains(mu[i], sd[i], tol=1e-5), (
                    f"node {node.node_id} does not bound its series"
                )

    def test_internal_synopsis_is_tight(self):
        """Synopsis equals the exact min/max over the subtree (not just a
        superset) — HSplitSynopsis/VSplitSynopsis compute exact values."""
        idx, _, _ = build(n=200, leaf_size=20)
        ps = PrefixStats(idx.lrd)
        for node in idx.tree.nodes_preorder():
            if node.is_leaf:
                continue
            rows = np.arange(node.file_start, node.file_start + node.file_count)
            mu, sd = ps.seg_stats_multi(node.ends, rows)
            exact = Synopsis(mu.min(0), mu.max(0), sd.min(0), sd.max(0))
            assert np.allclose(node.syn.mu_min, exact.mu_min, atol=1e-5)
            assert np.allclose(node.syn.mu_max, exact.mu_max, atol=1e-5)
            assert np.allclose(node.syn.sd_min, exact.sd_min, atol=1e-5)
            assert np.allclose(node.syn.sd_max, exact.sd_max, atol=1e-5)


class TestBuildAccounting:
    def test_build_stats_populated(self):
        idx, X, _ = build()
        bs = idx.build_stats
        assert bs.n_series == len(X)
        assert bs.n_leaves == len(idx.leaves)
        assert bs.n_internal == bs.n_leaves - 1  # binary tree
        assert bs.build_cpu_s > 0
        assert bs.write_cpu_s > 0
        assert bs.lrd_bytes == idx.lrd.nbytes

    def test_flushes_triggered_by_small_hbuffer(self):
        # HBuffer sized to ~20 series across 4 regions, flush at 2 full
        # regions -> many flush events on 400 series.
        idx, _, _ = build(hbuffer_bytes=20 * 32 * 4, num_insert_workers=4,
                          flush_threshold=2)
        assert idx.build_stats.n_flushes > 0
        assert idx.build_stats.flushed_bytes > 0
        # Some splits touched flushed leaves and re-read from disk.
        assert idx.build_stats.split_disk_reads >= 0

    def test_no_flushes_with_big_hbuffer(self):
        idx, _, _ = build(hbuffer_bytes=1 << 30)
        assert idx.build_stats.n_flushes == 0

    def test_dbuffer_barriers_counted(self):
        idx, X, _ = build()
        assert idx.build_stats.barrier_entries >= len(X) // idx.cfg.db_size

    def test_dstree_path_variant_does_more_work(self):
        h, _, _ = build(variant="hercules")
        d, _, _ = build(variant="dstree_path")
        assert d.build_stats.synopsis_updates > h.build_stats.synopsis_updates
        assert d.build_stats.lock_acquisitions > h.build_stats.lock_acquisitions

    def test_unknown_variant_rejected(self):
        with pytest.raises(ValueError):
            build(variant="bogus")


class TestPersistence:
    def test_save_load_roundtrip(self, tmp_path):
        idx, _, _ = build(n=200, leaf_size=20)
        d = str(tmp_path / "part0")
        idx.save(d)
        idx2 = HerculesPartitionIndex.load(d)
        assert np.array_equal(idx.lrd, idx2.lrd)
        assert np.array_equal(idx.lsd, idx2.lsd)
        assert np.array_equal(idx.orig_ids, idx2.orig_ids)
        assert len(idx2.leaves) == len(idx.leaves)
        for a, b in zip(idx.leaves, idx2.leaves):
            assert a.file_start == b.file_start
            assert a.file_count == b.file_count
            assert np.allclose(a.syn.mu_min, b.syn.mu_min)

    def test_loaded_index_answers_queries(self, tmp_path):
        from repro.baselines.bruteforce import knn as bf_knn
        from repro.core.hercules_query import HerculesSearcher

        idx, X, ids = build(n=200, leaf_size=20)
        d = str(tmp_path / "part0")
        idx.save(d)
        idx2 = HerculesPartitionIndex.load(d)
        q = random_walk(1, 32, seed=99)[0]
        got, _ = HerculesSearcher(idx2).knn(q, 5)
        want = bf_knn(q, X, ids, 5)
        assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)
