"""Baseline correctness: DSTree*, ParIS+, VA+file, PSCAN all return
exact k-NN answers matching brute force, and their counters behave as
the paper describes (pruning, I/O profiles)."""
import numpy as np
import pytest

from repro.baselines.bruteforce import knn as bf_knn
from repro.baselines.dstree import DSTreeIndex
from repro.baselines.paris import ParisIndex, lb_prefix2, _prefix_intervals
from repro.baselines.pscan import PscanIndex
from repro.baselines.vafile import VAFileIndex, allocate_bits, dft_basis
from repro.core.config import IndexConfig
from repro.core.series import ed2
from repro.workloads.generators import dataset_with_queries, random_walk

CFG = IndexConfig(leaf_size=25, max_segments=8, sax_segments=8, lmax=5,
                  paris_leaf_size=16, db_size=64)
ALL = [DSTreeIndex, ParisIndex, VAFileIndex, PscanIndex]


def make(cls, n=300, length=32, seed=0):
    X = random_walk(n, length, seed)
    ids = np.arange(n)
    return cls.build(X, ids, CFG), X, ids


@pytest.mark.parametrize("cls", ALL)
class TestExactness:
    @pytest.mark.parametrize("k", [1, 5, 10])
    def test_matches_bruteforce(self, cls, k):
        idx, X, ids = make(cls)
        Q = random_walk(4, 32, seed=50)
        for qi in range(len(Q)):
            got, _ = idx.knn(Q[qi], k)
            want = bf_knn(Q[qi], X, ids, k)
            assert len(got) == k
            assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)

    def test_query_in_dataset(self, cls):
        idx, X, ids = make(cls)
        got, _ = idx.knn(X[17], 1)
        assert got[0][1] == 17
        assert got[0][0] == pytest.approx(0.0, abs=1e-5)

    @pytest.mark.parametrize("workload", ["1%", "10%", "ood"])
    def test_paper_workloads(self, cls, workload):
        X, Q = dataset_with_queries("synth", 250, 3, workload, length=32, seed=4)
        ids = np.arange(len(X))
        idx = cls.build(X, ids, CFG)
        for qi in range(len(Q)):
            got, _ = idx.knn(Q[qi], 3)
            want = bf_knn(Q[qi], X, ids, 3)
            assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)

    def test_save_load_roundtrip(self, cls, tmp_path):
        idx, X, ids = make(cls, n=150)
        d = str(tmp_path / "idx")
        idx.save(d)
        idx2 = cls.load(d)
        q = random_walk(1, 32, seed=9)[0]
        got1, _ = idx.knn(q, 5)
        got2, _ = idx2.knn(q, 5)
        assert np.allclose([a for a, _ in got1], [a for a, _ in got2])


class TestDSTreeSpecifics:
    def test_every_leaf_visit_is_a_seek(self):
        idx, X, _ = make(DSTreeIndex)
        _, stats = idx.knn(random_walk(1, 32, seed=2)[0], 1)
        # leaf-per-file layout: visited leaves == random seeks
        assert stats.seeks == stats.lcl_size

    def test_single_threaded_profile(self):
        idx, _, _ = make(DSTreeIndex)
        _, stats = idx.knn(random_walk(1, 32, seed=3)[0], 1)
        assert stats.cpu_parallel_s == 0.0

    def test_internal_synopses_maintained_during_build(self):
        idx, X, _ = make(DSTreeIndex)
        assert not idx.tree.root.is_leaf
        assert np.all(np.isfinite(idx.tree.root.syn.mu_min))

    def test_pruning_on_easy_query(self):
        idx, X, _ = make(DSTreeIndex, n=600)
        _, stats = idx.knn(X[3], 1)
        assert stats.eapca_pr > 0.3


class TestParisSpecifics:
    def test_prefix_intervals_nest(self):
        """A 2-bit prefix interval contains its 3-bit refinements."""
        from repro.baselines.paris import ParisNode

        card = 256
        prefix = np.array([1], dtype=np.int64)
        lo2, hi2 = _prefix_intervals(prefix, np.array([2]), card)
        for bit in (0, 1):
            p3 = np.array([(1 << 1) | bit], dtype=np.int64)
            lo3, hi3 = _prefix_intervals(p3, np.array([3]), card)
            assert lo3 >= lo2 - 1e-12
            assert hi3 <= hi2 + 1e-12

    def test_lb_prefix_lower_bounds_ed(self):
        idx, X, ids = make(ParisIndex)
        q = random_walk(1, 32, seed=6)[0]
        import repro.core.sax as sx

        q_paa = sx.paa(q[None, :], CFG.sax_segments)[0]
        for sig, node in idx.root_children.items():
            stack = [node]
            while stack:
                nd = stack.pop()
                if nd.is_leaf:
                    lb2 = lb_prefix2(q_paa, nd, idx.seg_lens, CFG.sax_card)
                    true_min = min(ed2(q, X[r]) for r in nd.rows)
                    assert lb2 <= true_min + 1e-9
                else:
                    stack.extend(nd.children.values())

    def test_leaf_sizes_bounded_or_maxbits(self):
        idx, _, _ = make(ParisIndex, n=800)
        stack = list(idx.root_children.values())
        while stack:
            nd = stack.pop()
            if nd.is_leaf:
                assert (nd.rows.size <= CFG.paris_leaf_size
                        or nd.bits.max() >= 8)
            else:
                stack.extend(nd.children.values())

    def test_scattered_io_profile(self):
        """ParIS+ does many random seeks on poorly-pruned queries."""
        idx, _, _ = make(ParisIndex, n=600)
        _, stats = idx.knn(random_walk(1, 32, seed=7)[0], 1)
        assert stats.seeks >= 1
        assert stats.sax_pr <= 1.0


class TestVAFileSpecifics:
    def test_dft_basis_orthonormal(self):
        B = dft_basis(64, 16)
        assert np.allclose(B @ B.T, np.eye(16), atol=1e-10)

    def test_truncated_distance_lower_bounds(self):
        B = dft_basis(32, 16)
        g = np.random.default_rng(0)
        x, y = g.normal(size=32), g.normal(size=32)
        df = np.sum((B @ x - B @ y) ** 2)
        assert df <= ed2(x, y) + 1e-9

    def test_allocate_bits_total(self):
        bits = allocate_bits(np.array([4.0, 1.0, 0.5, 0.25]), 8)
        assert bits.sum() == 8
        assert bits[0] >= bits[-1]  # high-variance dims get more bits

    def test_skip_sequential_profile(self):
        idx, _, _ = make(VAFileIndex)
        _, stats = idx.knn(random_walk(1, 32, seed=8)[0], 1)
        # one seek for the filter file + one per refined candidate
        assert stats.seeks == stats.series_accessed + 1


class TestPscanSpecifics:
    def test_accesses_everything(self):
        idx, X, _ = make(PscanIndex)
        _, stats = idx.knn(random_walk(1, 32, seed=9)[0], 1)
        assert stats.series_accessed == len(X)
        assert stats.pct_accessed == pytest.approx(100.0)
        assert stats.seeks == 1
        assert stats.overlap_io

    def test_early_abandon_touches_fewer_points(self):
        idx, X, _ = make(PscanIndex, n=800)
        _, stats = idx.knn(X[0], 1)  # exact-match query abandons aggressively
        assert stats.points_touched < X.size
