"""Query answering tests: exactness vs brute force across workloads,
modes (ablation variants), k values, and adaptive-path behaviour."""
import numpy as np
import pytest

from repro.baselines.bruteforce import knn as bf_knn
from repro.core.config import IndexConfig
from repro.core.hercules_index import HerculesPartitionIndex
from repro.core.hercules_query import MODES, HerculesSearcher, KnnSet
from repro.workloads.generators import dataset_with_queries, random_walk


def make_index(n=400, length=32, leaf_size=25, seed=0, **cfg_kw):
    X = random_walk(n, length, seed)
    cfg_kw.setdefault("lmax", 5)
    cfg = IndexConfig(leaf_size=leaf_size, max_segments=8, sax_segments=8,
                      **cfg_kw)
    ids = np.arange(n)
    idx = HerculesPartitionIndex.build(X, ids, cfg)
    return HerculesSearcher(idx), X, ids


class TestKnnSet:
    def test_bsf_inf_until_k(self):
        s = KnnSet(3)
        s.add(1.0, 0)
        assert s.bsf2 == np.inf
        s.add(2.0, 1)
        s.add(3.0, 2)
        assert s.bsf2 == 3.0

    def test_keeps_k_smallest(self):
        s = KnnSet(2)
        for d, i in [(5.0, 0), (1.0, 1), (3.0, 2), (0.5, 3)]:
            s.add(d, i)
        got = s.sorted()
        assert [i for _, i in got] == [3, 1]
        assert np.allclose([d for d, _ in got], [np.sqrt(0.5), 1.0])

    def test_add_rejects_worse(self):
        s = KnnSet(1)
        assert s.add(1.0, 0)
        assert not s.add(2.0, 1)


class TestExactness:
    @pytest.mark.parametrize("seed", range(5))
    @pytest.mark.parametrize("k", [1, 5, 10])
    def test_matches_bruteforce_random_queries(self, seed, k):
        searcher, X, ids = make_index(seed=seed)
        q = random_walk(3, 32, seed=100 + seed)
        for qi in range(len(q)):
            got, stats = searcher.knn(q[qi], k)
            want = bf_knn(q[qi], X, ids, k)
            assert len(got) == k
            assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)

    @pytest.mark.parametrize("mode", MODES)
    def test_all_modes_exact(self, mode):
        searcher, X, ids = make_index()
        q = random_walk(3, 32, seed=7)
        for qi in range(len(q)):
            got, _ = searcher.knn(q[qi], 5, mode=mode)
            want = bf_knn(q[qi], X, ids, 5)
            assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)

    @pytest.mark.parametrize("workload", ["1%", "5%", "10%", "ood"])
    def test_exact_on_paper_workloads(self, workload):
        X, Q = dataset_with_queries("synth", 300, 4, workload, length=32, seed=3)
        cfg = IndexConfig(leaf_size=25, max_segments=8, sax_segments=8, lmax=5)
        ids = np.arange(300)
        searcher = HerculesSearcher(HerculesPartitionIndex.build(X, ids, cfg))
        for qi in range(len(Q)):
            got, _ = searcher.knn(Q[qi], 3)
            want = bf_knn(Q[qi], X, ids, 3)
            assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)

    def test_query_in_dataset_finds_itself(self):
        searcher, X, ids = make_index()
        got, _ = searcher.knn(X[42], 1)
        assert got[0][1] == 42
        assert got[0][0] == pytest.approx(0.0, abs=1e-5)

    def test_k_larger_than_leaf(self):
        searcher, X, ids = make_index(leaf_size=10)
        q = random_walk(1, 32, seed=11)[0]
        got, _ = searcher.knn(q, 30)
        want = bf_knn(q, X, ids, 30)
        assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)


class TestAdaptivePaths:
    def test_easy_query_uses_refine_path(self):
        """A near-duplicate query prunes well -> phases 3-4 run."""
        searcher, X, _ = make_index(n=600, eapca_th=0.05, sax_th=0.05)
        got, stats = searcher.knn(X[10], 1)
        assert stats.path in ("refine", "eapca_skipseq", "sax_skipseq")
        assert stats.eapca_pr > 0.5  # near-duplicate should prune most leaves

    def test_thresholds_force_skipseq(self):
        """With EAPCA_TH = 1.0 every query falls back to the scan."""
        searcher, X, _ = make_index(eapca_th=1.01)
        _, stats = searcher.knn(random_walk(1, 32, seed=5)[0], 1)
        assert stats.path == "eapca_skipseq"

    def test_nothresh_never_skipseq(self):
        searcher, X, _ = make_index(eapca_th=1.01, sax_th=1.01)
        _, stats = searcher.knn(random_walk(1, 32, seed=5)[0], 1, mode="nothresh")
        assert stats.path == "refine"

    def test_nosax_path(self):
        searcher, X, _ = make_index(eapca_th=0.0)
        _, stats = searcher.knn(random_walk(1, 32, seed=5)[0], 1, mode="nosax")
        assert stats.path == "nosax_refine"
        assert stats.lb_sax_calcs == 0

    def test_nopara_moves_cpu_to_serial(self):
        searcher, X, _ = make_index(eapca_th=0.0)
        _, stats = searcher.knn(random_walk(1, 32, seed=6)[0], 1, mode="nopara")
        assert stats.cpu_parallel_s == 0.0
        assert stats.cpu_serial_s > 0.0


class TestStats:
    def test_lmax_respected(self):
        searcher, _, _ = make_index(lmax=3)
        _, stats = searcher.knn(random_walk(1, 32, seed=8)[0], 1)
        assert stats.leaves_visited_approx <= 3

    def test_pruning_ratios_in_range(self):
        searcher, _, _ = make_index()
        _, stats = searcher.knn(random_walk(1, 32, seed=9)[0], 1)
        assert 0.0 <= stats.eapca_pr <= 1.0
        assert 0.0 <= stats.sax_pr <= 1.0

    def test_series_accessed_bounded_by_n(self):
        searcher, X, _ = make_index()
        _, stats = searcher.knn(random_walk(1, 32, seed=10)[0], 1)
        assert stats.series_accessed <= len(X) + searcher.cfg.leaf_size

    def test_near_duplicate_accesses_less_than_scan(self):
        searcher, X, _ = make_index(n=800)
        _, stats = searcher.knn(X[5], 1)
        assert stats.series_accessed < len(X)

    def test_io_counters_positive(self):
        searcher, _, _ = make_index()
        _, stats = searcher.knn(random_walk(1, 32, seed=12)[0], 1)
        assert stats.seq_bytes > 0
        assert stats.seeks >= 1
        assert stats.ed_calcs > 0


class TestTwoRoundProtocol:
    """The distributed shared-BSF protocol's building blocks."""

    def test_knnset_cap_bounds_bsf(self):
        s = KnnSet(2, cap2=4.0)
        assert s.bsf2 == 4.0          # cap active before k results
        s.add(1.0, 0)
        s.add(9.0, 1)                  # worse than cap but still stored
        assert s.bsf2 == pytest.approx(4.0)
        s.add(2.0, 2)
        assert s.bsf2 == pytest.approx(2.0)  # real kth now below cap

    def test_approx_phase_returns_quickly(self):
        searcher, X, ids = make_index()
        got, stats = searcher.knn(random_walk(1, 32, seed=20)[0], 3, phase="approx")
        assert stats.path == "approx"
        assert stats.leaves_visited_approx <= searcher.cfg.scaled_lmax(searcher.n_leaves)

    def test_exact_phase_with_global_bsf_is_exact(self):
        searcher, X, ids = make_index()
        q = random_walk(1, 32, seed=21)[0]
        want = bf_knn(q, X, ids, 5)
        # seed with the true kth distance (the tightest valid global cap)
        got, stats = searcher.knn(q, 5, phase="exact", bsf0=want[-1][0] * 1.0001)
        assert np.allclose([d for d, _ in got], [d for d, _ in want], atol=1e-4)
        assert stats.leaves_visited_approx == 0

    def test_tight_bsf_reduces_access(self):
        searcher, X, ids = make_index(n=800)
        q = random_walk(1, 32, seed=22)[0]
        _, loose = searcher.knn(q, 1, phase="exact")
        tight_bound = bf_knn(q, X, ids, 1)[0][0] * 1.001
        _, tight = searcher.knn(q, 1, phase="exact", bsf0=tight_bound)
        assert tight.series_accessed <= loose.series_accessed

    def test_bad_phase_rejected(self):
        searcher, _, _ = make_index()
        with pytest.raises(ValueError):
            searcher.knn(random_walk(1, 32, seed=23)[0], 1, phase="bogus")
