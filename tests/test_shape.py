"""Qualitative 'shape' checks — small-scale versions of the paper's
headline claims, run on single-partition indexes (no Spark) so they are
fast and deterministic. The full-scale versions live in benchmarks/.
"""
import numpy as np
import pytest

from repro.baselines.dstree import DSTreeIndex
from repro.baselines.paris import ParisIndex
from repro.baselines.pscan import PscanIndex
from repro.core.config import IndexConfig
from repro.core.hercules_index import HerculesPartitionIndex
from repro.core.hercules_query import HerculesSearcher
from repro.experiments.costmodel import CostModel
from repro.workloads.generators import dataset_with_queries, queries_for, random_walk

CFG = IndexConfig(leaf_size=50, max_segments=16, sax_segments=16, lmax=10,
                  db_size=500, paris_leaf_size=32)
CM = CostModel()
N, LEN = 6000, 128


@pytest.fixture(scope="module")
def walk_data():
    X = random_walk(N, LEN, seed=0)
    ids = np.arange(N)
    return X, ids


@pytest.fixture(scope="module")
def hercules(walk_data):
    X, ids = walk_data
    return HerculesSearcher(HerculesPartitionIndex.build(X, ids, CFG))


@pytest.fixture(scope="module")
def dstree(walk_data):
    X, ids = walk_data
    return DSTreeIndex.build(X, ids, CFG)


def _mean_stats(searcher, Q, k=1, **kw):
    out = []
    for q in Q:
        _, st = searcher.knn(q, k, **kw)
        out.append(st)
    return out


def test_hercules_prunes_on_easy_queries(hercules, walk_data):
    """Easy (1%) queries should access a small fraction of the data."""
    X, _ = walk_data
    Q = queries_for(X, "1%", 5, seed=1)
    stats = _mean_stats(hercules, Q)
    assert np.mean([s.pct_accessed for s in stats]) < 50.0


def test_hercules_beats_pscan_sim_time_easy(hercules, walk_data):
    """The paper's headline: Hercules outperforms the optimized scan."""
    X, ids = walk_data
    pscan = PscanIndex.build(X, ids, CFG)
    Q = queries_for(X, "1%", 5, seed=2)
    h = np.mean([CM.sim_query_time(s) for s in _mean_stats(hercules, Q)])
    p = np.mean([CM.sim_query_time(s) for s in _mean_stats(pscan, Q)])
    assert h < p


def test_sax_filter_reduces_data_accessed(hercules, walk_data):
    """Fig.12b NoSAX: dropping the iSAX filter accesses more raw data."""
    X, _ = walk_data
    Q = queries_for(X, "5%", 5, seed=3)
    full = np.mean([s.series_accessed
                    for s in _mean_stats(hercules, Q, mode="nothresh")])
    nosax = np.mean([s.series_accessed
                     for s in _mean_stats(hercules, Q, mode="nosax")])
    assert full <= nosax


def test_dstree_more_random_io_than_hercules(hercules, dstree, walk_data):
    """LRDFile clustering: Hercules needs fewer seeks than DSTree's
    leaf-per-file layout on comparable workloads."""
    X, _ = walk_data
    Q = queries_for(X, "5%", 5, seed=4)
    h_seeks = np.mean([s.seeks for s in _mean_stats(hercules, Q)])
    d_seeks = np.mean([s.seeks for s in _mean_stats(dstree, Q)])
    assert h_seeks <= d_seeks


def test_paris_builds_faster_than_hercules(walk_data):
    """ParIS+ summarizes once and never touches raw data again — its
    build CPU must be far below Hercules' tree construction."""
    X, ids = walk_data
    h = HerculesPartitionIndex.build(X, ids, CFG)
    p = ParisIndex.build(X, ids, CFG)
    assert p.build_stats.build_cpu_s < h.build_stats.build_cpu_s


def test_paris_degrades_on_hard_workload():
    """On ood deep-like queries ParIS+ prunes poorly and pays a random
    seek per surviving run — the Fig.10 collapse."""
    from repro.workloads.generators import dataset_with_queries

    X, Q = dataset_with_queries("deep_like", 1500, 3, "ood", seed=5)
    ids = np.arange(len(X))
    paris = ParisIndex.build(X, ids, CFG)
    pscan = PscanIndex.build(X, ids, CFG)
    p_sim = np.mean([CM.sim_query_time(s) for s in _mean_stats(paris, Q)])
    s_sim = np.mean([CM.sim_query_time(s) for s in _mean_stats(pscan, Q)])
    assert p_sim > s_sim  # scan wins against ParIS+ on hard workloads


def test_hercules_thresholds_protect_hard_workload():
    """Fig.12b NoThresh: on hard (ood) queries the adaptive fallback to
    a skip-sequential scan must not lose badly to the thresholdless
    variant (it wins by avoiding per-series random I/O)."""
    X, Q = dataset_with_queries("deep_like", 1500, 3, "ood", seed=6)
    ids = np.arange(len(X))
    searcher = HerculesSearcher(HerculesPartitionIndex.build(X, ids, CFG))
    with_th = np.mean([CM.sim_query_time(s) for s in _mean_stats(searcher, Q)])
    no_th = np.mean([CM.sim_query_time(s)
                     for s in _mean_stats(searcher, Q, mode="nothresh")])
    assert with_th <= no_th * 1.05


def test_deep_like_prunes_worse_than_walks(hercules):
    """Fig.10: pruning degrades on the deep-embedding-like dataset."""
    Xd, Qd = dataset_with_queries("deep_like", N, 5, "ood", seed=7)
    deep = HerculesSearcher(HerculesPartitionIndex.build(Xd, np.arange(N), CFG))
    d_acc = np.mean([s.pct_accessed for s in _mean_stats(deep, Qd)])
    Xw = random_walk(N, 96, seed=8)
    walk = HerculesSearcher(HerculesPartitionIndex.build(Xw, np.arange(N), CFG))
    Qw = random_walk(5, 96, seed=9)
    w_acc = np.mean([s.pct_accessed for s in _mean_stats(walk, Qw)])
    assert d_acc > w_acc


def test_build_ablation_ordering(walk_data):
    """Fig.12a: simulated build times order as
    Hercules < NoWPara < DSTree*P < DSTree*."""
    X, ids = walk_data
    herc = HerculesPartitionIndex.build(X, ids, CFG).build_stats
    nowp = HerculesPartitionIndex.build(X, ids, CFG, variant="nowpara").build_stats
    dst = DSTreeIndex.build(X, ids, CFG).build_stats
    t_h = CM.sim_build_time(herc, n_workers=24)
    t_nw = CM.sim_build_time(nowp, n_workers=24, serial_write=True)
    t_dp = CM.sim_build_time(dst, n_workers=24, lock_cost_s=2e-6)
    t_d = CM.sim_build_time(dst, n_workers=1, lock_cost_s=0.0)
    assert t_h <= t_nw
    assert t_dp <= t_d
