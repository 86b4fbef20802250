"""Cost-model unit tests: the conversions that carry the paper's
disk-resident comparisons must behave monotonically and sensibly."""
import pytest

from repro.core.metrics import BuildStats, QueryStats
from repro.experiments.costmodel import CostModel

CM = CostModel()


def test_io_time_components():
    assert CM.io_time(0, 0) == 0.0
    assert CM.io_time(1290e6, 0) == pytest.approx(1.0)
    assert CM.io_time(0, 10) == pytest.approx(10 * CM.seek_s)


def test_seek_scaled_from_paper_constant():
    """6 ms on the paper's hardware, scaled 1e-2 with the dataset
    scale-down (see module docstring)."""
    assert CM.seek_s == pytest.approx(0.006 * 1e-2)


def test_seek_between_series_and_scan_time():
    """The structural chain that drives every figure: reading one
    series sequentially << one random access << scanning a dataset."""
    series_bytes = 256 * 4
    dataset_bytes = 20_000 * series_bytes
    assert series_bytes / CM.seq_bw_bytes_s < CM.seek_s
    assert CM.seek_s < dataset_bytes / CM.seq_bw_bytes_s


def test_seeks_dominate_small_random_reads():
    """1000 random 1KB reads cost far more than one 1MB sequential read
    — the effect behind the LRDFile layout and skip-seq fallbacks."""
    random = CM.io_time(1000 * 1024, 1000)
    sequential = CM.io_time(1 << 20, 1)
    assert random > 5 * sequential


def test_query_cpu_is_analytic_op_count():
    serial = QueryStats(ops_serial=1e9)
    parallel = QueryStats(ops_parallel=1e9)
    assert CM.sim_query_time(serial) == pytest.approx(1e9 * CM.op_s)
    assert CM.sim_query_time(parallel) == pytest.approx(1e9 * CM.op_s / 24)


def test_query_measured_python_cpu_ignored():
    """Interpreter time must not leak into simulated query time."""
    st = QueryStats(cpu_serial_s=123.0, cpu_parallel_s=456.0)
    assert CM.sim_query_time(st) == 0.0


def test_query_overlap_io():
    ops = 1.0 / CM.op_s  # exactly 1 simulated CPU second
    st = QueryStats(ops_serial=ops, seq_bytes=int(1290e6), overlap_io=True)
    # cpu (1.0) == io (1.0): overlap takes the max, not the sum.
    assert CM.sim_query_time(st) == pytest.approx(1.0)
    st.overlap_io = False
    assert CM.sim_query_time(st) == pytest.approx(2.0)


def test_build_more_workers_faster():
    bs = BuildStats(build_cpu_s=10.0, write_cpu_s=2.0, write_parallel_cpu_s=1.5,
                    lrd_bytes=1 << 20, n_series=100)
    t1 = CM.sim_build_time(bs, n_workers=1)
    t24 = CM.sim_build_time(bs, n_workers=24)
    assert t24 < t1


def test_build_lock_cost_hurts():
    bs = BuildStats(build_cpu_s=1.0, lock_acquisitions=1_000_000, n_series=100)
    cheap = CM.sim_build_time(bs, n_workers=24, lock_cost_s=0.0)
    locked = CM.sim_build_time(bs, n_workers=24, lock_cost_s=2e-6)
    assert locked > cheap + 1.0


def test_build_serial_write_slower():
    bs = BuildStats(build_cpu_s=1.0, write_cpu_s=5.0, write_parallel_cpu_s=4.8,
                    n_series=100)
    fast = CM.sim_build_time(bs, n_workers=24)
    slow = CM.sim_build_time(bs, n_workers=24, serial_write=True)
    assert slow > fast


def test_flush_io_charged():
    base = BuildStats(build_cpu_s=1.0, n_series=10)
    flushy = BuildStats(build_cpu_s=1.0, n_series=10,
                        flushed_bytes=int(1290e6), n_flushes=10)
    assert CM.sim_build_time(flushy) > CM.sim_build_time(base) + 0.9
