"""Disk + parallelism cost model (the paper's hardware, Section 4.1).

The paper's headline results are disk-resident: what separates the
methods is the *structure* of their I/O (sequential runs vs. random
seeks; data volume) and how much of their CPU is parallelizable. Our
substrate is in-memory (see DESIGN.md §1.2), so each method counts the
I/O it *would* issue (``seq_bytes``, ``seeks``) and splits measured CPU
into serial/parallel portions; this module converts those counters to
simulated wall-clock using the paper's own hardware constants:

* RAID0 sequential throughput 1290 MB/s (stated in Section 4.1);
* 10K-RPM SAS random access ~6 ms (seek + half-rotation) on the
  paper's hardware, **scaled down with the dataset scale-down**: our
  datasets are ~10^3-10^4x smaller than the paper's (DESIGN.md §3), and
  what matters structurally is the ratio between one random access and
  scanning the dataset — keeping 6 ms against a 10 MB dataset would
  make a single seek cost as much as scanning the whole collection,
  which no real deployment exhibits. Two structural ratios cannot both
  be preserved once n shrinks 10^4x: seek/full-scan (paper 7.5e-5) and
  seek/per-series-transfer (paper ~6000x). The default takes the
  geometric compromise, a 1e-2 scale (``seek_s`` = 60 µs), keeping the
  chain that drives every figure: per-series transfer << seek <<
  full-scan time. ``CostModel(seek_s=0.006)`` restores the paper's raw
  constant.
* 24 hyperthreads for parallel phases.
* query CPU is **analytic**: every method counts the point-operations
  each phase performs (distance-point comparisons, per-segment
  lower-bound terms) and the model converts them at ``op_s`` — the
  effective per-scalar cost of the paper's SIMD kernels (~5 Gop/s per
  thread on the E5-2650v4, i.e. 2e-10 s/op). Measured Python CPU would
  distort *relative* costs: interpreted tree traversal is ~100x slower
  than C while vectorized scans are only ~3x slower, which would bury
  Hercules' sub-linear search under interpreter overhead.
* index-construction CPU is measured (builds are dominated by bulk
  NumPy work) and deflated by ``cpu_scale`` = 0.1 (Python -> SIMD C
  calibration). Wall-clock is always reported unscaled alongside.

``sim_query_time`` = serial CPU + parallel CPU / threads + I/O time,
with I/O overlapped against CPU for double-buffered scans (PSCAN and
the coordinator/DBuffer build pipeline).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.metrics import BuildStats, QueryStats


@dataclass
class CostModel:
    seq_bw_bytes_s: float = 1290e6   # paper: RAID0, 1290 MB/s
    seek_s: float = 60e-6            # paper 6 ms x 1e-2 dataset scale-down
    threads: int = 24                # paper: 24 hyperthreads
    op_s: float = 2e-10              # per point-op, SIMD (~5 Gop/s/thread)
    cpu_scale: float = 0.1           # Python/NumPy -> SIMD C (builds only)

    def io_time(self, seq_bytes: float, seeks: float) -> float:
        return seq_bytes / self.seq_bw_bytes_s + seeks * self.seek_s

    # ------------------------------------------------------------ queries
    def sim_query_time(self, st: QueryStats) -> float:
        """Simulated wall-clock for one query on the paper's hardware."""
        cpu = self.op_s * (st.ops_serial + st.ops_parallel / self.threads)
        io = self.io_time(st.seq_bytes, st.seeks)
        if st.overlap_io:
            # Double-buffered scan: reads overlap compute.
            return max(cpu, io)
        return cpu + io

    # ------------------------------------------------------------- builds
    def sim_build_time(
        self, bs: BuildStats, *, n_workers: int | None = None,
        lock_cost_s: float = 2e-7, serial_write: bool = False,
    ) -> float:
        """Simulated index-construction wall-clock.

        ``n_workers`` — parallel insert workers (1 for single-threaded
        DSTree*). ``lock_cost_s`` — per-lock synchronization overhead
        (drives the DSTree*P ablation: path-locking pays one lock per
        tree level per insert); the default 0.2 µs is a contended-lock
        cost deflated by the same 0.1 CPU calibration as the build CPU
        it competes with. ``serial_write`` — the NoWPara variant runs
        the index-writing phase on one thread.
        """
        workers = n_workers if n_workers is not None else self.threads
        build_cpu = self.cpu_scale * bs.build_cpu_s / max(1, workers)
        locks = bs.lock_acquisitions * lock_cost_s
        # Input is read once sequentially (DBuffer overlaps it with
        # inserts); flushes and split re-reads are extra I/O.
        read_io = self.io_time(bs.n_series and bs.lrd_bytes or 0, 1)
        flush_io = self.io_time(bs.flushed_bytes + bs.split_disk_bytes,
                                bs.n_flushes + bs.split_disk_reads)
        insert_phase = max(build_cpu + locks, read_io) + flush_io

        serial_cpu = bs.write_cpu_s - bs.write_parallel_cpu_s
        par = 1 if serial_write else workers
        write_cpu = self.cpu_scale * (
            serial_cpu + bs.write_parallel_cpu_s / max(1, par)
        )
        write_io = self.io_time(bs.lrd_bytes + bs.lsd_bytes, 3)  # 3 output files
        return insert_phase + write_cpu + write_io
