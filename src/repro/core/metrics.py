"""Build- and query-time counters.

Counters are the shape-bearing output of the reproduction: they record
the I/O structure (sequential bytes, seeks) and CPU structure (serial
vs. parallelizable work) that the cost model converts into the paper's
disk-based timings, plus the pruning statistics reported in Figure 10
(percentage of data accessed).
"""
from __future__ import annotations

from dataclasses import asdict, dataclass, field, fields


@dataclass
class BuildStats:
    """Counters for one partition's index construction."""

    n_series: int = 0
    n_leaves: int = 0
    n_internal: int = 0
    n_splits: int = 0
    n_vsplits: int = 0
    insert_node_visits: int = 0       # routing hops (tree traversal cost)
    synopsis_updates: int = 0          # per-node synopsis folds performed
    lock_acquisitions: int = 0         # leaf locks (Alg.5); path locks in DSTree*P
    barrier_entries: int = 0           # DBarrier entries (Alg.1/2 schedule)
    n_flushes: int = 0                 # HBuffer flush events (Alg.3/4)
    flushed_bytes: int = 0             # raw bytes written by flushes
    split_disk_reads: int = 0          # splits that had to re-read flushed data
    split_disk_bytes: int = 0
    build_cpu_s: float = 0.0           # tree building (insert phase), measured
    write_cpu_s: float = 0.0           # index writing phase, measured
    write_parallel_cpu_s: float = 0.0  # portion of writing parallelizable (Alg.6/7)
    lrd_bytes: int = 0                 # LRDFile size (written sequentially)
    lsd_bytes: int = 0                 # LSDFile size

    def to_dict(self) -> dict:
        return asdict(self)

    @classmethod
    def merge(cls, parts: list["BuildStats"]) -> "BuildStats":
        """Aggregate partition stats; cpu seconds take the max (partitions
        run concurrently), counters sum."""
        out = cls()
        if not parts:
            return out
        for f in fields(cls):
            vals = [getattr(p, f.name) for p in parts]
            setattr(out, f.name, max(vals) if f.name.endswith("_s") else sum(vals))
        return out


@dataclass
class QueryStats:
    """Counters for one query on one partition."""

    leaves_visited_approx: int = 0
    lcl_size: int = 0                 # candidate leaves after EAPCA pruning
    scl_size: int = 0                 # candidate series after SAX pruning
    n_leaves: int = 0
    n_series: int = 0
    eapca_pr: float = 1.0             # leaf-level pruning ratio
    sax_pr: float = 1.0               # series-level pruning ratio
    path: str = ""                    # which adaptive branch ran (Alg.10)
    series_accessed: int = 0          # raw series read (ED or scan)
    points_touched: int = 0           # scalar comparisons after early abandon
    lb_eapca_calcs: int = 0
    lb_sax_calcs: int = 0
    ed_calcs: int = 0
    seq_bytes: int = 0                # sequentially-read raw bytes
    seeks: int = 0                    # random I/O operations (runs of reads)
    cpu_serial_s: float = 0.0         # measured Python CPU, serial phases
    cpu_parallel_s: float = 0.0       # measured Python CPU, parallel phases
    ops_serial: float = 0.0           # point-ops in single-thread phases
    ops_parallel: float = 0.0         # point-ops in multi-threaded phases
    overlap_io: bool = False          # double-buffered scan (PSCAN) overlaps I/O

    def to_dict(self) -> dict:
        return asdict(self)

    @property
    def pct_accessed(self) -> float:
        """Percentage of dataset series whose raw data was read."""
        return 100.0 * self.series_accessed / max(1, self.n_series)

    @classmethod
    def merge_sequential(cls, rounds: list["QueryStats"]) -> "QueryStats":
        """Combine stats of sequential rounds on the *same* partition
        (the distributed two-round protocol): work counters and CPU sum,
        dataset-size denominators stay fixed, ratios are recomputed."""
        out = cls(**rounds[0].to_dict())
        for p in rounds[1:]:
            for f in fields(cls):
                name = f.name
                if name in ("n_series", "n_leaves", "eapca_pr", "sax_pr"):
                    continue
                if name == "path":
                    out.path = "+".join(x for x in (out.path, p.path) if x)
                elif name == "overlap_io":
                    out.overlap_io = out.overlap_io and p.overlap_io
                else:
                    setattr(out, name, getattr(out, name) + getattr(p, name))
        out.eapca_pr = 1.0 - out.lcl_size / max(1, out.n_leaves)
        out.sax_pr = 1.0 - out.scl_size / max(1, out.n_series)
        return out

    @classmethod
    def merge(cls, parts: list["QueryStats"]) -> "QueryStats":
        """Aggregate one query's per-partition stats (partitions run
        concurrently: cpu seconds take the max, counters sum, ratios are
        recomputed from the summed numerators/denominators)."""
        out = cls()
        if not parts:
            return out
        for f in fields(cls):
            vals = [getattr(p, f.name) for p in parts]
            if f.name.endswith("_s"):
                setattr(out, f.name, max(vals))
            elif f.name == "path":
                out.path = "+".join(sorted({p.path for p in parts}))
            elif f.name == "overlap_io":
                out.overlap_io = all(p.overlap_io for p in parts)
            elif f.name in ("eapca_pr", "sax_pr"):
                continue
            else:
                setattr(out, f.name, sum(vals))
        out.eapca_pr = 1.0 - out.lcl_size / max(1, out.n_leaves)
        out.sax_pr = 1.0 - out.scl_size / max(1, out.n_series)
        return out
