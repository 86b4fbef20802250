"""Index configuration shared by Hercules and the baselines.

Defaults mirror the paper's tuning (Section 4.2) scaled down ~10^3x in
dataset size: leaf size 100K -> 100 (same leaf/dataset ratio), iSAX with
16 segments and alphabet 256, ``L_max`` = 80 leaf visits for the
approximate phase, ``EAPCA_TH`` = 0.25 and ``SAX_TH`` = 0.50 pruning
thresholds, a double buffer (DBuffer) and a large raw-data buffer
(HBuffer) with a flush threshold counted in full worker regions.
"""
from __future__ import annotations

import json
from dataclasses import asdict, dataclass, field


@dataclass
class IndexConfig:
    """Tunables for index construction and query answering.

    Attributes mirror the knobs named in the paper; sizes are counted in
    series (not bytes) except ``hbuffer_bytes``.
    """

    # --- tree / summarization ---
    leaf_size: int = 100            # paper: 100K on 10^8 series
    init_segments: int = 1          # root starts unsegmented; V-splits refine
    max_segments: int = 16          # cap on per-node segmentation size
    sax_segments: int = 16          # paper: 16 segments
    sax_card: int = 256             # paper: alphabet size 256 (8 bits)

    # --- query answering ---
    lmax: int = 80                  # max leaves visited by Approx-kNN
    eapca_th: float = 0.25          # below this EAPCA pruning -> skip-seq scan
    sax_th: float = 0.50            # below this SAX pruning -> skip-seq scan

    # --- index building (Algorithms 1-4 schedule) ---
    db_size: int = 1000             # DBuffer half capacity, in series
    num_insert_workers: int = 23    # paper: 24 threads - 1 coordinator
    flush_threshold: int = 12       # full HBuffer regions before a flush
    hbuffer_bytes: int = 64 << 20   # HBuffer budget; small => out-of-core build

    # --- distributed layer ---
    num_partitions: int = 4         # Spark partitions ~= paper's threads

    # --- baseline knobs ---
    paris_leaf_size: int = 64       # ParIS+ leaf (paper 2K, same ratio-ish)
    vafile_dims: int = 16           # paper: 16 DFT symbols
    vafile_bits_per_dim: int = 4    # VA-file typical budget (64 bits/series)

    def to_json(self) -> str:
        return json.dumps(asdict(self))

    @classmethod
    def from_json(cls, s: str) -> "IndexConfig":
        return cls(**json.loads(s))

    def scaled_lmax(self, n_leaves: int) -> int:
        """Per-partition approximate-search budget.

        The paper's ``L_max`` = 80 is ~2-5% of its trees' leaves; a
        per-partition tree here can have only tens of leaves, where a raw
        L_max would visit *everything* during the approximate phase. Cap
        at 5% of the partition's leaves (>= 2 for a useful initial BSF),
        bounded by the configured ``lmax``.
        """
        frac = max(2, n_leaves // 20)
        return max(1, min(self.lmax, frac, n_leaves))
