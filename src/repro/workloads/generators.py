"""Synthetic stand-ins for the paper's datasets and query workloads.

Datasets (all z-normalized float32, deterministic in ``seed``):

* ``random_walk``  — the paper's *Synth*: cumulative sum of N(0,1) steps
  (models financial series; easy-to-medium for tree indexes).
* ``sald_like``    — SALD (MRI, len 128): smooth random walks.
* ``seismic_like`` — Seismic (len 256): random walks with heteroscedastic
  burst noise (random high-variance windows), which degrades EAPCA
  clustering the way real seismograms do.
* ``deep_like``    — Deep1B embeddings (len 96): near-isotropic Gaussian
  vectors with mild cluster structure; high-dimensional isotropy is what
  makes Deep "notoriously hard" (pruning collapses for all indexes).

Query workloads follow the paper's protocol exactly: workloads ``1%``,
``2%``, ``5%``, ``10%`` perturb dataset series with Gaussian noise of
variance 0.01-0.1 (then re-z-normalize); ``ood`` holds out series
generated from the same distribution but excluded from indexing.
"""
from __future__ import annotations

import numpy as np

from repro.core.series import SERIES_DTYPE, znorm

WORKLOADS = ("1%", "2%", "5%", "10%", "ood")
NOISE_VARIANCE = {"1%": 0.01, "2%": 0.02, "5%": 0.05, "10%": 0.10}
DATASETS = ("synth", "sald_like", "seismic_like", "deep_like")
DEFAULT_LENGTH = {"synth": 256, "sald_like": 128, "seismic_like": 256, "deep_like": 96}


def random_walk(n: int, length: int, seed: int = 0) -> np.ndarray:
    """Z-normalized Gaussian random walks, shape ``(n, length)``."""
    g = np.random.default_rng(seed)
    return znorm(np.cumsum(g.standard_normal((n, length)), axis=1))


def sald_like(n: int, length: int = 128, seed: int = 0) -> np.ndarray:
    """Smooth walk series standing in for SALD MRI sequences."""
    g = np.random.default_rng(seed)
    walks = np.cumsum(g.standard_normal((n, length)), axis=1)
    # Light smoothing: MRI intensity curves are smoother than raw walks.
    kernel = np.ones(5) / 5.0
    sm = np.apply_along_axis(lambda r: np.convolve(r, kernel, mode="same"), 1, walks)
    return znorm(sm)


def seismic_like(n: int, length: int = 256, seed: int = 0) -> np.ndarray:
    """Walks with random high-variance bursts (earthquake-like records)."""
    g = np.random.default_rng(seed)
    walks = np.cumsum(g.standard_normal((n, length)), axis=1)
    burst_start = g.integers(0, max(1, length - length // 4), n)
    burst_len = g.integers(length // 8, length // 4 + 1, n)
    amp = g.uniform(2.0, 6.0, n)
    noise = g.standard_normal((n, length))
    idx = np.arange(length)[None, :]
    in_burst = (idx >= burst_start[:, None]) & (idx < (burst_start + burst_len)[:, None])
    return znorm(walks + np.where(in_burst, amp[:, None] * noise, 0.0))


def deep_like(n: int, length: int = 96, seed: int = 0) -> np.ndarray:
    """Clustered high-dimensional Gaussian vectors (deep-embedding-like).

    Cluster centers carry ~half the variance: enough structure that
    summarizations prune *partially* on easy (planted-neighbor)
    workloads — the paper's Fig. 10e shows indexes accessing 5-50% of
    Deep even on easy queries — while the isotropic within-cluster
    noise still collapses pruning on ood queries.
    """
    g = np.random.default_rng(seed)
    n_clusters = 64
    centers = g.standard_normal((n_clusters, length))
    assign = g.integers(0, n_clusters, n)
    return znorm(centers[assign] + g.standard_normal((n, length)))


_GENERATORS = {
    "synth": random_walk,
    "sald_like": sald_like,
    "seismic_like": seismic_like,
    "deep_like": deep_like,
}


def dataset(name: str, n: int, length: int | None = None, seed: int = 0) -> np.ndarray:
    """Generate dataset ``name`` with ``n`` series (see module docstring)."""
    if name not in _GENERATORS:
        raise ValueError(f"unknown dataset {name!r}; choose from {DATASETS}")
    length = length or DEFAULT_LENGTH[name]
    return _GENERATORS[name](n, length, seed)


def dataset_with_queries(
    name: str,
    n: int,
    n_queries: int,
    workload: str,
    length: int | None = None,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Dataset + query workload, the paper's recipes.

    Noise workloads perturb randomly-selected dataset series; ``ood``
    generates ``n + n_queries`` series and holds the tail out of the
    index (the paper selects ood queries from the raw dataset and
    excludes them from indexing).
    """
    if workload not in WORKLOADS:
        raise ValueError(f"unknown workload {workload!r}; choose from {WORKLOADS}")
    length = length or DEFAULT_LENGTH[name]
    if workload == "ood":
        both = dataset(name, n + n_queries, length, seed)
        g = np.random.default_rng(seed + 1)
        hold = g.choice(n + n_queries, size=n_queries, replace=False)
        keep = np.setdiff1d(np.arange(n + n_queries), hold)
        return both[keep], both[hold]
    X = dataset(name, n, length, seed)
    g = np.random.default_rng(seed + 1)
    rows = g.choice(n, size=n_queries, replace=False)
    sigma = np.sqrt(NOISE_VARIANCE[workload])
    Q = X[rows].astype(np.float64) + sigma * g.standard_normal((n_queries, length))
    return X, znorm(Q)


def queries_for(
    X: np.ndarray, workload: str, n_queries: int, seed: int = 100
) -> np.ndarray:
    """Noise-workload queries for an existing dataset (no ood here)."""
    if workload == "ood":
        raise ValueError("ood queries must come from dataset_with_queries()")
    g = np.random.default_rng(seed)
    rows = g.choice(len(X), size=n_queries, replace=False)
    sigma = np.sqrt(NOISE_VARIANCE[workload])
    Q = X[rows].astype(np.float64) + sigma * g.standard_normal((n_queries, X.shape[1]))
    return znorm(Q).astype(SERIES_DTYPE)
