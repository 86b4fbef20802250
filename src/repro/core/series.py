"""Data series primitives: z-normalization, Euclidean distance kernels,
and O(1) per-segment statistics via cumulative sums.

The paper stores single-precision series and uses SIMD for distance
calculations; here series are ``float32`` and kernels are vectorized
NumPy with ``float64`` accumulation (the NumPy analogue of SIMD).
"""
from __future__ import annotations

import numpy as np

SERIES_DTYPE = np.float32


def znorm(X: np.ndarray, eps: float = 1e-8) -> np.ndarray:
    """Z-normalize each row of ``X`` (constant rows map to zeros).

    iSAX breakpoints assume N(0,1)-distributed values, so all datasets in
    the reproduction are z-normalized per series, as is standard for data
    series indexing.
    """
    X = np.asarray(X, dtype=np.float64)
    mu = X.mean(axis=-1, keepdims=True)
    sd = X.std(axis=-1, keepdims=True)
    out = (X - mu) / np.where(sd < eps, 1.0, sd)
    return out.astype(SERIES_DTYPE)


def ed2(q: np.ndarray, x: np.ndarray) -> float:
    """Squared Euclidean distance between two series."""
    d = np.asarray(q, dtype=np.float64) - np.asarray(x, dtype=np.float64)
    return float(np.dot(d, d))


def ed2_block(Q: np.ndarray, X: np.ndarray) -> np.ndarray:
    """Pairwise squared Euclidean distances, shape ``(len(Q), len(X))``.

    Computed with explicit differences (not the gemm trick) for exactness
    at the small block sizes used here.
    """
    Q = np.asarray(Q, dtype=np.float64)
    X = np.asarray(X, dtype=np.float64)
    if Q.ndim == 1:
        Q = Q[None, :]
    diff = Q[:, None, :] - X[None, :, :]
    return np.einsum("qnd,qnd->qn", diff, diff)


def ed2_single(q: np.ndarray, X: np.ndarray) -> np.ndarray:
    """Squared ED from one query to each row of ``X`` (shape ``(len(X),)``)."""
    q = np.asarray(q, dtype=np.float64)
    X = np.asarray(X, dtype=np.float64)
    diff = X - q[None, :]
    return np.einsum("nd,nd->n", diff, diff)


def ed2_early_abandon(
    q: np.ndarray, X: np.ndarray, bsf2: float, chunk: int = 16
) -> tuple[np.ndarray, int]:
    """Squared ED with early abandoning (UCR-Suite style), vectorized.

    Accumulates the distance in column chunks of ``chunk`` points and
    stops touching series whose partial sum already exceeds ``bsf2``.
    Returns ``(dists, points_touched)`` where abandoned series have
    ``dists >= bsf2`` (a valid partial lower bound, not the exact ED) and
    ``points_touched`` counts scalar point comparisons actually done —
    the quantity PSCAN's "data accessed" accounting needs.
    """
    q = np.asarray(q, dtype=np.float64)
    X = np.asarray(X, dtype=np.float64)
    n, length = X.shape
    acc = np.zeros(n, dtype=np.float64)
    alive = np.arange(n)
    touched = 0
    for start in range(0, length, chunk):
        end = min(start + chunk, length)
        diff = X[alive, start:end] - q[start:end][None, :]
        acc[alive] += np.einsum("nd,nd->n", diff, diff)
        touched += alive.size * (end - start)
        keep = acc[alive] < bsf2
        alive = alive[keep]
        if alive.size == 0:
            break
    return acc, touched


class PrefixStats:
    """Per-series cumulative sums enabling O(1) segment mean/std.

    For a matrix ``X`` of shape ``(n, length)``, any segment ``[a, b)``'s
    per-series mean and (population) standard deviation are computed from
    ``cumsum`` and ``cumsum of squares`` — the trick that makes DSTree's
    arbitrary per-node segmentations affordable during inserts, splits,
    and query-side LB_EAPCA against nodes of differing segmentations.
    """

    __slots__ = ("n", "length", "cs", "cs2")

    def __init__(self, X: np.ndarray):
        X = np.asarray(X, dtype=np.float64)
        if X.ndim == 1:
            X = X[None, :]
        self.n, self.length = X.shape
        self.cs = np.zeros((self.n, self.length + 1), dtype=np.float64)
        self.cs2 = np.zeros_like(self.cs)
        np.cumsum(X, axis=1, out=self.cs[:, 1:])
        np.cumsum(X * X, axis=1, out=self.cs2[:, 1:])

    def seg_mean_std(
        self, start: int, end: int, rows: np.ndarray | None = None
    ) -> tuple[np.ndarray, np.ndarray]:
        """Mean and std of points in ``[start, end)`` for each series."""
        cs, cs2 = (self.cs, self.cs2) if rows is None else (self.cs[rows], self.cs2[rows])
        ln = end - start
        s = cs[:, end] - cs[:, start]
        s2 = cs2[:, end] - cs2[:, start]
        mu = s / ln
        var = np.maximum(s2 / ln - mu * mu, 0.0)
        return mu, np.sqrt(var)

    def seg_stats_multi(
        self, ends: np.ndarray, rows: np.ndarray | None = None
    ) -> tuple[np.ndarray, np.ndarray]:
        """Mean/std for every segment of a segmentation, shape ``(n, m)``.

        ``ends`` are exclusive right endpoints (see
        :mod:`repro.core.segmentation`).
        """
        cs, cs2 = (self.cs, self.cs2) if rows is None else (self.cs[rows], self.cs2[rows])
        bounds = np.concatenate(([0], np.asarray(ends, dtype=np.int64)))
        lens = np.diff(bounds).astype(np.float64)
        s = cs[:, bounds[1:]] - cs[:, bounds[:-1]]
        s2 = cs2[:, bounds[1:]] - cs2[:, bounds[:-1]]
        mu = s / lens
        var = np.maximum(s2 / lens - mu * mu, 0.0)
        return mu, np.sqrt(var)
