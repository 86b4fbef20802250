"""Segmentations: a node's split of ``[0, n)`` into contiguous segments.

Represented as an ``int64`` array of *exclusive right endpoints*
``ends = [r_1, ..., r_m]`` with ``0 < r_1 < ... < r_m = n`` (the paper's
``SG = {r_1..r_m}``). Segment ``i`` covers ``[r_{i-1}, r_i)``.
"""
from __future__ import annotations

import numpy as np


def make(ends) -> np.ndarray:
    """Validate and normalize a segmentation."""
    e = np.asarray(ends, dtype=np.int64)
    if e.ndim != 1 or e.size == 0:
        raise ValueError("segmentation must be a non-empty 1-D sequence")
    if e[0] <= 0 or np.any(np.diff(e) <= 0):
        raise ValueError(f"endpoints must be strictly increasing and positive: {e}")
    return e


def initial(length: int, m: int) -> np.ndarray:
    """Balanced initial segmentation of ``[0, length)`` into ``m`` parts."""
    m = min(m, length)
    return np.round(np.linspace(length / m, length, m)).astype(np.int64)


def lens(ends: np.ndarray) -> np.ndarray:
    """Per-segment lengths."""
    return np.diff(np.concatenate(([0], ends)))


def starts(ends: np.ndarray) -> np.ndarray:
    """Per-segment inclusive left endpoints."""
    return np.concatenate(([0], ends[:-1]))


def vsplit(ends: np.ndarray, seg: int, point: int) -> np.ndarray:
    """Refine segment ``seg`` by inserting boundary ``point`` inside it.

    Returns the child segmentation of a V-split (one extra segment).
    """
    lo = 0 if seg == 0 else int(ends[seg - 1])
    hi = int(ends[seg])
    if not (lo < point < hi):
        raise ValueError(f"split point {point} not inside segment [{lo},{hi})")
    return np.insert(ends, seg, point)


def is_refinement(child: np.ndarray, parent: np.ndarray) -> bool:
    """True if ``child`` subdivides ``parent`` (every parent boundary kept)."""
    return bool(np.all(np.isin(parent, child)))
