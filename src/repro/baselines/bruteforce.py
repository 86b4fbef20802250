"""Exact brute-force k-NN — the ground-truth reference used by tests."""
from __future__ import annotations

import numpy as np

from repro.core.series import ed2_single


def knn(q: np.ndarray, X: np.ndarray, ids: np.ndarray, k: int) -> list[tuple[float, int]]:
    """The k nearest series to ``q`` as ``(distance, id)`` ascending,
    ties broken by id (matching the SQL oracle's ORDER BY dist, id)."""
    d2 = ed2_single(np.asarray(q, dtype=np.float64), X)
    d = np.sqrt(d2)
    order = np.lexsort((np.asarray(ids), d))[:k]
    return [(float(d[i]), int(ids[i])) for i in order]
