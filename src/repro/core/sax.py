"""PAA and iSAX summarization with the LB_SAX (MINDIST-style) lower bound.

iSAX (Shieh & Keogh) discretizes PAA values against breakpoints taken as
N(0,1) quantiles. Following the paper we use 16 segments and alphabet
256 (one byte per symbol). Lengths not divisible by the segment count
are handled with balanced variable-length segments, and the bound uses
the true per-segment lengths (the classic ``n/w`` factor generalized).

LB_SAX lower-bounds the Euclidean distance because (i) the PAA distance
with segment-length weights lower-bounds ED, and (ii) the breakpoint
interval of a symbol contains the series' PAA value, so the interval
distance lower-bounds the PAA distance.
"""
from __future__ import annotations

from functools import lru_cache
from statistics import NormalDist

import numpy as np

from . import segmentation as sg
from .series import PrefixStats


@lru_cache(maxsize=None)
def breakpoints(card: int) -> np.ndarray:
    """The ``card - 1`` N(0,1) quantile breakpoints for alphabet ``card``."""
    nd = NormalDist()
    return np.array([nd.inv_cdf(i / card) for i in range(1, card)])


def paa_ends(length: int, w: int) -> np.ndarray:
    """Balanced segmentation of ``[0, length)`` into ``min(w, length)`` parts."""
    return sg.initial(length, w)


def paa(X: np.ndarray, w: int) -> np.ndarray:
    """PAA of each row of ``X`` with ``w`` balanced segments, shape (n, w)."""
    X = np.atleast_2d(np.asarray(X, dtype=np.float64))
    ends = paa_ends(X.shape[1], w)
    mu, _ = PrefixStats(X).seg_stats_multi(ends)
    return mu


def sax_from_paa(paa_vals: np.ndarray, card: int) -> np.ndarray:
    """Map PAA values to iSAX symbols in ``[0, card)`` (uint8 for card<=256)."""
    bp = breakpoints(card)
    sym = np.searchsorted(bp, np.asarray(paa_vals, dtype=np.float64), side="right")
    dtype = np.uint8 if card <= 256 else np.uint16
    return sym.astype(dtype)


def sax(X: np.ndarray, w: int, card: int) -> np.ndarray:
    """iSAX symbols of each row of ``X``: shape (n, min(w, len))."""
    return sax_from_paa(paa(X, w), card)


def symbol_intervals(card: int) -> tuple[np.ndarray, np.ndarray]:
    """Per-symbol value interval ``[lo[s], hi[s]]`` (±inf at the edges)."""
    bp = breakpoints(card)
    lo = np.concatenate(([-np.inf], bp))
    hi = np.concatenate((bp, [np.inf]))
    return lo, hi


def lb_sax2(
    q_paa: np.ndarray, sax_rows: np.ndarray, seg_lens: np.ndarray, card: int
) -> np.ndarray:
    """Squared LB_SAX from one query PAA to many iSAX rows, shape (n,).

    ``seg_lens`` are the true segment lengths (balanced segmentation of
    the series length into ``w`` parts).
    """
    lo_tab, hi_tab = symbol_intervals(card)
    S = np.atleast_2d(sax_rows)
    lo = lo_tab[S]
    hi = hi_tab[S]
    q = np.asarray(q_paa, dtype=np.float64)[None, :]
    d = np.maximum(np.maximum(lo - q, q - hi), 0.0)
    return (d * d) @ np.asarray(seg_lens, dtype=np.float64)


def sax_first_bits(sax_rows: np.ndarray, card: int) -> np.ndarray:
    """The leading bit of each symbol — ParIS+'s root-subtree signature.

    For alphabet ``card`` the first bit of symbol ``s`` is
    ``s >= card / 2`` (value above/below the median breakpoint).
    """
    return (np.atleast_2d(sax_rows) >= card // 2).astype(np.uint8)
