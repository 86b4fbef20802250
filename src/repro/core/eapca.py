"""EAPCA summarization and the LB_EAPCA lower bound (DSTree / Hercules).

EAPCA represents each segment of a series with the (mean, std) of its
points. A node's *synopsis* keeps, per segment, the min/max mean and
min/max std over all series routed through the node. The lower bound
follows Wang et al. (DSTree, PVLDB'13):

    sum_j (x_j - y_j)^2  >=  sum_i l_i * ((mu_xi - mu_yi)^2 + (sd_xi - sd_yi)^2)

minimized over the node's per-segment ``[mu_min, mu_max] x [sd_min, sd_max]``
box, which yields interval distances.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from .series import PrefixStats
from . import segmentation as sg


@dataclass
class Synopsis:
    """Per-segment min/max mean and std over the series of a node."""

    mu_min: np.ndarray
    mu_max: np.ndarray
    sd_min: np.ndarray
    sd_max: np.ndarray

    @classmethod
    def empty(cls, m: int) -> "Synopsis":
        inf = np.full(m, np.inf)
        return cls(inf.copy(), -inf.copy(), inf.copy(), -inf.copy())

    @classmethod
    def from_stats(
        cls, stats: PrefixStats, ends: np.ndarray, rows: np.ndarray | None = None
    ) -> "Synopsis":
        """Exact synopsis of the given series rows under ``ends``."""
        mu, sd = stats.seg_stats_multi(ends, rows)
        return cls(mu.min(0), mu.max(0), sd.min(0), sd.max(0))

    def update(self, mu: np.ndarray, sd: np.ndarray) -> None:
        """Fold one series' per-segment (mean, std) into the synopsis."""
        np.minimum(self.mu_min, mu, out=self.mu_min)
        np.maximum(self.mu_max, mu, out=self.mu_max)
        np.minimum(self.sd_min, sd, out=self.sd_min)
        np.maximum(self.sd_max, sd, out=self.sd_max)

    def merge(self, other: "Synopsis") -> "Synopsis":
        """Union of two synopses over the same segmentation."""
        return Synopsis(
            np.minimum(self.mu_min, other.mu_min),
            np.maximum(self.mu_max, other.mu_max),
            np.minimum(self.sd_min, other.sd_min),
            np.maximum(self.sd_max, other.sd_max),
        )

    def copy(self) -> "Synopsis":
        return Synopsis(
            self.mu_min.copy(), self.mu_max.copy(),
            self.sd_min.copy(), self.sd_max.copy(),
        )

    def contains(self, mu: np.ndarray, sd: np.ndarray, tol: float = 1e-9) -> bool:
        """True if a series' per-segment stats fall inside the synopsis box."""
        return bool(
            np.all(mu >= self.mu_min - tol) and np.all(mu <= self.mu_max + tol)
            and np.all(sd >= self.sd_min - tol) and np.all(sd <= self.sd_max + tol)
        )


def interval_dist(v: np.ndarray, lo: np.ndarray, hi: np.ndarray) -> np.ndarray:
    """Distance from ``v`` to interval ``[lo, hi]`` (0 inside)."""
    return np.maximum(np.maximum(lo - v, v - hi), 0.0)


def lb_eapca2(
    q_mu: np.ndarray, q_sd: np.ndarray, ends: np.ndarray, syn: Synopsis
) -> float:
    """Squared LB_EAPCA between a query (its per-segment mean/std under the
    node's segmentation) and a node synopsis."""
    l = sg.lens(ends).astype(np.float64)
    dmu = interval_dist(q_mu, syn.mu_min, syn.mu_max)
    dsd = interval_dist(q_sd, syn.sd_min, syn.sd_max)
    return float(np.sum(l * (dmu * dmu + dsd * dsd)))


def qos(ends: np.ndarray, syn: Synopsis) -> float:
    """DSTree's quality-of-summarization measure for a node.

    ``QoS = sum_i l_i * ((mu_max - mu_min)^2 + sd_max^2)`` — an upper
    bound proxy on intra-node distances; split selection minimizes the
    size-weighted child QoS.
    """
    l = sg.lens(ends).astype(np.float64)
    dmu = syn.mu_max - syn.mu_min
    return float(np.sum(l * (dmu * dmu + syn.sd_max * syn.sd_max)))
