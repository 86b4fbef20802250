"""Unit tests for EAPCA summaries, synopses, and the LB_EAPCA bound."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import segmentation as sg
from repro.core.eapca import Synopsis, interval_dist, lb_eapca2, qos
from repro.core.series import PrefixStats, ed2


def _rand(seed, n=20, length=32):
    return np.random.default_rng(seed).normal(size=(n, length))


def test_synopsis_from_stats_bounds_every_series():
    X = _rand(0)
    ends = sg.make([8, 16, 32])
    ps = PrefixStats(X)
    syn = Synopsis.from_stats(ps, ends)
    mu, sd = ps.seg_stats_multi(ends)
    for i in range(len(X)):
        assert syn.contains(mu[i], sd[i])


def test_synopsis_update_incremental_equals_batch():
    X = _rand(1, n=15)
    ends = sg.make([16, 32])
    ps = PrefixStats(X)
    mu, sd = ps.seg_stats_multi(ends)
    inc = Synopsis.empty(2)
    for i in range(15):
        inc.update(mu[i], sd[i])
    batch = Synopsis.from_stats(ps, ends)
    assert np.allclose(inc.mu_min, batch.mu_min)
    assert np.allclose(inc.mu_max, batch.mu_max)
    assert np.allclose(inc.sd_min, batch.sd_min)
    assert np.allclose(inc.sd_max, batch.sd_max)


def test_synopsis_merge_is_union():
    X = _rand(2, n=10)
    ends = sg.make([32])
    ps = PrefixStats(X)
    a = Synopsis.from_stats(ps, ends, np.arange(5))
    b = Synopsis.from_stats(ps, ends, np.arange(5, 10))
    merged = a.merge(b)
    full = Synopsis.from_stats(ps, ends)
    assert np.allclose(merged.mu_min, full.mu_min)
    assert np.allclose(merged.sd_max, full.sd_max)


def test_interval_dist():
    v = np.array([-1.0, 0.5, 3.0])
    lo = np.array([0.0, 0.0, 0.0])
    hi = np.array([1.0, 1.0, 1.0])
    assert np.allclose(interval_dist(v, lo, hi), [1.0, 0.0, 2.0])


@pytest.mark.parametrize("ends_list", [[32], [16, 32], [8, 16, 24, 32], [5, 11, 32]])
def test_lb_eapca_lower_bounds_true_distance(ends_list):
    """The fundamental no-false-dismissal property of LB_EAPCA."""
    X = _rand(3, n=30)
    Q = _rand(4, n=5)
    ends = sg.make(ends_list)
    ps = PrefixStats(X)
    syn = Synopsis.from_stats(ps, ends)
    qps = PrefixStats(Q)
    qmu, qsd = qps.seg_stats_multi(ends)
    for qi in range(len(Q)):
        lb2 = lb_eapca2(qmu[qi], qsd[qi], ends, syn)
        true_min = min(ed2(Q[qi], X[i]) for i in range(len(X)))
        assert lb2 <= true_min + 1e-9


@given(st.integers(0, 2**31 - 1))
@settings(max_examples=30, deadline=None)
def test_lb_eapca_property(seed):
    """Wang et al. inequality: per-series EAPCA distance lower-bounds ED."""
    g = np.random.default_rng(seed)
    length = 24
    x, y = g.normal(size=length), g.normal(size=length)
    ends = sg.make(sorted(set(g.integers(1, length, 2).tolist()) | {length}))
    psx, psy = PrefixStats(x), PrefixStats(y)
    mx, sx_ = psx.seg_stats_multi(ends)
    my, sy_ = psy.seg_stats_multi(ends)
    l = sg.lens(ends)
    lb2 = float(np.sum(l * ((mx[0] - my[0]) ** 2 + (sx_[0] - sy_[0]) ** 2)))
    assert lb2 <= ed2(x, y) + 1e-9


def test_lb_zero_when_query_inside_box():
    X = _rand(5, n=10)
    ends = sg.make([16, 32])
    ps = PrefixStats(X)
    syn = Synopsis.from_stats(ps, ends)
    mu, sd = ps.seg_stats_multi(ends)
    assert lb_eapca2(mu[0], sd[0], ends, syn) == 0.0


def test_qos_decreases_with_tighter_synopsis():
    X = _rand(6, n=40)
    ends = sg.make([16, 32])
    ps = PrefixStats(X)
    full = qos(ends, Synopsis.from_stats(ps, ends))
    mu, _ = ps.seg_stats_multi(ends)
    half_rows = np.argsort(mu[:, 0])[:20]  # homogeneous subset
    half = qos(ends, Synopsis.from_stats(ps, ends, half_rows))
    assert half <= full


def test_qos_nonnegative():
    X = _rand(7)
    ends = sg.make([32])
    assert qos(ends, Synopsis.from_stats(PrefixStats(X), ends)) >= 0
