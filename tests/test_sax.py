"""Unit tests for PAA, iSAX, and the LB_SAX lower bound."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import sax as sx
from repro.core import segmentation as sg
from repro.core.series import PrefixStats, ed2, znorm


def test_breakpoints_monotone_symmetric():
    bp = sx.breakpoints(256)
    assert len(bp) == 255
    assert np.all(np.diff(bp) > 0)
    assert np.allclose(bp, -bp[::-1], atol=1e-12)


@pytest.mark.parametrize("card", [2, 4, 8, 256])
def test_breakpoints_count(card):
    assert len(sx.breakpoints(card)) == card - 1


def test_paa_equal_segments():
    X = np.arange(16.0)[None, :]
    p = sx.paa(X, 4)
    assert np.allclose(p[0], [1.5, 5.5, 9.5, 13.5])


def test_paa_uneven_length():
    X = np.arange(10.0)[None, :]
    p = sx.paa(X, 4)
    ends = sx.paa_ends(10, 4)
    assert ends[-1] == 10
    assert p.shape == (1, 4)


def test_sax_symbols_in_range():
    X = znorm(np.random.default_rng(0).normal(size=(50, 64)))
    S = sx.sax(X, 16, 256)
    assert S.dtype == np.uint8
    assert S.shape == (50, 16)


def test_sax_extreme_values_hit_edge_symbols():
    x = np.concatenate([np.full(8, -100.0), np.full(8, 100.0)])[None, :]
    S = sx.sax(x, 2, 256)
    assert S[0, 0] == 0
    assert S[0, 1] == 255


def test_symbol_intervals_cover_line():
    lo, hi = sx.symbol_intervals(8)
    assert lo[0] == -np.inf and hi[-1] == np.inf
    assert np.allclose(lo[1:], hi[:-1])


def test_sax_value_inside_own_interval():
    g = np.random.default_rng(1)
    paa_vals = g.normal(size=100)
    sym = sx.sax_from_paa(paa_vals, 256)
    lo, hi = sx.symbol_intervals(256)
    assert np.all(paa_vals >= lo[sym])
    assert np.all(paa_vals <= hi[sym])


@pytest.mark.parametrize("w,card", [(4, 4), (8, 16), (16, 256)])
def test_lb_sax_lower_bounds_ed(w, card):
    """No false dismissals: LB_SAX <= true squared ED."""
    g = np.random.default_rng(2)
    X = znorm(g.normal(size=(40, 64)))
    Q = znorm(g.normal(size=(5, 64)))
    S = sx.sax(X, w, card)
    lens = sg.lens(sx.paa_ends(64, w))
    q_paa = sx.paa(Q, w)
    for qi in range(len(Q)):
        lb2 = sx.lb_sax2(q_paa[qi], S, lens, card)
        for i in range(len(X)):
            assert lb2[i] <= ed2(Q[qi], X[i]) + 1e-9


@given(st.integers(0, 2**31 - 1))
@settings(max_examples=30, deadline=None)
def test_lb_sax_property(seed):
    g = np.random.default_rng(seed)
    length = int(g.integers(16, 65))
    x = znorm(g.normal(size=(1, length)))[0]
    q = znorm(g.normal(size=(1, length)))[0]
    w, card = 8, 64
    S = sx.sax(x[None, :], w, card)
    lens = sg.lens(sx.paa_ends(length, w))
    lb2 = sx.lb_sax2(sx.paa(q[None, :], w)[0], S, lens, card)[0]
    assert lb2 <= ed2(q, x) + 1e-9


def test_lb_sax_zero_for_same_series():
    X = znorm(np.random.default_rng(3).normal(size=(1, 32)))
    S = sx.sax(X, 8, 64)
    lens = sg.lens(sx.paa_ends(32, 8))
    lb2 = sx.lb_sax2(sx.paa(X, 8)[0], S, lens, 64)[0]
    assert lb2 == 0.0


def test_lb_sax_tighter_with_larger_alphabet():
    g = np.random.default_rng(4)
    X = znorm(g.normal(size=(30, 64)))
    q = znorm(g.normal(size=(1, 64)))[0]
    lens = sg.lens(sx.paa_ends(64, 8))
    q_paa = sx.paa(q[None, :], 8)[0]
    lb_small = sx.lb_sax2(q_paa, sx.sax(X, 8, 4), lens, 4).mean()
    lb_big = sx.lb_sax2(q_paa, sx.sax(X, 8, 256), lens, 256).mean()
    assert lb_big >= lb_small


def test_first_bits():
    S = np.array([[0, 127, 128, 255]], dtype=np.uint8)
    bits = sx.sax_first_bits(S, 256)
    assert list(bits[0]) == [0, 0, 1, 1]
