"""Unit tests for series primitives: z-norm, ED kernels, prefix stats."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.series import (
    PrefixStats,
    ed2,
    ed2_block,
    ed2_early_abandon,
    ed2_single,
    znorm,
)


def test_znorm_zero_mean_unit_std():
    X = np.random.default_rng(0).normal(5, 3, (10, 64))
    Z = znorm(X)
    assert np.allclose(Z.mean(axis=1), 0, atol=1e-4)
    assert np.allclose(Z.std(axis=1), 1, atol=1e-4)


def test_znorm_constant_row_is_zero():
    Z = znorm(np.full((2, 16), 7.0))
    assert np.allclose(Z, 0)


def test_znorm_dtype_float32():
    assert znorm(np.ones((2, 8))).dtype == np.float32


def test_ed2_matches_numpy():
    g = np.random.default_rng(1)
    a, b = g.normal(size=32), g.normal(size=32)
    assert ed2(a, b) == pytest.approx(np.sum((a - b) ** 2))


def test_ed2_single_matches_block():
    g = np.random.default_rng(2)
    q = g.normal(size=16)
    X = g.normal(size=(7, 16))
    assert np.allclose(ed2_single(q, X), ed2_block(q, X)[0])


def test_ed2_block_pairwise():
    g = np.random.default_rng(3)
    Q, X = g.normal(size=(3, 8)), g.normal(size=(5, 8))
    D = ed2_block(Q, X)
    assert D.shape == (3, 5)
    for i in range(3):
        for j in range(5):
            assert D[i, j] == pytest.approx(np.sum((Q[i] - X[j]) ** 2))


def test_early_abandon_exact_below_bsf():
    g = np.random.default_rng(4)
    q = g.normal(size=64)
    X = g.normal(size=(50, 64))
    exact = ed2_single(q, X)
    bsf2 = float(np.median(exact))
    d2, touched = ed2_early_abandon(q, X, bsf2)
    # Non-abandoned distances are exact; abandoned ones are valid partial
    # lower bounds that already exceed the bsf.
    below = d2 < bsf2
    assert np.allclose(d2[below], exact[below])
    assert np.all(d2[~below] >= bsf2)
    assert np.all(d2 <= exact + 1e-9)
    assert touched <= X.size


def test_early_abandon_touches_fewer_points_with_tight_bsf():
    g = np.random.default_rng(5)
    q = g.normal(size=128)
    X = g.normal(size=(100, 128))
    _, loose = ed2_early_abandon(q, X, np.inf)
    _, tight = ed2_early_abandon(q, X, 1.0)
    assert loose == X.size
    assert tight < loose


def test_early_abandon_infinite_bsf_is_exact():
    g = np.random.default_rng(6)
    q = g.normal(size=32)
    X = g.normal(size=(20, 32))
    d2, _ = ed2_early_abandon(q, X, np.inf)
    assert np.allclose(d2, ed2_single(q, X))


class TestPrefixStats:
    def test_segment_mean_std_match_numpy(self):
        g = np.random.default_rng(7)
        X = g.normal(size=(9, 40))
        ps = PrefixStats(X)
        for a, b in [(0, 40), (3, 17), (10, 11), (39, 40)]:
            mu, sd = ps.seg_mean_std(a, b)
            assert np.allclose(mu, X[:, a:b].mean(axis=1))
            # cumsum cancellation leaves ~1e-8 noise on 1-point segments
            assert np.allclose(sd, X[:, a:b].std(axis=1), atol=1e-6)

    def test_multi_segment_stats(self):
        g = np.random.default_rng(8)
        X = g.normal(size=(5, 24))
        ps = PrefixStats(X)
        ends = np.array([6, 12, 24])
        mu, sd = ps.seg_stats_multi(ends)
        assert mu.shape == (5, 3)
        assert np.allclose(mu[:, 1], X[:, 6:12].mean(axis=1))
        assert np.allclose(sd[:, 2], X[:, 12:24].std(axis=1))

    def test_row_subset(self):
        g = np.random.default_rng(9)
        X = g.normal(size=(6, 16))
        ps = PrefixStats(X)
        rows = np.array([1, 4])
        mu, _ = ps.seg_mean_std(2, 10, rows)
        assert np.allclose(mu, X[rows, 2:10].mean(axis=1))

    def test_single_row_input(self):
        x = np.arange(8.0)
        ps = PrefixStats(x)
        mu, sd = ps.seg_mean_std(0, 8)
        assert mu[0] == pytest.approx(3.5)
        assert sd[0] == pytest.approx(np.std(np.arange(8.0)))

    @given(st.integers(0, 2**31 - 1))
    @settings(max_examples=25, deadline=None)
    def test_property_random_segments(self, seed):
        g = np.random.default_rng(seed)
        X = g.normal(size=(3, 20))
        a = int(g.integers(0, 19))
        b = int(g.integers(a + 1, 21))
        mu, sd = PrefixStats(X).seg_mean_std(a, b)
        assert np.allclose(mu, X[:, a:b].mean(axis=1), atol=1e-6)
        assert np.allclose(sd, X[:, a:b].std(axis=1), atol=1e-6)
