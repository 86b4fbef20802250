"""Tests for the dataset / query-workload generators."""
import numpy as np
import pytest

from repro.workloads import generators as gen


@pytest.mark.parametrize("name", gen.DATASETS)
def test_datasets_znormalized(name):
    X = gen.dataset(name, 50, seed=1)
    assert X.dtype == np.float32
    assert X.shape == (50, gen.DEFAULT_LENGTH[name])
    assert np.allclose(X.mean(axis=1), 0, atol=1e-3)
    assert np.allclose(X.std(axis=1), 1, atol=1e-3)


@pytest.mark.parametrize("name", gen.DATASETS)
def test_datasets_deterministic(name):
    a = gen.dataset(name, 20, seed=7)
    b = gen.dataset(name, 20, seed=7)
    assert np.array_equal(a, b)
    c = gen.dataset(name, 20, seed=8)
    assert not np.array_equal(a, c)


def test_custom_length():
    X = gen.dataset("synth", 10, length=64, seed=0)
    assert X.shape == (10, 64)


def test_unknown_dataset_rejected():
    with pytest.raises(ValueError):
        gen.dataset("nope", 10)


@pytest.mark.parametrize("workload", ["1%", "2%", "5%", "10%"])
def test_noise_queries_close_to_source(workload):
    X, Q = gen.dataset_with_queries("synth", 100, 5, workload, length=64, seed=2)
    assert Q.shape == (5, 64)
    # Each query is a perturbed dataset series: its 1-NN distance is far
    # below the typical inter-series distance.
    from repro.core.series import ed2_single

    for q in Q:
        d = np.sqrt(ed2_single(q.astype(np.float64), X))
        assert d.min() < np.median(d) * 0.8


def test_noise_increases_with_workload():
    """Harder workloads sit farther from their source series."""
    mins = {}
    from repro.core.series import ed2_single

    for w in ("1%", "10%"):
        X, Q = gen.dataset_with_queries("synth", 100, 10, w, length=64, seed=3)
        mins[w] = np.mean(
            [np.sqrt(ed2_single(q.astype(np.float64), X)).min() for q in Q]
        )
    assert mins["10%"] > mins["1%"]


def test_ood_queries_not_in_dataset():
    X, Q = gen.dataset_with_queries("synth", 80, 5, "ood", length=32, seed=4)
    assert X.shape[0] == 80
    assert Q.shape[0] == 5
    # Held-out queries are distinct from every indexed series.
    for q in Q:
        assert not np.any(np.all(np.isclose(X, q[None, :]), axis=1))


def test_unknown_workload_rejected():
    with pytest.raises(ValueError):
        gen.dataset_with_queries("synth", 10, 2, "50%")


def test_queries_for_rejects_ood():
    X = gen.dataset("synth", 10, length=32)
    with pytest.raises(ValueError):
        gen.queries_for(X, "ood", 2)


def test_deep_like_is_hard():
    """deep_like nearest-neighbor distances concentrate (isotropy) —
    the property that collapses pruning."""
    from repro.core.series import ed2_single

    deep = gen.dataset("deep_like", 200, seed=5)
    walk = gen.dataset("synth", 200, length=96, seed=5)

    def contrast(X):
        q = X[0].astype(np.float64)
        d = np.sqrt(ed2_single(q, X[1:]))
        return d.min() / np.median(d)

    assert contrast(deep) > contrast(walk)
