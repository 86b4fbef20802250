"""Unit tests for segmentation utilities."""
import numpy as np
import pytest

from repro.core import segmentation as sg


def test_make_valid():
    e = sg.make([4, 8, 16])
    assert e.dtype == np.int64
    assert list(e) == [4, 8, 16]


@pytest.mark.parametrize("bad", [[], [0, 4], [4, 4, 8], [8, 4]])
def test_make_invalid(bad):
    with pytest.raises(ValueError):
        sg.make(bad)


@pytest.mark.parametrize("length,m", [(16, 1), (16, 4), (17, 4), (5, 8), (128, 16)])
def test_initial_balanced(length, m):
    e = sg.initial(length, m)
    assert e[-1] == length
    assert len(e) == min(m, length)
    l = sg.lens(e)
    assert l.sum() == length
    assert l.min() >= 1
    assert l.max() - l.min() <= 1


def test_lens_and_starts():
    e = sg.make([3, 7, 10])
    assert list(sg.lens(e)) == [3, 4, 3]
    assert list(sg.starts(e)) == [0, 3, 7]


def test_vsplit_inserts_boundary():
    e = sg.make([4, 8])
    child = sg.vsplit(e, 1, 6)
    assert list(child) == [4, 6, 8]
    assert sg.is_refinement(child, e)


def test_vsplit_first_segment():
    child = sg.vsplit(sg.make([4, 8]), 0, 2)
    assert list(child) == [2, 4, 8]


@pytest.mark.parametrize("point", [0, 4, 8, 9])
def test_vsplit_rejects_outside_points(point):
    with pytest.raises(ValueError):
        sg.vsplit(sg.make([4, 8]), 1, point)


def test_is_refinement_negative():
    assert not sg.is_refinement(sg.make([3, 8]), sg.make([4, 8]))
