"""Metric aggregation tests (partition merges drive every table)."""
import pytest

from repro.core.metrics import BuildStats, QueryStats


def test_build_merge_sums_counters_maxes_times():
    a = BuildStats(n_series=10, n_leaves=2, build_cpu_s=1.0, n_flushes=1)
    b = BuildStats(n_series=20, n_leaves=3, build_cpu_s=2.5, n_flushes=0)
    m = BuildStats.merge([a, b])
    assert m.n_series == 30
    assert m.n_leaves == 5
    assert m.build_cpu_s == 2.5  # partitions run concurrently
    assert m.n_flushes == 1


def test_build_merge_empty():
    assert BuildStats.merge([]).n_series == 0


def test_query_merge_recomputes_ratios():
    a = QueryStats(n_leaves=10, lcl_size=2, n_series=100, scl_size=10,
                   cpu_serial_s=0.5, series_accessed=30, path="refine")
    b = QueryStats(n_leaves=10, lcl_size=8, n_series=100, scl_size=0,
                   cpu_serial_s=0.2, series_accessed=10, path="eapca_skipseq")
    m = QueryStats.merge([a, b])
    assert m.n_series == 200
    assert m.series_accessed == 40
    assert m.eapca_pr == pytest.approx(1 - 10 / 20)
    assert m.sax_pr == pytest.approx(1 - 10 / 200)
    assert m.cpu_serial_s == 0.5
    assert m.path == "eapca_skipseq+refine"
    assert m.pct_accessed == pytest.approx(20.0)


def test_query_merge_overlap_all_required():
    a = QueryStats(overlap_io=True)
    b = QueryStats(overlap_io=False)
    assert not QueryStats.merge([a, b]).overlap_io
    assert QueryStats.merge([a, a]).overlap_io


def test_roundtrip_dict():
    st = QueryStats(n_series=5, seeks=3, path="x")
    assert QueryStats(**st.to_dict()) == st
    bs = BuildStats(n_series=5)
    assert BuildStats(**bs.to_dict()) == bs
