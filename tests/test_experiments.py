"""Table drivers at test scale: structural checks + result sanity.

These are integration tests of the full experiment pipeline (build +
query + cost model + serialization of results); absolute numbers at
tiny scale are noisy, so assertions target structure and invariants.
"""
import json
import os

import numpy as np
import pytest

from repro.experiments import tables
from repro.experiments.harness import extrapolate
from repro.workloads import generators as gen


@pytest.fixture(autouse=True)
def results_tmpdir(tmp_path, monkeypatch):
    monkeypatch.setattr(tables, "RESULTS_DIR", str(tmp_path / "results"))
    monkeypatch.setattr(tables, "WORK_DIR", str(tmp_path / "indexes"))
    return tmp_path


class TestExtrapolate:
    def test_trimmed_mean(self):
        times = [1.0] * 8 + [100.0, 0.0]  # outliers dropped
        assert extrapolate(times, 10_000) == pytest.approx(10_000.0)

    def test_small_workload_no_trim(self):
        assert extrapolate([2.0, 2.0], 100) == pytest.approx(200.0)


def _check_written(results_dir, name):
    j = os.path.join(results_dir, f"{name}.json")
    m = os.path.join(results_dir, f"{name}.md")
    assert os.path.isfile(j) and os.path.isfile(m)
    with open(j) as f:
        data = json.load(f)
    assert data["rows"]
    return data["rows"]


def test_table1_structure(spark, results_tmpdir):
    rows = tables.run_table1(spark, scale="test")
    assert {r["method"] for r in rows} == set(tables.METHODS)
    for r in rows:
        assert r["build_sim_s"] >= 0
        assert r["query_sim_s"] > 0
        assert r["combined_10k_s"] > r["combined_100_s"]
        assert 0 < r["pct_accessed"] <= 100.0 + 1e-9
    _check_written(tables.RESULTS_DIR, "table1")


def test_table2_structure(spark, results_tmpdir):
    rows = tables.run_table2(spark, scale="test")
    assert len(rows) == len(tables.METHODS)
    # PSCAN accesses everything; indexes access at most everything.
    pscan = next(r for r in rows if r["method"] == "pscan")
    assert pscan["pct_accessed"] == pytest.approx(100.0)
    _check_written(tables.RESULTS_DIR, "table2")


def test_table3_structure(spark, results_tmpdir):
    rows = tables.run_table3(spark, scale="test")
    lengths = {r["length"] for r in rows}
    assert lengths == {32, 64}
    _check_written(tables.RESULTS_DIR, "table3")


def test_table45_structure(spark, results_tmpdir):
    rows4, rows5 = tables.run_table45(spark, scale="test")
    assert {r["workload"] for r in rows4} == {"1%", "ood"}
    for r in rows5:
        assert 0 <= r["eapca_pr"] <= 1
        assert 0 <= r["sax_pr"] <= 1
    _check_written(tables.RESULTS_DIR, "table4")
    _check_written(tables.RESULTS_DIR, "table5")


def test_table6_structure(spark, results_tmpdir):
    rows = tables.run_table6(spark, scale="test")
    ks = {r["k"] for r in rows}
    assert ks == {1, 5}
    _check_written(tables.RESULTS_DIR, "table6")


def test_table7_structure(spark, results_tmpdir):
    rows = tables.run_table7(spark, scale="test")
    parts = {r["part"] for r in rows}
    assert parts == {"a_index", "b_query"}
    index_variants = {r["variant"] for r in rows if r["part"] == "a_index"}
    assert index_variants == {"dstree_star", "dstree_star_p", "nowpara", "hercules"}
    query_variants = {r["variant"] for r in rows if r["part"] == "b_query"}
    assert query_variants == {"hercules", "nosax", "nopara", "nothresh"}
    for r in rows:
        assert r["sim_s"] > 0
    _check_written(tables.RESULTS_DIR, "table7")
