"""Tests of the SQL k-NN oracle itself (against NumPy brute force) and
of the long-format conversion helpers — the oracle must be right before
it can judge the indexes."""
import duckdb
import numpy as np
import pytest

from repro.baselines.bruteforce import knn as bf_knn
from repro.oracle_knn import knn_oracle_sql
from repro.spark.dataframes import series_long_pandas
from repro.workloads.generators import random_walk


def _sql_knn(X, ids, Q, qids, k):
    con = duckdb.connect()
    try:
        con.register("series", series_long_pandas(X, ids))
        con.register("queries", series_long_pandas(Q, qids))
        return con.execute(knn_oracle_sql(k)).fetchdf()
    finally:
        con.close()


@pytest.mark.parametrize("k", [1, 3, 10])
def test_sql_oracle_matches_numpy_bruteforce(k):
    X = random_walk(60, 16, seed=0)
    Q = random_walk(4, 16, seed=1)
    ids, qids = np.arange(60), np.arange(4)
    out = _sql_knn(X, ids, Q, qids, k)
    for qid in qids:
        sub = out[out.qid == qid].sort_values("rank")
        want = bf_knn(Q[qid], X, ids, k)
        assert list(sub["sid"]) == [i for _, i in want]
        assert np.allclose(sub["dist"], [d for d, _ in want], atol=1e-5)


def test_sql_oracle_rank_dense_from_one():
    X = random_walk(20, 16, seed=2)
    Q = random_walk(2, 16, seed=3)
    out = _sql_knn(X, np.arange(20), Q, np.arange(2), 5)
    for qid in (0, 1):
        assert sorted(out[out.qid == qid]["rank"]) == [1, 2, 3, 4, 5]


def test_series_long_pandas_shape():
    X = random_walk(3, 8, seed=4)
    pdf = series_long_pandas(X, np.array([10, 20, 30]))
    assert len(pdf) == 24
    assert set(pdf.series_id) == {10, 20, 30}
    row = pdf[(pdf.series_id == 20) & (pdf.pos == 5)]
    assert row.val.iloc[0] == pytest.approx(float(X[1, 5]))
