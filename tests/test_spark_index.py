"""Distributed build + query integration tests.

Every method's end-to-end Spark k-NN result is checked against the
DuckDB SQL brute-force oracle (repro.oracle.assert_equivalent) — the
whole pipeline (partition build, per-partition search, Spark SQL top-k
merge) must produce exactly the rows SQL produces.
"""
import numpy as np
import pytest

from repro.core.config import IndexConfig
from repro.core.metrics import QueryStats
from repro.oracle import assert_equivalent
from repro.oracle_knn import knn_oracle_sql
from repro.spark.dataframes import series_long_pandas, series_to_df
from repro.spark.partitioned_index import METHODS, DistributedIndex
from repro.workloads.generators import dataset_with_queries, random_walk

CFG = IndexConfig(leaf_size=25, max_segments=8, sax_segments=8, lmax=5,
                  paris_leaf_size=16, db_size=64, num_partitions=2)

N, LENGTH, K = 240, 32, 5


@pytest.fixture(scope="module")
def data():
    X, Q = dataset_with_queries("synth", N, 3, "5%", length=LENGTH, seed=0)
    return X, np.arange(N), Q


@pytest.mark.parametrize("method", METHODS)
def test_knn_matches_sql_oracle(spark, data, tmp_path_factory, method):
    X, ids, Q = data
    df = series_to_df(spark, X, ids)
    index_dir = str(tmp_path_factory.mktemp(f"idx_{method}"))
    idx, build_wall = DistributedIndex.build(
        spark, df, index_dir, method=method, cfg=CFG
    )
    assert build_wall > 0
    qids = np.arange(len(Q))
    topk_df, per_query, wall = idx.knn(spark, Q, K)
    assert wall > 0
    assert set(per_query) == set(qids.tolist())
    assert_equivalent(
        topk_df,
        knn_oracle_sql(K),
        queries=series_long_pandas(Q, qids),
        series=series_long_pandas(X, ids),
    )


def test_open_roundtrip(spark, data, tmp_path):
    X, ids, Q = data
    df = series_to_df(spark, X, ids)
    index_dir = str(tmp_path / "idx")
    idx, _ = DistributedIndex.build(spark, df, index_dir, method="hercules", cfg=CFG)
    reopened = DistributedIndex.open(index_dir)
    assert reopened.method == "hercules"
    assert reopened.cfg.leaf_size == CFG.leaf_size
    assert [p["pid"] for p in reopened.partitions] == [p["pid"] for p in idx.partitions]
    topk_df, _, _ = reopened.knn(spark, Q[:1], 3)
    assert_equivalent(
        topk_df,
        knn_oracle_sql(3),
        queries=series_long_pandas(Q[:1], np.arange(1)),
        series=series_long_pandas(X, ids),
    )


def test_build_stats_aggregate(spark, data, tmp_path):
    X, ids, _ = data
    df = series_to_df(spark, X, ids)
    idx, _ = DistributedIndex.build(
        spark, df, str(tmp_path / "idx"), method="hercules", cfg=CFG
    )
    bs = idx.build_stats
    assert bs.n_series == N
    assert bs.n_leaves > 0
    assert len(idx.partitions) <= CFG.num_partitions


def test_per_query_stats_merged(spark, data, tmp_path):
    X, ids, Q = data
    df = series_to_df(spark, X, ids)
    idx, _ = DistributedIndex.build(
        spark, df, str(tmp_path / "idx"), method="hercules", cfg=CFG
    )
    _, per_query, _ = idx.knn(spark, Q, 1)
    for qid, st in per_query.items():
        assert isinstance(st, QueryStats)
        assert st.n_series == N          # summed across partitions
        assert 0 <= st.pct_accessed <= 100.0
        assert 0.0 <= st.eapca_pr <= 1.0


def test_hercules_modes_distributed(spark, data, tmp_path):
    X, ids, Q = data
    df = series_to_df(spark, X, ids)
    idx, _ = DistributedIndex.build(
        spark, df, str(tmp_path / "idx"), method="hercules", cfg=CFG
    )
    for mode in ("nosax", "nothresh", "nopara"):
        topk_df, _, _ = idx.knn(spark, Q[:2], 3, mode=mode)
        assert_equivalent(
            topk_df,
            knn_oracle_sql(3),
            queries=series_long_pandas(Q[:2], np.arange(2)),
            series=series_long_pandas(X, ids),
        )


def test_bad_method_rejected(spark, data, tmp_path):
    X, ids, _ = data
    df = series_to_df(spark, X, ids)
    with pytest.raises(ValueError):
        DistributedIndex.build(spark, df, str(tmp_path / "x"), method="nope")
