"""Tests for the ``lrdfile`` Python DataSource (DataSourceV2)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.config import IndexConfig
from repro.oracle import assert_equivalent
from repro.spark.dataframes import series_to_df
from repro.spark.lrd_datasource import register
from repro.spark.partitioned_index import DistributedIndex
from repro.workloads.generators import random_walk

CFG = IndexConfig(leaf_size=20, max_segments=8, sax_segments=8,
                  num_partitions=2, db_size=64)


@pytest.fixture(scope="module")
def index_dir(spark, tmp_path_factory):
    X = random_walk(150, 32, seed=1)
    ids = np.arange(150)
    d = str(tmp_path_factory.mktemp("lrd_idx"))
    DistributedIndex.build(
        spark, series_to_df(spark, X, ids), d, method="hercules", cfg=CFG
    )
    return d, X, ids


def test_reads_every_series_once(spark, index_dir):
    d, X, ids = index_dir
    register(spark)
    df = spark.read.format("lrdfile").option("path", d).load()
    pdf = df.toPandas()
    assert len(pdf) == len(X)
    assert sorted(pdf["series_id"]) == sorted(ids.tolist())


def test_values_roundtrip(spark, index_dir):
    d, X, ids = index_dir
    register(spark)
    pdf = spark.read.format("lrdfile").option("path", d).load().toPandas()
    by_id = {int(r.series_id): np.asarray(r.value, dtype=np.float32)
             for r in pdf.itertuples()}
    for i in [0, 17, 149]:
        assert np.array_equal(by_id[i], X[i])


def test_partition_counts_via_oracle(spark, index_dir):
    """Aggregate over the datasource checked against DuckDB."""
    d, X, ids = index_dir
    register(spark)
    df = spark.read.format("lrdfile").option("path", d).load()
    got = df.groupBy("part").agg(F.count("*").alias("n")).select("part", "n")
    assert_equivalent(
        got,
        "SELECT part, count(*) AS n FROM lrd GROUP BY part",
        lrd=df.select("part", "pos", "series_id"),
    )


def test_positions_contiguous_per_partition(spark, index_dir):
    d, _, _ = index_dir
    register(spark)
    pdf = (
        spark.read.format("lrdfile").option("path", d).load()
        .select("part", "pos").toPandas()
    )
    for part, grp in pdf.groupby("part"):
        assert sorted(grp["pos"]) == list(range(len(grp)))


def test_missing_path_errors(spark):
    register(spark)
    with pytest.raises(Exception):
        spark.read.format("lrdfile").load().collect()
