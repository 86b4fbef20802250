"""A Python DataSource (Spark 4's Python face of DataSourceV2) that
exposes a Hercules index directory's LRDFiles as a DataFrame.

Registered under the short name ``lrdfile``::

    register(spark)
    df = spark.read.format("lrdfile").option("path", index_dir).load()

Schema: ``(part int, pos bigint, series_id bigint, value array<float>)``
— one row per series, in LRDFile (leaf-clustered) order, one input
partition per on-disk index partition, so scans parallelize the same
way the index is laid out.
"""
from __future__ import annotations

import json
import os

import numpy as np
from pyspark.sql import SparkSession
from pyspark.sql.datasource import DataSource, DataSourceReader, InputPartition

LRD_SCHEMA = "part int, pos bigint, series_id bigint, value array<float>"


class LRDFileDataSource(DataSource):
    """DataSourceV2 entry point for the ``lrdfile`` format."""

    @classmethod
    def name(cls) -> str:
        return "lrdfile"

    def schema(self) -> str:
        return LRD_SCHEMA

    def reader(self, schema) -> "LRDFileReader":
        return LRDFileReader(self.options)


class LRDFileReader(DataSourceReader):
    """Reads every ``part=<pid>/lrd.bin`` under the index directory."""

    def __init__(self, options):
        self.path = options.get("path")
        if not self.path:
            raise ValueError("lrdfile requires .option('path', <index_dir>)")

    def partitions(self):
        parts = sorted(
            int(d.split("=", 1)[1])
            for d in os.listdir(self.path)
            if d.startswith("part=")
            and os.path.isfile(os.path.join(self.path, d, "lrd.bin"))
        )
        if not parts:
            raise ValueError(f"no Hercules partitions under {self.path!r}")
        return [InputPartition(p) for p in parts]

    def read(self, partition):
        pid = partition.value
        part_dir = os.path.join(self.path, f"part={pid}")
        with open(os.path.join(part_dir, "meta.json")) as f:
            meta = json.load(f)
        n, length = meta["n"], meta["length"]
        lrd = np.fromfile(
            os.path.join(part_dir, "lrd.bin"), dtype=np.float32
        ).reshape(n, length)
        orig_ids = meta["orig_ids"]
        for pos in range(n):
            yield (pid, pos, int(orig_ids[pos]), [float(v) for v in lrd[pos]])


def register(spark: SparkSession) -> None:
    """Idempotently register the ``lrdfile`` format on this session."""
    spark.dataSource.register(LRDFileDataSource)
