"""spark-submit entrypoint: build a distributed index over a generated
dataset.

Example::

    spark-submit jobs/build_index.py --dataset deep_like --n 20000 \
        --method hercules --index-dir /tmp/deep_idx
"""
from __future__ import annotations

import argparse

import numpy as np

from _common import get_spark
from repro.core.config import IndexConfig
from repro.spark.dataframes import series_to_df
from repro.spark.partitioned_index import METHODS, DistributedIndex
from repro.workloads import generators as gen

if __name__ == "__main__":
    p = argparse.ArgumentParser()
    p.add_argument("--dataset", choices=gen.DATASETS, default="synth")
    p.add_argument("--n", type=int, default=10_000)
    p.add_argument("--length", type=int, default=None)
    p.add_argument("--method", choices=METHODS, default="hercules")
    p.add_argument("--index-dir", required=True)
    p.add_argument("--partitions", type=int, default=8)
    p.add_argument("--leaf-size", type=int, default=100)
    p.add_argument("--seed", type=int, default=0)
    args = p.parse_args()

    spark = get_spark("repro-build")
    try:
        X = gen.dataset(args.dataset, args.n, args.length, args.seed)
        cfg = IndexConfig(num_partitions=args.partitions, leaf_size=args.leaf_size)
        df = series_to_df(spark, X, np.arange(args.n))
        idx, wall = DistributedIndex.build(
            spark, df, args.index_dir, method=args.method, cfg=cfg
        )
        bs = idx.build_stats
        print(f"built {args.method} over {args.n} x {X.shape[1]} in {wall:.2f}s "
              f"({len(idx.partitions)} partitions, {bs.n_leaves} leaves, "
              f"{bs.n_flushes} flushes)")
    finally:
        spark.stop()
