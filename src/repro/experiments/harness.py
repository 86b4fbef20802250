"""Experiment harness: build + query one evaluation cell and produce
the metric row the tables report.

Per cell (method x dataset x workload) we report:

* ``build_wall_s``   — measured Spark wall-clock of index construction;
* ``build_sim_s``    — cost-model build time on the paper's hardware;
* ``query_wall_s``   — measured wall-clock for the whole query batch;
* ``query_sim_s``    — mean simulated per-query time (the shape-bearing
  number for the paper's disk-resident comparisons);
* ``pct_accessed``   — mean % of raw series read per query (Fig. 10's
  second metric);
* ``combined_100_s`` / ``combined_10k_s`` — index + workload times in
  the paper's Figure 6/9 style, with the 10K workload extrapolated by
  the paper's trimmed-mean protocol.
"""
from __future__ import annotations

import os
import shutil
from typing import Sequence

import numpy as np
from pyspark.sql import SparkSession

from repro.core.config import IndexConfig
from repro.core.metrics import QueryStats
from repro.experiments.costmodel import CostModel
from repro.spark.dataframes import series_to_df
from repro.spark.partitioned_index import DistributedIndex

#: build parallelism profile per method: (workers, path_locks, serial_write)
#: DSTree* is the paper's best *single-core* method; ParIS+/Hercules/PSCAN
#: use all threads. VA+file's build is a single pass (single-thread in [21]).
BUILD_WORKERS = {"hercules": 24, "dstree": 1, "paris": 24, "vafile": 1, "pscan": 24}


def extrapolate(times: Sequence[float], target: int) -> float:
    """The paper's 10K-query extrapolation: drop the best and worst
    tail (5/100 in the paper, scaled to 10% here), multiply the mean of
    the rest by ``target``."""
    t = np.sort(np.asarray(list(times), dtype=np.float64))
    trim = max(1, len(t) // 10) if len(t) > 2 else 0
    core = t[trim : len(t) - trim] if trim else t
    return float(core.mean() * target)


def build_index(
    spark: SparkSession,
    X: np.ndarray,
    ids: np.ndarray,
    *,
    method: str,
    cfg: IndexConfig,
    index_dir: str,
    variant: str = "hercules",
    cost: CostModel | None = None,
) -> dict:
    """Build a distributed index; returns a dict with the handle and
    build metrics."""
    cost = cost or CostModel()
    if os.path.isdir(index_dir):
        shutil.rmtree(index_dir)
    df = series_to_df(spark, X, ids)
    idx, build_wall = DistributedIndex.build(
        spark, df, index_dir, method=method, cfg=cfg, variant=variant
    )
    bs = idx.build_stats
    sim = cost.sim_build_time(
        bs,
        n_workers=BUILD_WORKERS[method],
        serial_write=(variant == "nowpara"),
    )
    return {
        "index": idx,
        "build_wall_s": build_wall,
        "build_sim_s": sim,
        "build_stats": bs,
    }


def run_queries(
    spark: SparkSession,
    idx: DistributedIndex,
    Q: np.ndarray,
    *,
    k: int = 1,
    mode: str = "hercules",
    cost: CostModel | None = None,
) -> dict:
    """Answer a query batch; returns aggregate query metrics."""
    cost = cost or CostModel()
    topk_df, per_query, wall = idx.knn(spark, Q, k, mode=mode)
    stats = [per_query[q] for q in sorted(per_query)]
    sim_times = [cost.sim_query_time(s) for s in stats]
    return {
        "topk": topk_df,
        "per_query": stats,
        "query_wall_s": wall,
        "query_sim_s": float(np.mean(sim_times)),
        "query_sim_each": sim_times,
        "pct_accessed": float(np.mean([s.pct_accessed for s in stats])),
        "eapca_pr": float(np.mean([s.eapca_pr for s in stats])),
        "sax_pr": float(np.mean([s.sax_pr for s in stats])),
    }


def run_cell(
    spark: SparkSession,
    X: np.ndarray,
    ids: np.ndarray,
    Q: np.ndarray,
    *,
    method: str,
    cfg: IndexConfig,
    index_dir: str,
    k: int = 1,
    mode: str = "hercules",
    variant: str = "hercules",
    cost: CostModel | None = None,
) -> dict:
    """Build + query + combine, one full evaluation cell."""
    cost = cost or CostModel()
    b = build_index(
        spark, X, ids, method=method, cfg=cfg, index_dir=index_dir,
        variant=variant, cost=cost,
    )
    q = run_queries(spark, b["index"], Q, k=k, mode=mode, cost=cost)
    sim_each = q["query_sim_each"]
    return {
        "method": method,
        "build_wall_s": b["build_wall_s"],
        "build_sim_s": b["build_sim_s"],
        "query_wall_s": q["query_wall_s"],
        "query_sim_s": q["query_sim_s"],
        "pct_accessed": q["pct_accessed"],
        "combined_100_s": b["build_sim_s"] + extrapolate(sim_each, 100),
        "combined_10k_s": b["build_sim_s"] + extrapolate(sim_each, 10_000),
        "n_series": len(X),
        "length": X.shape[1],
        "k": k,
    }
