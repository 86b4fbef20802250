"""Distributed index: one per-partition index per Spark partition.

The paper's intra-server threads map to Spark partitions (repro band:
``single_node_parallelizable``): ``build`` repartitions the series
DataFrame and runs the per-partition builder inside ``mapInPandas``
(Arrow), persisting each partition's index under
``<index_dir>/part=<pid>/``; ``knn`` broadcasts the query batch, runs
the paper's per-query search inside every partition, and merges the
per-partition top-k candidates with a Spark SQL window function — the
global merge is executed by Catalyst, not driver-side Python.
"""
from __future__ import annotations

import json
import os
import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.baselines.dstree import DSTreeIndex
from repro.baselines.paris import ParisIndex
from repro.baselines.pscan import PscanIndex
from repro.baselines.vafile import VAFileIndex
from repro.core.config import IndexConfig
from repro.core.hercules_index import HerculesPartitionIndex
from repro.core.hercules_query import HerculesSearcher
from repro.core.metrics import BuildStats, QueryStats

METHODS = ("hercules", "dstree", "paris", "vafile", "pscan")

_META_SCHEMA = "pid int, n_series bigint, build_stats string"
_OUT_SCHEMA = "qid bigint, pid int, sid bigint, dist double, stats string"


def _load_partition(method: str, part_dir: str):
    if method == "hercules":
        return HerculesSearcher(HerculesPartitionIndex.load(part_dir))
    cls = {"dstree": DSTreeIndex, "paris": ParisIndex,
           "vafile": VAFileIndex, "pscan": PscanIndex}[method]
    return cls.load(part_dir)


@dataclass
class DistributedIndex:
    """Handle to a built index directory (reconstructable from disk)."""

    index_dir: str
    method: str
    cfg: IndexConfig
    partitions: list[dict] = field(default_factory=list)  # {pid, n_series, build_stats}

    # ------------------------------------------------------------- build
    @staticmethod
    def build(
        spark: SparkSession,
        df: DataFrame,
        index_dir: str,
        *,
        method: str = "hercules",
        cfg: IndexConfig | None = None,
        variant: str = "hercules",
    ) -> tuple["DistributedIndex", float]:
        """Build per-partition indexes; returns (index, build_wall_s)."""
        if method not in METHODS:
            raise ValueError(f"method must be one of {METHODS}")
        cfg = cfg or IndexConfig()
        cfg_json = cfg.to_json()
        os.makedirs(index_dir, exist_ok=True)

        def build_fn(batches):
            from pyspark import TaskContext

            pid = TaskContext.get().partitionId()
            pdfs = [p for p in batches if len(p)]
            if not pdfs:
                return
            pdf = pd.concat(pdfs, ignore_index=True)
            X = np.stack(pdf["value"].to_numpy()).astype(np.float32)
            ids = pdf["series_id"].to_numpy(dtype=np.int64)
            c = IndexConfig.from_json(cfg_json)
            if method == "hercules":
                idx = HerculesPartitionIndex.build(X, ids, c, variant=variant)
            else:
                cls = {"dstree": DSTreeIndex, "paris": ParisIndex,
                       "vafile": VAFileIndex, "pscan": PscanIndex}[method]
                idx = cls.build(X, ids, c)
            idx.save(os.path.join(index_dir, f"part={pid}"))
            yield pd.DataFrame(
                [{"pid": pid, "n_series": len(ids),
                  "build_stats": json.dumps(idx.build_stats.to_dict())}]
            )

        t0 = time.perf_counter()
        meta_rows = (
            df.repartition(cfg.num_partitions)
            .mapInPandas(build_fn, schema=_META_SCHEMA)
            .collect()
        )
        build_wall = time.perf_counter() - t0
        partitions = [
            {"pid": r.pid, "n_series": r.n_series,
             "build_stats": json.loads(r.build_stats)}
            for r in sorted(meta_rows, key=lambda r: r.pid)
        ]
        with open(os.path.join(index_dir, "meta.json"), "w") as f:
            json.dump({"method": method, "cfg": cfg_json, "partitions": partitions}, f)
        return DistributedIndex(index_dir, method, cfg, partitions), build_wall

    @staticmethod
    def open(index_dir: str) -> "DistributedIndex":
        with open(os.path.join(index_dir, "meta.json")) as f:
            meta = json.load(f)
        return DistributedIndex(
            index_dir, meta["method"], IndexConfig.from_json(meta["cfg"]),
            meta["partitions"],
        )

    @property
    def build_stats(self) -> BuildStats:
        return BuildStats.merge(
            [BuildStats(**p["build_stats"]) for p in self.partitions]
        )

    # ------------------------------------------------------------- query
    #: methods with a cheap approximate phase: these run the two-round
    #: protocol replicating the paper's shared-memory BSF_k (round one
    #: approximate per partition -> driver takes the global k-th best ->
    #: round two exact, seeded with that bound).
    TWO_PHASE = ("hercules", "dstree", "paris")

    def knn(
        self,
        spark: SparkSession,
        Q: np.ndarray,
        k: int,
        *,
        mode: str = "hercules",
    ) -> tuple[DataFrame, dict[int, QueryStats], float]:
        """Answer a batch of queries.

        Returns ``(topk_df, per_query_stats, query_wall_s)`` where
        ``topk_df`` has columns (qid, sid, dist, rank) — the global
        top-k per query, merged by a Spark SQL window over the
        per-partition candidates of both rounds.
        """
        Q = np.ascontiguousarray(np.atleast_2d(Q), dtype=np.float32)
        qb = spark.sparkContext.broadcast(Q)
        method, index_dir = self.method, self.index_dir
        pids = [p["pid"] for p in self.partitions]

        def make_query_fn(phase: str, bsf0_map: dict[int, float] | None):
            def query_fn(batches):
                for pdf in batches:
                    for pid in pdf["pid"]:
                        part_dir = os.path.join(index_dir, f"part={int(pid)}")
                        searcher = _load_partition(method, part_dir)
                        Qloc = qb.value
                        out = []
                        for qid in range(len(Qloc)):
                            kw = {"phase": phase}
                            if bsf0_map is not None and qid in bsf0_map:
                                kw["bsf0"] = bsf0_map[qid]
                            if method == "hercules":
                                kw["mode"] = mode
                            results, stats = searcher.knn(Qloc[qid], k, **kw)
                            for dist, sid in results:
                                out.append((qid, int(pid), sid, float(dist), None))
                            out.append((qid, int(pid), -1, None,
                                        json.dumps(stats.to_dict())))
                        yield pd.DataFrame(
                            out, columns=["qid", "pid", "sid", "dist", "stats"]
                        )

            return query_fn

        parts_df = spark.createDataFrame(
            [(p,) for p in pids], "pid int"
        ).repartition(len(pids), "pid")

        def run_round(phase: str, bsf0_map=None):
            raw = parts_df.mapInPandas(
                make_query_fn(phase, bsf0_map), schema=_OUT_SCHEMA
            ).persist()
            cand = raw.where(F.col("sid") >= 0).select("qid", "sid", "dist").toPandas()
            stats_rows = raw.where(F.col("sid") < 0).select("qid", "pid", "stats").collect()
            raw.unpersist()
            return cand, stats_rows

        t0 = time.perf_counter()
        all_cand, all_stats = [], []
        if method in self.TWO_PHASE:
            cand1, stats1 = run_round("approx")
            all_cand.append(cand1)
            all_stats.extend(stats1)
            # Global BSF_k per query: the k-th best approximate distance.
            bsf0_map: dict[int, float] = {}
            for qid, grp in cand1.groupby("qid"):
                d = np.sort(grp["dist"].to_numpy())
                if d.size >= k:
                    bsf0_map[int(qid)] = float(d[k - 1])
            cand2, stats2 = run_round("exact", bsf0_map)
            all_cand.append(cand2)
            all_stats.extend(stats2)
        else:
            cand, stats_rows = run_round("full")
            all_cand.append(cand)
            all_stats.extend(stats_rows)

        # Global top-k merge in Spark SQL. Candidates may repeat across
        # rounds: dedup per (qid, sid) before ranking.
        cand_df = spark.createDataFrame(
            pd.concat(all_cand, ignore_index=True),
            schema="qid bigint, sid bigint, dist double",
        )
        dedup = cand_df.groupBy("qid", "sid").agg(F.min("dist").alias("dist"))
        w = Window.partitionBy("qid").orderBy(F.col("dist").asc(), F.col("sid").asc())
        topk = (
            dedup.withColumn("rank", F.row_number().over(w))
            .where(F.col("rank") <= k)
            .select("qid", "sid", "dist", "rank")
        )
        topk_pdf = topk.toPandas()  # materialize: the timed query work
        wall = time.perf_counter() - t0
        qb.unpersist()

        # Per (qid, pid): sum sequential rounds; then merge partitions.
        by_qid_pid: dict[tuple[int, int], list[QueryStats]] = {}
        for r in all_stats:
            by_qid_pid.setdefault((r.qid, r.pid), []).append(
                QueryStats(**json.loads(r.stats))
            )
        grouped: dict[int, list[QueryStats]] = {}
        for (qid, _pid), rounds in by_qid_pid.items():
            grouped.setdefault(qid, []).append(QueryStats.merge_sequential(rounds))
        per_query = {qid: QueryStats.merge(parts) for qid, parts in grouped.items()}
        topk_df = spark.createDataFrame(
            topk_pdf, schema="qid bigint, sid bigint, dist double, rank int"
        )
        return topk_df, per_query, wall
