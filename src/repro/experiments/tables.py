"""One driver per evaluation table (the paper's Figures 6-12).

Every driver takes the shared SparkSession and a ``scale``:

* ``"test"``  — tiny datasets for CI (structure + exactness checks);
* ``"bench"`` — the EXPERIMENTS.md runs (scaled ~10^4x down from the
  paper per DESIGN.md §3, preserving the leaf-size/dataset ratio).

Each driver returns its rows and writes ``results/tableN.json`` +
``results/tableN.md``.
"""
from __future__ import annotations

import json
import os

import numpy as np
from pyspark.sql import SparkSession

from repro.core.config import IndexConfig
from repro.experiments.costmodel import CostModel
from repro.experiments.harness import (
    BUILD_WORKERS,
    build_index,
    extrapolate,
    run_cell,
    run_queries,
)
from repro.workloads import generators as gen

METHODS = ("hercules", "dstree", "paris", "vafile", "pscan")
RESULTS_DIR = os.environ.get("REPRO_RESULTS_DIR", "results")
WORK_DIR = os.environ.get("REPRO_WORK_DIR", "/tmp/repro_indexes")


def _cfg(scale: str, **overrides) -> IndexConfig:
    base = dict(
        leaf_size=25 if scale == "test" else 100,
        max_segments=8 if scale == "test" else 16,
        sax_segments=8 if scale == "test" else 16,
        lmax=5 if scale == "test" else 20,
        paris_leaf_size=16 if scale == "test" else 64,
        db_size=64 if scale == "test" else 1000,
        num_partitions=2 if scale == "test" else 8,
    )
    base.update(overrides)
    return IndexConfig(**base)


def _write(table: str, rows: list[dict], caption: str) -> None:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, f"{table}.json"), "w") as f:
        json.dump({"caption": caption, "rows": rows}, f, indent=1, default=float)
    if rows:
        cols = list(rows[0].keys())
        lines = [f"# {caption}", "", "| " + " | ".join(cols) + " |",
                 "|" + "|".join("---" for _ in cols) + "|"]
        for r in rows:
            lines.append(
                "| " + " | ".join(
                    f"{r[c]:.4g}" if isinstance(r[c], float) else str(r[c])
                    for c in cols
                ) + " |"
            )
        with open(os.path.join(RESULTS_DIR, f"{table}.md"), "w") as f:
            f.write("\n".join(lines) + "\n")


def _ood_queries(n: int, length: int, n_queries: int, seed: int):
    """Fig.6/7/8-style synthetic queries: same random-walk generator as
    the dataset, different seed (the paper's Synth query workload)."""
    X = gen.random_walk(n, length, seed)
    Q = gen.random_walk(n_queries, length, seed + 7919)
    return X, Q


# ---------------------------------------------------------------- Table 1
def run_table1(spark: SparkSession, scale: str = "bench") -> list[dict]:
    """Fig. 6: idx + 100 / 10K 1-NN queries vs dataset size (Synth)."""
    if scale == "test":
        sizes, length, nq = [200, 400], 32, 3
    else:
        sizes, length, nq = [10_000, 20_000, 40_000, 100_000], 256, 10
    cfg = _cfg(scale)
    rows = []
    for n in sizes:
        X, Q = _ood_queries(n, length, nq, seed=1)
        ids = np.arange(n)
        for method in METHODS:
            cell = run_cell(
                spark, X, ids, Q, method=method, cfg=cfg,
                index_dir=os.path.join(WORK_DIR, f"t1_{method}_{n}"), k=1,
            )
            rows.append({"n_series": n, "method": method,
                         **{k: cell[k] for k in (
                             "build_sim_s", "query_sim_s", "combined_100_s",
                             "combined_10k_s", "build_wall_s", "query_wall_s",
                             "pct_accessed")}})
    _write("table1", rows, "T1 (Fig.6): scalability with dataset size, Synth 1-NN")
    return rows


# ---------------------------------------------------------------- Table 2
def run_table2(spark: SparkSession, scale: str = "bench") -> list[dict]:
    """Fig. 7: avg 1-NN query time on very large datasets."""
    if scale == "test":
        sizes, length, nq = [300], 32, 2
    else:
        sizes, length, nq = [200_000, 300_000], 256, 5
    cfg = _cfg(scale)
    rows = []
    for n in sizes:
        X, Q = _ood_queries(n, length, nq, seed=2)
        ids = np.arange(n)
        for method in METHODS:
            cell = run_cell(
                spark, X, ids, Q, method=method, cfg=cfg,
                index_dir=os.path.join(WORK_DIR, f"t2_{method}_{n}"), k=1,
            )
            rows.append({"n_series": n, "method": method,
                         "query_sim_s": cell["query_sim_s"],
                         "query_wall_s": cell["query_wall_s"],
                         "build_sim_s": cell["build_sim_s"],
                         "pct_accessed": cell["pct_accessed"]})
    _write("table2", rows, "T2 (Fig.7): avg 1-NN query time, very large datasets")
    return rows


# ---------------------------------------------------------------- Table 3
def run_table3(spark: SparkSession, scale: str = "bench") -> list[dict]:
    """Fig. 8: avg query time vs series length (fixed total points)."""
    if scale == "test":
        lengths, total_points, nq = [32, 64], 12_800, 2
    else:
        lengths, total_points, nq = [64, 128, 256, 512, 1024], 6_400_000, 5
    cfg = _cfg(scale)
    rows = []
    for length in lengths:
        n = max(total_points // length, 200)
        X, Q = _ood_queries(n, length, nq, seed=3)
        ids = np.arange(n)
        for method in METHODS:
            cell = run_cell(
                spark, X, ids, Q, method=method, cfg=cfg,
                index_dir=os.path.join(WORK_DIR, f"t3_{method}_{length}"), k=1,
            )
            rows.append({"length": length, "n_series": n, "method": method,
                         "query_sim_s": cell["query_sim_s"],
                         "query_wall_s": cell["query_wall_s"],
                         "pct_accessed": cell["pct_accessed"]})
    _write("table3", rows, "T3 (Fig.8): scalability with series length")
    return rows


# ----------------------------------------------------------- Tables 4 & 5
def run_table45(spark: SparkSession, scale: str = "bench") -> tuple[list, list]:
    """Fig. 9 + Fig. 10: query difficulty on the real-like datasets.

    Builds each (dataset, method) index once; runs every workload on
    it. Table 4 reports combined index+workload times, table 5 the
    per-query time and % data accessed.
    """
    if scale == "test":
        datasets = {"sald_like": (200, None)}
        workloads, nq = ["1%", "ood"], 2
    else:
        datasets = {"sald_like": (20_000, None), "seismic_like": (10_000, None),
                    "deep_like": (20_000, None)}
        workloads, nq = list(gen.WORKLOADS), 10
    cfg = _cfg(scale)
    cost = CostModel()
    rows4, rows5 = [], []
    for ds, (n, length) in datasets.items():
        # ood must share the generation with the dataset: generate per
        # workload, with the *same* indexed X for noise workloads.
        X_noise = gen.dataset(ds, n, length, seed=11)
        per_workload = {}
        for w in workloads:
            if w == "ood":
                per_workload[w] = gen.dataset_with_queries(ds, n, nq, w, length, seed=11)
            else:
                per_workload[w] = (X_noise, gen.queries_for(X_noise, w, nq, seed=13))
        for method in METHODS:
            built = {}
            for w in workloads:
                X, Q = per_workload[w]
                key = "ood" if w == "ood" else "noise"
                if key not in built:
                    built[key] = build_index(
                        spark, X, np.arange(len(X)), method=method, cfg=cfg,
                        index_dir=os.path.join(WORK_DIR, f"t45_{ds}_{method}_{key}"),
                        cost=cost,
                    )
                b = built[key]
                qres = run_queries(spark, b["index"], Q, k=1, cost=cost)
                rows4.append({
                    "dataset": ds, "workload": w, "method": method,
                    "build_sim_s": b["build_sim_s"],
                    "combined_100_s": b["build_sim_s"] + extrapolate(qres["query_sim_each"], 100),
                    "combined_10k_s": b["build_sim_s"] + extrapolate(qres["query_sim_each"], 10_000),
                })
                rows5.append({
                    "dataset": ds, "workload": w, "method": method,
                    "query_sim_s": qres["query_sim_s"],
                    "query_wall_s": qres["query_wall_s"],
                    "pct_accessed": qres["pct_accessed"],
                    "eapca_pr": qres["eapca_pr"], "sax_pr": qres["sax_pr"],
                })
    _write("table4", rows4, "T4 (Fig.9): combined idx+query time vs difficulty")
    _write("table5", rows5, "T5 (Fig.10): avg query time and %data accessed vs difficulty")
    return rows4, rows5


# ---------------------------------------------------------------- Table 6
def run_table6(spark: SparkSession, scale: str = "bench") -> list[dict]:
    """Fig. 11: scalability with k (5% workload)."""
    if scale == "test":
        datasets, ks, n, nq = ["synth"], [1, 5], 250, 2
    else:
        datasets, ks, n, nq = ["synth", "deep_like"], [1, 5, 10, 25, 50, 100], 20_000, 5
    cfg = _cfg(scale)
    cost = CostModel()
    rows = []
    for ds in datasets:
        length = 256 if ds == "synth" else None
        X = gen.dataset(ds, n, length, seed=21)
        Q = gen.queries_for(X, "5%", nq, seed=22)
        ids = np.arange(n)
        for method in METHODS:
            b = build_index(
                spark, X, ids, method=method, cfg=cfg,
                index_dir=os.path.join(WORK_DIR, f"t6_{ds}_{method}"), cost=cost,
            )
            for k in ks:
                qres = run_queries(spark, b["index"], Q, k=k, cost=cost)
                rows.append({"dataset": ds, "k": k, "method": method,
                             "query_sim_s": qres["query_sim_s"],
                             "pct_accessed": qres["pct_accessed"]})
    _write("table6", rows, "T6 (Fig.11): scalability with k, 5% workload")
    return rows


# ---------------------------------------------------------------- Table 7
def run_table7(spark: SparkSession, scale: str = "bench") -> list[dict]:
    """Fig. 12: ablation on deep_like.

    (a) index construction: DSTree*, DSTree*P, NoWPara, Hercules;
    (b) query answering: NoSAX, NoPara, NoThresh, Hercules on an easy
        (1%), medium (5%), and hard (ood) workload.
    """
    if scale == "test":
        n, nq, workloads = 250, 2, ["1%", "ood"]
    else:
        n, nq, workloads = 20_000, 10, ["1%", "5%", "ood"]
    cfg = _cfg(scale)
    cost = CostModel()
    rows = []

    # --- (a) index building variants
    X = gen.dataset("deep_like", n, seed=31)
    ids = np.arange(n)
    dstree = build_index(spark, X, ids, method="dstree", cfg=cfg,
                         index_dir=os.path.join(WORK_DIR, "t7_dstree"), cost=cost)
    bs = dstree["build_stats"]
    # DSTree*: single thread, no lock contention.
    rows.append({"part": "a_index", "variant": "dstree_star", "workload": "-",
                 "sim_s": cost.sim_build_time(bs, n_workers=1, lock_cost_s=0.0)})
    # DSTree*P: parallel inserts but path-locking on every internal node.
    rows.append({"part": "a_index", "variant": "dstree_star_p", "workload": "-",
                 "sim_s": cost.sim_build_time(bs, n_workers=cost.threads,
                                              lock_cost_s=2e-7)})
    nowp = build_index(spark, X, ids, method="hercules", cfg=cfg, variant="nowpara",
                       index_dir=os.path.join(WORK_DIR, "t7_nowpara"), cost=cost)
    rows.append({"part": "a_index", "variant": "nowpara", "workload": "-",
                 "sim_s": nowp["build_sim_s"]})
    herc = build_index(spark, X, ids, method="hercules", cfg=cfg,
                       index_dir=os.path.join(WORK_DIR, "t7_hercules"), cost=cost)
    rows.append({"part": "a_index", "variant": "hercules", "workload": "-",
                 "sim_s": herc["build_sim_s"]})

    # --- (b) query modes on the Hercules index
    for w in workloads:
        if w == "ood":
            Xw, Q = gen.dataset_with_queries("deep_like", n, nq, w, seed=31)
            idx = build_index(spark, Xw, np.arange(len(Xw)), method="hercules",
                              cfg=cfg, index_dir=os.path.join(WORK_DIR, "t7_ood"),
                              cost=cost)["index"]
        else:
            Q = gen.queries_for(X, w, nq, seed=33)
            idx = herc["index"]
        for mode in ("hercules", "nosax", "nopara", "nothresh"):
            qres = run_queries(spark, idx, Q, k=1, mode=mode, cost=cost)
            rows.append({"part": "b_query", "variant": mode, "workload": w,
                         "sim_s": qres["query_sim_s"]})
    _write("table7", rows, "T7 (Fig.12): ablation study, deep_like")
    return rows


ALL_TABLES = {
    "table1": run_table1,
    "table2": run_table2,
    "table3": run_table3,
    "table45": run_table45,
    "table6": run_table6,
    "table7": run_table7,
}
