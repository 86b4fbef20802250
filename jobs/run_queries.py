"""spark-submit entrypoint: answer a k-NN workload on a built index.

Example::

    spark-submit jobs/run_queries.py --index-dir /tmp/deep_idx \
        --dataset deep_like --n 20000 --workload 5% --queries 10 --k 10
"""
from __future__ import annotations

import argparse

from _common import get_spark
from repro.experiments.costmodel import CostModel
from repro.experiments.harness import run_queries
from repro.spark.partitioned_index import DistributedIndex
from repro.workloads import generators as gen

if __name__ == "__main__":
    p = argparse.ArgumentParser()
    p.add_argument("--index-dir", required=True)
    p.add_argument("--dataset", choices=gen.DATASETS, default="synth")
    p.add_argument("--n", type=int, default=10_000)
    p.add_argument("--length", type=int, default=None)
    p.add_argument("--workload", choices=list(gen.WORKLOADS), default="5%")
    p.add_argument("--queries", type=int, default=10)
    p.add_argument("--k", type=int, default=1)
    p.add_argument("--seed", type=int, default=0)
    args = p.parse_args()

    spark = get_spark("repro-query")
    try:
        idx = DistributedIndex.open(args.index_dir)
        if args.workload == "ood":
            _, Q = gen.dataset_with_queries(
                args.dataset, args.n, args.queries, "ood", args.length, args.seed
            )
        else:
            X = gen.dataset(args.dataset, args.n, args.length, args.seed)
            Q = gen.queries_for(X, args.workload, args.queries, args.seed + 1)
        res = run_queries(spark, idx, Q, k=args.k, cost=CostModel())
        print(f"{len(Q)} queries: wall {res['query_wall_s']:.2f}s, "
              f"sim/query {res['query_sim_s'] * 1e3:.2f}ms, "
              f"accessed {res['pct_accessed']:.1f}% of data")
        res["topk"].show(5)
    finally:
        spark.stop()
