"""Shared helper for the per-table benchmarks.

Each benchmark runs its table driver once at bench scale
(``pedantic(rounds=1)`` — a table run is minutes of Spark jobs, not a
microbenchmark), writes ``results/tableN.{json,md}``, and prints the
rows so ``bench_output.txt`` carries the numbers EXPERIMENTS.md cites.
"""
from __future__ import annotations

import os


def run_table_once(benchmark, spark, table_fn, name: str):
    scale = os.environ.get("REPRO_BENCH_SCALE", "bench")
    result = benchmark.pedantic(
        lambda: table_fn(spark, scale=scale), rounds=1, iterations=1
    )
    rows = result if isinstance(result, list) else [r for part in result for r in part]
    print(f"\n=== {name} ({len(rows)} rows) ===")
    from repro.experiments.tables import RESULTS_DIR

    names = [name] if name != "table45" else ["table4", "table5"]
    for n in names:
        path = os.path.join(RESULTS_DIR, f"{n}.md")
        if os.path.isfile(path):
            print(open(path).read())
    return rows
