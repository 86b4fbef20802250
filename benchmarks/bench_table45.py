"""Benchmark reproducing T4+T5: query difficulty (combined times, per-query time + %accessed) at bench scale (paper Fig.9-10)."""
from benchmarks._bench_common import run_table_once

from repro.experiments.tables import run_table45


def test_table45(benchmark, spark):
    run_table_once(benchmark, spark, run_table45, "table45")
