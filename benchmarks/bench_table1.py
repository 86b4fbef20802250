"""Benchmark reproducing T1: scalability with dataset size at bench scale (paper Fig.6)."""
from benchmarks._bench_common import run_table_once

from repro.experiments.tables import run_table1


def test_table1(benchmark, spark):
    run_table_once(benchmark, spark, run_table1, "table1")
