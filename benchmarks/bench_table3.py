"""Benchmark reproducing T3: scalability with series length at bench scale (paper Fig.8)."""
from benchmarks._bench_common import run_table_once

from repro.experiments.tables import run_table3


def test_table3(benchmark, spark):
    run_table_once(benchmark, spark, run_table3, "table3")
