"""Benchmark reproducing T6: scalability with k at bench scale (paper Fig.11)."""
from benchmarks._bench_common import run_table_once

from repro.experiments.tables import run_table6


def test_table6(benchmark, spark):
    run_table_once(benchmark, spark, run_table6, "table6")
