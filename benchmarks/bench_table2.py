"""Benchmark reproducing T2: very large datasets at bench scale (paper Fig.7)."""
from benchmarks._bench_common import run_table_once

from repro.experiments.tables import run_table2


def test_table2(benchmark, spark):
    run_table_once(benchmark, spark, run_table2, "table2")
