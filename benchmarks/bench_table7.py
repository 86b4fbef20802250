"""Benchmark reproducing T7: ablation study at bench scale (paper Fig.12)."""
from benchmarks._bench_common import run_table_once

from repro.experiments.tables import run_table7


def test_table7(benchmark, spark):
    run_table_once(benchmark, spark, run_table7, "table7")
