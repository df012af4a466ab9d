"""Benchmark: regenerate EXPERIMENTS.md Table 6 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table6


def test_table6(spark, benchmark):
    table = run_and_record(benchmark, "table6", lambda: run_table6(spark))
    assert len(table) > 0
