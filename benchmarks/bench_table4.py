"""Benchmark: regenerate EXPERIMENTS.md Table 4 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table4


def test_table4(spark, benchmark):
    table = run_and_record(benchmark, "table4", lambda: run_table4(spark))
    assert len(table) > 0
