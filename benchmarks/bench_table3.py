"""Benchmark: regenerate EXPERIMENTS.md Table 3 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table3


def test_table3(spark, benchmark):
    table = run_and_record(benchmark, "table3", lambda: run_table3(spark))
    assert len(table) > 0
