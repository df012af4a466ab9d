"""Benchmark: regenerate EXPERIMENTS.md Table 1 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table1


def test_table1(spark, benchmark):
    table = run_and_record(benchmark, "table1", lambda: run_table1(spark))
    assert len(table) > 0
