"""Benchmark: regenerate EXPERIMENTS.md Table 2 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table2


def test_table2(spark, benchmark):
    table = run_and_record(benchmark, "table2", lambda: run_table2(spark))
    assert len(table) > 0
