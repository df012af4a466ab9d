"""Benchmark: regenerate EXPERIMENTS.md Table 8 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table8


def test_table8(spark, benchmark):
    table = run_and_record(benchmark, "table8", lambda: run_table8(spark))
    assert len(table) > 0
