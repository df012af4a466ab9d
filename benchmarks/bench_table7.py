"""Benchmark: regenerate EXPERIMENTS.md Table 7 at documented scale."""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table7


def test_table7(spark, benchmark):
    table = run_and_record(benchmark, "table7", lambda: run_table7(spark))
    assert len(table) > 0
