"""Benchmark: regenerate EXPERIMENTS.md Table 5 at documented scale.

Spell is O(lines x templates x LCS) in pure Python, so its rows are
measured on a 6k-line prefix (recorded in the table's lines_per_s).
"""
from benchmarks._bench_common import run_and_record

from repro.evaluation.tables import run_table5


def test_table5(spark, benchmark):
    table = run_and_record(benchmark, "table5",
                           lambda: run_table5(spark, n_sessions=2500, spell_max_lines=6000))
    assert len(table) > 0
