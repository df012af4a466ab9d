"""Shared helpers for the table benchmarks.

Each ``bench_table<N>.py`` regenerates EXPERIMENTS.md table N at the
documented scale inside pytest-benchmark (one round — these are
experiment harnesses, not micro-benchmarks), prints it, and persists it
under ``results/`` so the numbers in EXPERIMENTS.md can be re-diffed.
"""
import os

import pandas as pd

RESULTS_DIR = os.path.join(os.path.dirname(__file__), os.pardir, "results")


def run_and_record(benchmark, name: str, fn) -> pd.DataFrame:
    table = benchmark.pedantic(fn, rounds=1, iterations=1)
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{name}.txt")
    with open(path, "w") as f:
        f.write(table.to_string(index=False) + "\n")
    table.to_csv(os.path.join(RESULTS_DIR, f"{name}.csv"), index=False)
    print(f"\n=== {name} ===")
    print(table.to_string(index=False))
    return table
