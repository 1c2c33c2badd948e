"""Benchmark + report for Table 2 (suite generation and stats)."""
from __future__ import annotations

from pathlib import Path

from repro.exp.experiments import RESULTS_DIR, table2_experiment


def test_table2(benchmark):
    report = benchmark.pedantic(table2_experiment, rounds=1, iterations=1)
    RESULTS_DIR.mkdir(exist_ok=True)
    Path(RESULTS_DIR / "table2.md").write_text(report + "\n")
    print("\n" + report)
