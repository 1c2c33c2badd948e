"""Report for Table 5 (short vs long queries) from the shared k-sweep.
Runs the sweep itself if bench_table4_6 has not produced it yet."""
from __future__ import annotations

from pathlib import Path

from repro.exp.experiments import (
    RESULTS_DIR,
    ksweep_experiment,
    load_stats,
    save_stats,
    table5_report,
)


def _stats(spark):
    try:
        return load_stats("ksweep")
    except FileNotFoundError:
        stats = ksweep_experiment(spark)
        save_stats("ksweep", stats)
        return stats


def test_table5(spark, benchmark):
    stats = _stats(spark)
    report = benchmark.pedantic(lambda: table5_report(stats), rounds=1, iterations=1)
    Path(RESULTS_DIR / "table5.md").write_text(report + "\n")
    print("\n" + report)
