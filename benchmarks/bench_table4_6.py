"""Benchmark + reports for Tables 4 and 6 (and the shared k-sweep data
behind Tables 5 and 7): BC-DFS / IDX-DFS / IDX-JOIN on ep-like and
gg-like graphs with k swept."""
from __future__ import annotations

from pathlib import Path

from repro.exp.experiments import (
    RESULTS_DIR,
    ksweep_experiment,
    save_stats,
    table4_report,
    table6_report,
)


def test_table4_and_6(spark, benchmark):
    stats = benchmark.pedantic(lambda: ksweep_experiment(spark), rounds=1, iterations=1)
    save_stats("ksweep", stats)
    r4, r6 = table4_report(stats), table6_report(stats)
    Path(RESULTS_DIR / "table4.md").write_text(r4 + "\n")
    Path(RESULTS_DIR / "table6.md").write_text(r6 + "\n")
    print("\n" + r4 + "\n\n" + r6)
    # shape: result counts must grow with k on each graph
    by = {}
    for s in stats:
        if s.algo == "IDX-DFS" and not s.timed_out:
            by.setdefault((s.graph, s.k), []).append(s.n_results)
    for g in {g for g, _ in by}:
        ks = sorted(k for gg, k in by if gg == g)
        avgs = [sum(by[(g, k)]) / len(by[(g, k)]) for k in ks]
        assert all(a <= b * 1.01 + 5 for a, b in zip(avgs, avgs[1:])) or len(avgs) < 2
