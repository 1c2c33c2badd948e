"""Run and print Table 3 (overall comparison of the five algorithms).

    spark-submit jobs/table3_overall.py [--k 4] [--queries 3]
"""
from __future__ import annotations

import argparse

from _common import get_spark

from repro.exp.experiments import (
    OverallConfig,
    overall_experiment,
    save_stats,
    table3_report,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--k", type=int, default=4)
    ap.add_argument("--queries", type=int, default=3)
    ap.add_argument("--timeout", type=float, default=25.0)
    args = ap.parse_args()
    spark = get_spark("table3")
    stats = overall_experiment(
        spark, OverallConfig(k=args.k, n_queries=args.queries, timeout_s=args.timeout)
    )
    save_stats("table3", stats)
    print(table3_report(stats))
    spark.stop()


if __name__ == "__main__":
    main()
