"""Run (or reuse) the k-sweep and print Table 4 (query-time distribution)."""
from _common import get_spark, sweep_stats

from repro.exp.experiments import table4_report

if __name__ == "__main__":
    spark = get_spark("table4")
    print(table4_report(sweep_stats(spark)))
    spark.stop()
