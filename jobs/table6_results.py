"""Run (or reuse) the k-sweep and print Table 6 (avg/max #results)."""
from _common import get_spark, sweep_stats

from repro.exp.experiments import table6_report

if __name__ == "__main__":
    spark = get_spark("table6")
    print(table6_report(sweep_stats(spark)))
    spark.stop()
