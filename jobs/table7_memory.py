"""Run (or reuse) the k-sweep and print Table 7 (memory consumption)."""
from _common import get_spark, sweep_stats

from repro.exp.experiments import table7_report

if __name__ == "__main__":
    spark = get_spark("table7")
    print(table7_report(sweep_stats(spark)))
    spark.stop()
