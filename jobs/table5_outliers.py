"""Run (or reuse) the k-sweep and print Table 5 (short vs long queries)."""
from _common import get_spark, sweep_stats

from repro.exp.experiments import table5_report

if __name__ == "__main__":
    spark = get_spark("table5")
    print(table5_report(sweep_stats(spark)))
    spark.stop()
