"""T3 (§III exp. 3): sequence vs counter detectors under multi-source mixing."""
from _common import get_spark, show

from repro.evaluation.tables import run_table3

if __name__ == "__main__":
    spark = get_spark("monilog-table3")
    show("Table 3 — multi-source mixing", run_table3(spark))
    spark.stop()
