"""T4 (LogRobust protocol): detector F1 vs log-instability ratio."""
from _common import get_spark, show

from repro.evaluation.tables import run_table4

if __name__ == "__main__":
    spark = get_spark("monilog-table4")
    show("Table 4 — log instability", run_table4(spark))
    spark.stop()
