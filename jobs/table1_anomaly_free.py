"""T1 (§III exp. 1): P/R/F1 of all detectors under anomaly-free training."""
from _common import get_spark, show

from repro.evaluation.tables import run_table1

if __name__ == "__main__":
    spark = get_spark("monilog-table1")
    show("Table 1 — anomaly-free training comparison", run_table1(spark))
    spark.stop()
