"""T2 (§III exp. 2): detector robustness to log-parsing errors."""
from _common import get_spark, show

from repro.evaluation.tables import run_table2

if __name__ == "__main__":
    spark = get_spark("monilog-table2")
    show("Table 2 — robustness to parsing errors", run_table2(spark))
    spark.stop()
