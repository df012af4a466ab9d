"""T6 (§IV): effect of structured-data (JSON tail) extraction on parsing."""
from _common import get_spark, show

from repro.evaluation.tables import run_table6

if __name__ == "__main__":
    spark = get_spark("monilog-table6")
    show("Table 6 — JSON/XML extraction study", run_table6(spark))
    spark.stop()
