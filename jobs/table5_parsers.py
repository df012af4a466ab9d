"""T5 (§IV): online log parser benchmark with the Eq. 1 token metric."""
from _common import get_spark, show

from repro.evaluation.tables import run_table5

if __name__ == "__main__":
    spark = get_spark("monilog-table5")
    show("Table 5 — online parser benchmark", run_table5(spark))
    spark.stop()
