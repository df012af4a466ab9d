"""T7 (§V): classifier accuracy vs number of admin feedback actions."""
from _common import get_spark, show

from repro.evaluation.tables import run_table7

if __name__ == "__main__":
    spark = get_spark("monilog-table7")
    show("Table 7 — feedback-trained classifier", run_table7(spark))
    spark.stop()
