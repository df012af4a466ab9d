"""T8 (§II): parse/stream throughput of the distributed pipeline."""
from _common import get_spark, show

from repro.evaluation.tables import run_table8

if __name__ == "__main__":
    spark = get_spark("monilog-table8")
    show("Table 8 — distribution & streaming throughput", run_table8(spark))
    spark.stop()
