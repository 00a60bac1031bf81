"""spark-submit entrypoint for Table X (DCSAD on Wiki)."""
from _common import emit, parse_scale, session

from repro.tables import table10_13

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table10")
    emit("Table X: DCSAD on Wiki",
         table10_13.run_avg_degree(spark, ["wiki"], scale),
         table10_13.COLUMNS_AD)
