"""spark-submit entrypoint for Table XI (DCSGA on Wiki)."""
from _common import emit, parse_scale, session

from repro.tables import table10_13

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table11")
    emit("Table XI: DCSGA on Wiki",
         table10_13.run_affinity(spark, ["wiki"], scale),
         table10_13.COLUMNS_GA)
