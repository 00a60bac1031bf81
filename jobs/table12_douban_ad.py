"""spark-submit entrypoint for Table XII (DCSAD on Douban)."""
from _common import emit, parse_scale, session

from repro.tables import table10_13

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table12")
    emit("Table XII: DCSAD on Douban",
         table10_13.run_avg_degree(spark, ["movie", "book"], scale),
         table10_13.COLUMNS_AD)
