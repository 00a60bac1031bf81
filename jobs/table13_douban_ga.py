"""spark-submit entrypoint for Table XIII (DCSGA on Douban)."""
from _common import emit, parse_scale, session

from repro.tables import table10_13

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table13")
    emit("Table XIII: DCSGA on Douban",
         table10_13.run_affinity(spark, ["movie", "book"], scale),
         table10_13.COLUMNS_GA)
