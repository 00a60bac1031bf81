"""spark-submit entrypoint for Table II (difference-graph statistics)."""
from _common import emit, parse_scale, session

from repro.tables import table02

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table02")
    emit("Table II: difference graph statistics",
         table02.run(spark, scale), table02.COLUMNS)
