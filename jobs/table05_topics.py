"""spark-submit entrypoint for Table V (emerging/disappearing DM topics)."""
from _common import emit, parse_scale, session

from repro.tables import table05_06

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table05")
    emit("Table V: top-5 emerging/disappearing topics",
         table05_06.run_table5(spark, scale), table05_06.COLUMNS)
