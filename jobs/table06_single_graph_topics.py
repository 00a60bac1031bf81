"""spark-submit entrypoint for Table VI (top topics in G1/G2 alone)."""
from _common import emit, parse_scale, session

from repro.tables import table05_06

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table06")
    emit("Table VI: top-5 topics per single graph",
         table05_06.run_table6(spark, scale), table05_06.COLUMNS)
