"""spark-submit entrypoint for Table XIV (DCSGA on DBLP-C and Actor)."""
from _common import emit, parse_scale, session

from repro.tables import table14

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table14")
    emit("Table XIV: DCSGA on DBLP-C/Actor",
         table14.run(spark, scale), table14.COLUMNS)
