"""spark-submit entrypoint for Table VII (DCSGA running-time comparison)."""
from _common import emit, parse_scale, session

from repro.tables import table07

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table07")
    emit("Table VII: DCSGA running time + SEA errors",
         table07.run(spark, scale), table07.COLUMNS)
