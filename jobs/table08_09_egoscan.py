"""spark-submit entrypoint for Tables VIII & IX (EgoScan comparison)."""
from _common import emit, parse_scale, session

from repro.tables import table08_09

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table08_09")
    t8, t9 = table08_09.run(spark, scale)
    emit("Table VIII: EgoScan subgraphs", t8, table08_09.COLUMNS_T8)
    emit("Table IX: total edge weight difference", t9, table08_09.COLUMNS_T9)
