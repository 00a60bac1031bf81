"""spark-submit entrypoint for Tables III & IV (DBLP co-author groups)."""
from _common import emit, parse_scale, session

from repro.tables import table03_04

if __name__ == "__main__":
    scale = parse_scale()
    spark = session("table03_04")
    t3, t4 = table03_04.run(spark, scale)
    emit("Table III: co-author groups", t3, table03_04.COLUMNS_T3)
    emit("Table IV: co-author group info", t4, table03_04.COLUMNS_T4)
