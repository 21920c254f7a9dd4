"""Table 2 — framework storage size (MB): HABIT r sweep vs GTI rd sweep.

Usage: ``python jobs/table2_storage.py`` (or spark-submit).
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, format_table, table2


def main() -> None:
    spark = get_spark("table2")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Table 2: Framework storage size (MB)")
    print(format_table(table2(lab)))
    spark.stop()


if __name__ == "__main__":
    main()
