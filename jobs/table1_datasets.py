"""Table 1 — characteristics of the (synthetic) AIS datasets.

Usage: ``python jobs/table1_datasets.py`` (or spark-submit).
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, format_table, table1


def main() -> None:
    spark = get_spark("table1")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Table 1: Characteristics of the AIS datasets (synthetic, scaled)")
    print(format_table(table1(lab)))
    spark.stop()


if __name__ == "__main__":
    main()
