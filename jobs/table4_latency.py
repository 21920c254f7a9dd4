"""Table 4 — average and maximum imputation query latency (seconds).

Usage: ``python jobs/table4_latency.py`` (or spark-submit).
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, format_table, table4


def main() -> None:
    spark = get_spark("table4")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Table 4: Average and maximum query latency (sec)")
    print(format_table(table4(lab), floatfmt="{:.4f}"))
    spark.stop()


if __name__ == "__main__":
    main()
