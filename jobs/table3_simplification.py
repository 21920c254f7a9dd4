"""Table 3 — effect of RDP simplification on imputed DAN trajectories.

Usage: ``python jobs/table3_simplification.py`` (or spark-submit).
The row with t = -1 is the paper's "Original" (ground-truth paths) row.
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, format_table, table3


def main() -> None:
    spark = get_spark("table3")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Table 3: Effect of simplification (DAN, 60-min gaps; t=-1 is Original)")
    print(format_table(table3(lab)))
    spark.stop()


if __name__ == "__main__":
    main()
