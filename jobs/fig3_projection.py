"""Figure 3 shape check — HABIT DTW across resolutions for p = center vs
median projection (DAN dataset).

Usage: ``python jobs/fig3_projection.py``.
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, fig3_projection, format_table


def main() -> None:
    spark = get_spark("fig3")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Figure 3 (shape check): HABIT DTW by resolution and projection p")
    print(format_table(fig3_projection(lab)))
    spark.stop()


if __name__ == "__main__":
    main()
