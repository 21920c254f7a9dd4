"""Figure 7 shape check — HABIT accuracy for 1/2/4-hour gaps.

Usage: ``python jobs/fig7_gap_durations.py``.
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, fig7_gap_durations, format_table


def main() -> None:
    spark = get_spark("fig7")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Figure 7 (shape check): HABIT DTW by gap duration")
    print(format_table(fig7_gap_durations(lab)))
    spark.stop()


if __name__ == "__main__":
    main()
