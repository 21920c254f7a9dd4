"""Figure 5 shape check — DTW accuracy of SLI / HABIT / GTI (60-min gaps).

Figures are out of scope for the reproduction; this job prints the numbers
behind Figure 5 so the qualitative ordering can be verified.
Usage: ``python jobs/fig5_accuracy.py``.
"""
from _common import bench_sf, get_spark

from repro.eval.tables import Lab, fig5_accuracy, format_table


def main() -> None:
    spark = get_spark("fig5")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    print("Figure 5 (shape check): DTW accuracy, 60-min gaps")
    print(format_table(fig5_accuracy(lab)))
    spark.stop()


if __name__ == "__main__":
    main()
