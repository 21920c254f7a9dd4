"""Run every table/figure harness at bench scale in one session.

Sharing one ``Lab`` lets the table harnesses reuse dataset builds and model
fits (e.g., Table 2's fitted models also serve Table 4 and Figure 5).
Output of this job is what EXPERIMENTS.md records.

Usage: ``python jobs/run_all.py`` (REPRO_SF overrides the scale).
"""
import time

from _common import bench_sf, get_spark

from repro.eval.tables import (
    Lab,
    fig3_projection,
    fig5_accuracy,
    fig7_gap_durations,
    format_table,
    table1,
    table2,
    table3,
    table4,
)


def main() -> None:
    spark = get_spark("run_all")
    spark.sparkContext.setLogLevel("ERROR")
    lab = Lab(spark, sf=bench_sf())
    sections = [
        ("Table 1: Characteristics of the AIS datasets", table1, "{:.2f}"),
        ("Table 2: Framework storage size (MB)", table2, "{:.3f}"),
        ("Table 3: Effect of simplification (DAN; t=-1 is Original)", table3, "{:.2f}"),
        ("Table 4: Avg and max query latency (sec)", table4, "{:.4f}"),
        ("Figure 3 (shape): DTW by resolution and projection p [DAN]", fig3_projection, "{:.1f}"),
        ("Figure 5 (shape): DTW accuracy, 60-min gaps", fig5_accuracy, "{:.1f}"),
        ("Figure 7 (shape): HABIT DTW by gap duration", fig7_gap_durations, "{:.1f}"),
    ]
    for title, fn, fmt in sections:
        t0 = time.time()
        pdf = fn(lab)
        print(f"\n=== {title}  [sf={lab.sf}, {time.time() - t0:.1f}s] ===")
        print(format_table(pdf, floatfmt=fmt))
    spark.stop()


if __name__ == "__main__":
    main()
