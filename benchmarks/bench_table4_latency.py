"""Benchmarks for Table 4: per-query imputation latency, HABIT vs GTI.

These are the numbers the paper's Table 4 reports: single-gap query latency
per method configuration, on the same gap set.
"""
import pytest


def _first_gap(blab, name):
    gaps = blab.gaps(name)
    assert gaps, f"no gaps at bench scale for {name}"
    return gaps[0]


@pytest.mark.benchmark(group="table4-habit")
@pytest.mark.parametrize("res,t", [(9, 100.0), (9, 250.0), (10, 100.0), (10, 250.0)])
def test_bench_habit_query(benchmark, blab, res, t):
    h = blab.habit("KIEL", res, t=t)
    g = _first_gap(blab, "KIEL")
    out = benchmark(h.impute, g.start_lon, g.start_lat, g.end_lon, g.end_lat)
    assert out.lon.size >= 2


@pytest.mark.benchmark(group="table4-gti")
@pytest.mark.parametrize("rd", [1e-4, 5e-4, 1e-3])
def test_bench_gti_query(benchmark, blab, rd):
    gti = blab.gti("KIEL", rm_m=250.0, rd_deg=rd)
    g = _first_gap(blab, "KIEL")
    out = benchmark(gti.impute, g.start_lon, g.start_lat, g.end_lon, g.end_lat)
    assert out.lon.size >= 2


@pytest.mark.benchmark(group="table4-sar")
def test_bench_habit_query_sar(benchmark, blab):
    h = blab.habit("SAR", 9, t=100.0)
    g = _first_gap(blab, "SAR")
    out = benchmark(h.impute, g.start_lon, g.start_lat, g.end_lon, g.end_lat)
    assert out.lon.size >= 2
