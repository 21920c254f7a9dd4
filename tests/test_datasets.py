"""Unit tests for the DAN / KIEL / SAR dataset builders."""
import numpy as np
import pandas as pd
import pytest

from repro.ais.datasets import RAW_COLUMNS, REGION_OF, build_dan, build_kiel, build_sar, dataset


@pytest.mark.parametrize("builder", [build_kiel, build_dan, build_sar])
def test_schema(builder):
    pdf = builder(0.03)
    assert list(pdf.columns) == RAW_COLUMNS
    assert pdf["ts"].dtype == "datetime64[ns]"
    assert pdf["lon"].dtype == np.float64
    assert pdf["vessel_id"].dtype == object


@pytest.mark.parametrize("builder", [build_kiel, build_dan, build_sar])
def test_deterministic(builder):
    pd.testing.assert_frame_equal(builder(0.03), builder(0.03))


def test_kiel_two_ships():
    pdf = build_kiel(0.1)
    assert pdf["vessel_id"].nunique() == 2
    assert set(pdf["vtype"]) == {"Passenger"}


def test_dan_sixteen_ships_passenger_only():
    pdf = build_dan(0.1)
    assert pdf["vessel_id"].nunique() <= 16
    assert pdf["vessel_id"].nunique() >= 8
    assert set(pdf["vtype"]) == {"Passenger"}


def test_sar_mixed_fleet():
    pdf = build_sar(0.06)
    assert {"Passenger", "Fishing"} <= set(pdf["vtype"])
    assert pdf["vessel_id"].nunique() > 20


def test_sf_scales_positions():
    small = build_kiel(0.05)
    large = build_kiel(0.2)
    assert len(large) > 2.0 * len(small)


def test_sorted_per_vessel():
    pdf = build_kiel(0.05)
    for _, g in pdf.groupby("vessel_id"):
        assert g["ts"].is_monotonic_increasing


def test_contains_stops_and_moving():
    pdf = build_kiel(0.05)
    assert (pdf["sog"] < 0.5).any(), "port stops must be present"
    assert (pdf["sog"] > 10).any(), "cruise segments must be present"


def test_timestamps_whole_seconds():
    pdf = build_kiel(0.05)
    assert (pdf["ts"].dt.microsecond == 0).all()
    assert (pdf["ts"].dt.nanosecond == 0).all()


def test_positions_inside_region():
    for name in ("KIEL", "DAN", "SAR"):
        pdf = dataset(name, 0.03)
        region = REGION_OF[name]
        ok = pdf["lon"].between(-180, 180) & pdf["lat"].between(-90, 90)
        valid = pdf[ok]
        # valid positions cluster within ~500 km of the region anchor
        assert (np.abs(valid["lat"] - region.lat0) < 5).mean() > 0.99


def test_dataset_cache_returns_same_object():
    a = dataset("KIEL", 0.03)
    b = dataset("KIEL", 0.03)
    assert a is b
