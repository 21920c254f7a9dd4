"""Sanity tests for the synthetic region definitions."""
import numpy as np
import pytest

from repro.ais.region import (
    DAN_REGION,
    KIEL_GOTHENBURG,
    KIEL_REGION,
    SAR_BOX,
    SAR_REGION,
    Route,
)
from repro.geo.geodesy import haversine_m
from repro.geo.resample import path_length_m


@pytest.mark.parametrize("region", [DAN_REGION, KIEL_REGION, SAR_REGION])
def test_region_has_ports_and_routes(region):
    assert len(region.ports) >= 2
    assert len(region.routes) >= 1


@pytest.mark.parametrize("region", [DAN_REGION, KIEL_REGION, SAR_REGION])
def test_routes_start_and_end_near_ports(region):
    port_lon = np.array([p.lon for p in region.ports])
    port_lat = np.array([p.lat for p in region.ports])
    for r in region.routes:
        for lon, lat in (r.waypoints[0], r.waypoints[-1]):
            d = haversine_m(np.full(port_lon.size, lon), np.full(port_lon.size, lat), port_lon, port_lat)
            assert float(d.min()) < 30_000


@pytest.mark.parametrize("region", [DAN_REGION, SAR_REGION])
def test_routes_are_curved(region):
    """Lanes must deviate from the straight chord (otherwise SLI would be
    a perfect baseline and the imputation problem trivial)."""
    curved = 0
    for r in region.routes:
        wp = np.asarray(r.waypoints)
        chord = float(haversine_m(wp[0, 0], wp[0, 1], wp[-1, 0], wp[-1, 1]))
        along = path_length_m(wp[:, 0], wp[:, 1])
        if along > chord * 1.01:
            curved += 1
    assert curved >= len(region.routes) * 0.6


def test_route_reversed():
    rev = KIEL_GOTHENBURG.reversed()
    assert rev.waypoints == KIEL_GOTHENBURG.waypoints[::-1]
    assert rev.name.endswith(":rev")


def test_both_ways_doubles_routes():
    assert len(KIEL_REGION.both_ways()) == 2 * len(KIEL_REGION.routes)


def test_dan_region_has_ten_ports():
    assert len(DAN_REGION.ports) == 10
    assert len(SAR_REGION.ports) == 10


def test_kiel_region_shares_dan_anchor():
    """Same waters, same projection anchor: cell ids comparable."""
    assert (KIEL_REGION.lon0, KIEL_REGION.lat0) == (DAN_REGION.lon0, DAN_REGION.lat0)


def test_sar_box_contains_sar_ports():
    lon_min, lat_min, lon_max, lat_max = SAR_BOX
    for p in SAR_REGION.ports:
        assert lon_min - 0.2 <= p.lon <= lon_max + 0.2
        assert lat_min - 0.2 <= p.lat <= lat_max + 0.2


def test_route_is_frozen():
    with pytest.raises(AttributeError):
        KIEL_GOTHENBURG.name = "x"


def test_kiel_route_length_realistic():
    wp = np.asarray(KIEL_GOTHENBURG.waypoints)
    km = path_length_m(wp[:, 0], wp[:, 1]) / 1000.0
    assert 300 < km < 550  # Kiel–Gothenburg is ~420 km by sea
