"""Path densification, path length, and rate-of-turn statistics.

The paper densifies paths so consecutive positions are at most 250 m apart
before computing DTW (§4.1), and reports per-path turn statistics — count of
positions, average and maximum rate of turn, number of turns > 45° — in
Table 3.
"""
from __future__ import annotations

import numpy as np

from repro.geo.geodesy import angle_diff_deg, haversine_m, initial_bearing_deg


def path_length_m(lon: np.ndarray, lat: np.ndarray) -> float:
    """Total along-path great-circle length in meters."""
    lon = np.asarray(lon, dtype=np.float64)
    lat = np.asarray(lat, dtype=np.float64)
    if lon.size < 2:
        return 0.0
    return float(haversine_m(lon[:-1], lat[:-1], lon[1:], lat[1:]).sum())


def densify(lon: np.ndarray, lat: np.ndarray, max_spacing_m: float = 250.0) -> tuple[np.ndarray, np.ndarray]:
    """Insert points so consecutive vertices are <= ``max_spacing_m`` apart.

    Interpolation is linear in lon/lat, which is accurate at the sub-km
    segment lengths used here. Original vertices are preserved.
    """
    lon = np.asarray(lon, dtype=np.float64)
    lat = np.asarray(lat, dtype=np.float64)
    if lon.size < 2:
        return lon.copy(), lat.copy()
    seg = haversine_m(lon[:-1], lat[:-1], lon[1:], lat[1:])
    n_splits = np.maximum(1, np.ceil(seg / max_spacing_m).astype(np.int64))
    out_lon = [lon[:1]]
    out_lat = [lat[:1]]
    for i in range(lon.size - 1):
        n = n_splits[i]
        frac = np.arange(1, n + 1, dtype=np.float64) / n
        out_lon.append(lon[i] + frac * (lon[i + 1] - lon[i]))
        out_lat.append(lat[i] + frac * (lat[i + 1] - lat[i]))
    return np.concatenate(out_lon), np.concatenate(out_lat)


def turn_stats(lon: np.ndarray, lat: np.ndarray) -> dict:
    """Turn statistics of a path, as reported in the paper's Table 3.

    Returns ``cnt`` (number of positions), ``avg_rot`` / ``max_rot``
    (mean / max absolute course change in degrees at interior vertices), and
    ``gt45`` (count of interior vertices where the turn exceeds 45°).
    Degenerate (zero-length) segments are skipped when computing bearings.
    """
    lon = np.asarray(lon, dtype=np.float64)
    lat = np.asarray(lat, dtype=np.float64)
    cnt = int(lon.size)
    # Collapse consecutive duplicate vertices: bearings are undefined there.
    if cnt >= 2:
        keep = np.concatenate([[True], (np.diff(lon) != 0) | (np.diff(lat) != 0)])
        lon, lat = lon[keep], lat[keep]
    if lon.size < 3:
        return {"cnt": cnt, "avg_rot": 0.0, "max_rot": 0.0, "gt45": 0}
    brg = initial_bearing_deg(lon[:-1], lat[:-1], lon[1:], lat[1:])
    rot = np.abs(angle_diff_deg(brg[1:], brg[:-1]))
    return {
        "cnt": cnt,
        "avg_rot": float(rot.mean()),
        "max_rot": float(rot.max()),
        "gt45": int((rot > 45.0).sum()),
    }
