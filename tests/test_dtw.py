"""Unit tests for the DTW accuracy metric, including a brute-force oracle."""
import numpy as np
import pytest

from repro.geo.dtw import dtw_m
from repro.geo.geodesy import local_xy


def _dtw_reference(xa, ya, xb, yb):
    """Textbook O(n*m) Python DTW; returns (total_cost, path_len)."""
    n, m = len(xa), len(xb)
    cost = np.hypot(xa[:, None] - xb[None, :], ya[:, None] - yb[None, :])
    acc = np.full((n + 1, m + 1), np.inf)
    steps = np.zeros((n + 1, m + 1), dtype=int)
    acc[0, 0] = 0.0
    for i in range(1, n + 1):
        for j in range(1, m + 1):
            options = [
                (acc[i - 1, j - 1], steps[i - 1, j - 1]),
                (acc[i - 1, j], steps[i - 1, j]),
                (acc[i, j - 1], steps[i, j - 1]),
            ]
            best, bs = min(options, key=lambda t: t[0])
            acc[i, j] = best + cost[i - 1, j - 1]
            steps[i, j] = bs + 1
    return acc[n, m], steps[n, m]


def test_identical_paths_zero():
    lon = np.linspace(10, 11, 30)
    lat = np.full(30, 55.0)
    assert dtw_m(lon, lat, lon, lat) == 0.0


def test_single_point_paths():
    d = dtw_m(np.array([0.0]), np.array([0.0]), np.array([0.0]), np.array([1.0]))
    assert d == pytest.approx(111_195, rel=1e-2)


def test_constant_offset():
    lon = np.linspace(0, 1, 40)
    lat_a = np.zeros(40)
    lat_b = np.full(40, 0.001)  # ~111 m north
    assert dtw_m(lon, lat_a, lon, lat_b) == pytest.approx(111.2, rel=0.02)


def test_empty_path_raises():
    with pytest.raises(ValueError):
        dtw_m(np.array([]), np.array([]), np.array([0.0]), np.array([0.0]))


def test_symmetry():
    rng = np.random.default_rng(0)
    la, fa = rng.uniform(10, 11, 20), rng.uniform(55, 55.5, 20)
    lb, fb = rng.uniform(10, 11, 25), rng.uniform(55, 55.5, 25)
    assert dtw_m(la, fa, lb, fb) == pytest.approx(dtw_m(lb, fb, la, fa), rel=1e-9)


@pytest.mark.parametrize("n,m", [(2, 2), (5, 3), (10, 10), (17, 9), (1, 8)])
def test_matches_bruteforce_reference(n, m):
    rng = np.random.default_rng(n * 100 + m)
    lon_a = 10.0 + rng.uniform(0, 0.5, n)
    lat_a = 55.0 + rng.uniform(0, 0.5, n)
    lon_b = 10.0 + rng.uniform(0, 0.5, m)
    lat_b = 55.0 + rng.uniform(0, 0.5, m)
    lon0 = float(np.concatenate([lon_a, lon_b]).mean())
    lat0 = float(np.concatenate([lat_a, lat_b]).mean())
    xa, ya = local_xy(lon_a, lat_a, lon0, lat0)
    xb, yb = local_xy(lon_b, lat_b, lon0, lat0)
    total, steps = _dtw_reference(xa, ya, xb, yb)
    assert dtw_m(lon_a, lat_a, lon_b, lat_b) == pytest.approx(total / steps, rel=1e-9)


def test_warping_handles_different_sampling():
    """Same geometric path sampled at different rates stays near zero."""
    lon_a = np.linspace(10, 11, 100)
    lon_b = np.linspace(10, 11, 37)
    lat_a = 55.0 + 0.1 * np.sin(lon_a * 10)
    lat_b = 55.0 + 0.1 * np.sin(lon_b * 10)
    d = dtw_m(lon_a, lat_a, lon_b, lat_b)
    # chordal resampling error stays far below the ~11 km curve amplitude
    assert d < 1500.0


def test_diverging_paths_scored_high():
    lon = np.linspace(10, 11, 50)
    lat_a = np.full(50, 55.0)
    lat_b = 55.0 + np.linspace(0, 0.5, 50)  # drifts ~55 km away
    assert dtw_m(lon, lat_a, lon, lat_b) > 10_000.0
