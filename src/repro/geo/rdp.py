"""Ramer–Douglas–Peucker line simplification with a tolerance in meters.

Used in the paper's §3.4 to smooth grid-following zig-zags out of imputed
paths. The perpendicular distance is computed in a local equirectangular
projection about the path's mean position, so the tolerance parameter ``t``
carries the paper's meaning (meters of maximum allowable deviation).
"""
from __future__ import annotations

import numpy as np

from repro.geo.geodesy import local_xy


def _rdp_mask(x: np.ndarray, y: np.ndarray, tol: float) -> np.ndarray:
    """Boolean keep-mask for planar RDP (iterative, stack-based)."""
    n = x.size
    keep = np.zeros(n, dtype=bool)
    keep[0] = keep[-1] = True
    stack = [(0, n - 1)]
    while stack:
        i, j = stack.pop()
        if j <= i + 1:
            continue
        dx, dy = x[j] - x[i], y[j] - y[i]
        seg_len2 = dx * dx + dy * dy
        px = x[i + 1 : j] - x[i]
        py = y[i + 1 : j] - y[i]
        if seg_len2 == 0.0:
            d2 = px * px + py * py
        else:
            cross = px * dy - py * dx
            d2 = cross * cross / seg_len2
        k = int(np.argmax(d2))
        if d2[k] > tol * tol:
            m = i + 1 + k
            keep[m] = True
            stack.append((i, m))
            stack.append((m, j))
    return keep


def rdp(lon: np.ndarray, lat: np.ndarray, tolerance_m: float) -> tuple[np.ndarray, np.ndarray]:
    """Simplify a lon/lat path, keeping points deviating > ``tolerance_m``.

    ``tolerance_m <= 0`` returns the path unchanged (the paper's ``t = 0``
    configuration, i.e. no simplification).
    """
    lon = np.asarray(lon, dtype=np.float64)
    lat = np.asarray(lat, dtype=np.float64)
    if tolerance_m <= 0.0 or lon.size <= 2:
        return lon.copy(), lat.copy()
    x, y = local_xy(lon, lat, float(lon.mean()), float(lat.mean()))
    keep = _rdp_mask(x, y, tolerance_m)
    return lon[keep], lat[keep]
