"""Dynamic Time Warping between two lon/lat paths.

The paper's accuracy metric (§4.1, Berndt & Clifford DTW) with a metric
ground distance. ``dtw_m`` returns the *average* warped distance — total
alignment cost divided by warping-path length — in meters, so values are
comparable across gaps of different lengths (the paper reports "average
distances between the imputed and original paths").

The dynamic program is evaluated along anti-diagonals: every cell of
diagonal ``d`` depends only on diagonals ``d-1`` and ``d-2``, so each
diagonal is one vectorized numpy step. This is exact DTW (step pattern
{diag, up, left}), just O(n+m) numpy calls instead of O(n·m) Python ones.
"""
from __future__ import annotations

import numpy as np

from repro.geo.geodesy import local_xy


def dtw_m(lon_a: np.ndarray, lat_a: np.ndarray, lon_b: np.ndarray, lat_b: np.ndarray) -> float:
    """Average DTW distance (meters) between paths A and B.

    Pairwise ground distances use a local equirectangular projection about
    the joint centroid — exact enough at the tens-of-km gap scale and far
    cheaper than pairwise haversine for the O(n·m) cost matrix.
    """
    lon_a = np.asarray(lon_a, dtype=np.float64)
    lat_a = np.asarray(lat_a, dtype=np.float64)
    lon_b = np.asarray(lon_b, dtype=np.float64)
    lat_b = np.asarray(lat_b, dtype=np.float64)
    if lon_a.size == 0 or lon_b.size == 0:
        raise ValueError("empty path")
    lon0 = float(np.concatenate([lon_a, lon_b]).mean())
    lat0 = float(np.concatenate([lat_a, lat_b]).mean())
    xa, ya = local_xy(lon_a, lat_a, lon0, lat0)
    xb, yb = local_xy(lon_b, lat_b, lon0, lat0)
    cost = np.hypot(xa[:, None] - xb[None, :], ya[:, None] - yb[None, :])
    n, m = cost.shape

    inf = np.inf
    acc_p2 = np.full(n + 1, inf)  # accumulated cost on diagonal d-2, by row i
    acc_p1 = np.full(n + 1, inf)  # diagonal d-1
    st_p2 = np.zeros(n + 1, dtype=np.int64)  # warping-path lengths, same layout
    st_p1 = np.zeros(n + 1, dtype=np.int64)
    acc_p2[0] = 0.0  # cell (0, 0)

    for d in range(2, n + m + 1):
        i_lo, i_hi = max(1, d - m), min(n, d - 1)
        cur = np.full(n + 1, inf)
        st_cur = np.zeros(n + 1, dtype=np.int64)
        i = np.arange(i_lo, i_hi + 1)
        c = cost[i - 1, d - i - 1]
        cand = np.stack([acc_p2[i - 1], acc_p1[i - 1], acc_p1[i]])
        stc = np.stack([st_p2[i - 1], st_p1[i - 1], st_p1[i]])
        pick = np.argmin(cand, axis=0)
        cols = np.arange(i.size)
        cur[i] = cand[pick, cols] + c
        st_cur[i] = stc[pick, cols] + 1
        acc_p2, acc_p1 = acc_p1, cur
        st_p2, st_p1 = st_p1, st_cur

    return float(acc_p1[n] / st_p1[n])
