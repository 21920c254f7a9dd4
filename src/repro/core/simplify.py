"""Phase 4 — trajectory simplification (paper §3.4).

Grid-following imputed paths zig-zag; Ramer–Douglas–Peucker with tolerance
``t`` (meters) reduces them to navigable waypoint sequences. This module
also computes the Table 3 diagnostics: positions per path, average / maximum
rate of turn, and the number of turns exceeding 45°.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.geo.rdp import rdp
from repro.geo.resample import turn_stats


def simplify_path(lon: np.ndarray, lat: np.ndarray, tolerance_m: float) -> tuple[np.ndarray, np.ndarray]:
    """RDP-simplify an imputed path (``tolerance_m = 0`` is a no-op)."""
    return rdp(lon, lat, tolerance_m)


def paths_turn_table(paths: list[tuple[np.ndarray, np.ndarray]]) -> dict:
    """Average Table 3 row over ``paths``: mean cnt / avg rot / max rot / #>45°.

    Matches the paper's "measurements are averages over all paths".
    """
    rows = [turn_stats(lon, lat) for lon, lat in paths]
    pdf = pd.DataFrame(rows)
    return {
        "cnt": float(pdf["cnt"].mean()),
        "avg_rot": float(pdf["avg_rot"].mean()),
        "max_rot": float(pdf["max_rot"].mean()),
        "gt45": float(pdf["gt45"].mean()),
    }
