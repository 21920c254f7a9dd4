"""Spark pandas-UDF factories for the hex grid.

The UDFs close over plain grid parameters (res, lat0, lon0) — never over a
``HexGrid`` bound to driver-side state — so they serialize cleanly to
executors and stay vectorized via Arrow.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import functions as F
from pyspark.sql.types import LongType

from repro.hexgrid.hex import HexGrid, grid_distance


def to_cell_udf(res: int, lat0: float, lon0: float):
    """pandas UDF ``(lon, lat) -> cell id`` at the given grid parameters."""

    @F.pandas_udf(LongType())
    def _to_cell(lon: pd.Series, lat: pd.Series) -> pd.Series:
        grid = HexGrid(res, lat0, lon0)
        return pd.Series(grid.to_cell(lon.to_numpy(), lat.to_numpy()))

    return _to_cell


def grid_distance_udf():
    """pandas UDF ``(cell_a, cell_b) -> hex hop distance``."""

    @F.pandas_udf(LongType())
    def _dist(a: pd.Series, b: pd.Series) -> pd.Series:
        return pd.Series(grid_distance(a.to_numpy(), b.to_numpy()))

    return _dist
