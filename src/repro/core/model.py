"""Phase 3 — trajectory imputation (paper §3.3).

A :class:`HabitModel` holds the cell graph plus its grid parameters and
answers imputation queries:

1. project gap endpoints to hex cells; if a cell is not a graph node,
   nearest-neighbor snap to the closest node (by projected distance to the
   nodes' median positions);
2. A* over the transition graph, minimizing the number of transitions, with
   the hex grid distance as heuristic (scaled by the maximum edge span so it
   stays admissible even for transitions that skip cells);
3. inverse projection of the cell path to coordinates — parameter
   ``p='c'`` uses geometric cell centers, ``p='w'`` the data-driven per-cell
   median position (the paper's information-loss mitigation, Figure 2);
4. if the endpoints are not connected in the graph, fall back to the
   straight line (flagged in the result).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import networkx as nx
import numpy as np

from repro.geo.geodesy import haversine_m
from repro.hexgrid.hex import HexGrid, grid_distance


@dataclass
class ImputedPath:
    """Result of one imputation query: coordinates incl. both endpoints."""

    lon: np.ndarray
    lat: np.ndarray
    fallback: bool  # True when the graph gave no path and SLI was used


@dataclass
class HabitModel:
    """Fitted HABIT framework: hex grid + weighted cell-transition graph."""

    grid: HexGrid
    graph: nx.DiGraph
    _node_ids: np.ndarray = field(init=False, repr=False)
    _node_x: np.ndarray = field(init=False, repr=False)
    _node_y: np.ndarray = field(init=False, repr=False)
    _max_span: int = field(init=False, repr=False)

    def __post_init__(self) -> None:
        nodes = [n for n, d in self.graph.nodes(data=True) if "mlon" in d]
        self._node_ids = np.asarray(nodes, dtype=np.int64)
        mlon = np.asarray([self.graph.nodes[n]["mlon"] for n in nodes])
        mlat = np.asarray([self.graph.nodes[n]["mlat"] for n in nodes])
        self._node_x, self._node_y = self.grid.project(mlon, mlat)
        spans = [d.get("gdist", 1) for _, _, d in self.graph.edges(data=True)]
        self._max_span = max(1, max(spans, default=1))

    # -- queries ------------------------------------------------------------
    def snap(self, lon: float, lat: float) -> int:
        """Graph node for a point: its own cell, else the nearest node."""
        cell = int(self.grid.to_cell(lon, lat))
        if self.graph.has_node(cell) and "mlon" in self.graph.nodes[cell]:
            return cell
        if self._node_ids.size == 0:
            raise ValueError("empty model: no graph nodes")
        x, y = self.grid.project(lon, lat)
        i = int(np.argmin((self._node_x - x) ** 2 + (self._node_y - y) ** 2))
        return int(self._node_ids[i])

    def cell_path(self, s_node: int, e_node: int) -> list[int] | None:
        """Minimum-transition cell sequence from ``s_node`` to ``e_node``.

        A* with unit edge cost; heuristic = hex distance / max edge span
        (admissible: every transition covers at most ``max_span`` hops).
        Returns None when no directed path exists.
        """
        span = float(self._max_span)

        def h(u: int, v: int) -> float:
            return float(grid_distance(u, v)) / span

        try:
            return nx.astar_path(self.graph, s_node, e_node, heuristic=h, weight=lambda a, b, d: 1.0)
        except (nx.NetworkXNoPath, nx.NodeNotFound):
            return None

    def project_cells(self, cells: list[int], p: str = "w") -> tuple[np.ndarray, np.ndarray]:
        """Inverse projection of a cell sequence to lon/lat (§3.3, Fig. 2)."""
        if p == "c":
            return self.grid.cell_center(np.asarray(cells, dtype=np.int64))
        if p != "w":
            raise ValueError(f"unknown projection option {p!r} (use 'c' or 'w')")
        nd = self.graph.nodes
        lon = np.asarray([nd[c]["mlon"] for c in cells])
        lat = np.asarray([nd[c]["mlat"] for c in cells])
        return lon, lat

    def impute(
        self,
        start_lon: float,
        start_lat: float,
        end_lon: float,
        end_lat: float,
        *,
        p: str = "w",
    ) -> ImputedPath:
        """Impute the gap between two endpoints; simplification is separate
        (:mod:`repro.core.simplify`), matching the paper's phase split."""
        s_node = self.snap(start_lon, start_lat)
        e_node = self.snap(end_lon, end_lat)
        cells = self.cell_path(s_node, e_node)
        if cells is None:
            return ImputedPath(
                lon=np.array([start_lon, end_lon]),
                lat=np.array([start_lat, end_lat]),
                fallback=True,
            )
        mid_lon, mid_lat = self.project_cells(cells, p=p)
        lon = np.concatenate([[start_lon], mid_lon, [end_lon]])
        lat = np.concatenate([[start_lat], mid_lat, [end_lat]])
        # Drop near-duplicate consecutive vertices (endpoint may sit on the
        # first/last cell's representative position). The true endpoints must
        # survive: when the tail duplicates, the preceding interior vertex is
        # dropped instead.
        if lon.size > 2:
            d = haversine_m(lon[:-1], lat[:-1], lon[1:], lat[1:])
            keep = np.concatenate([[True], d > 1.0])
            if not keep[-1]:
                keep[-2] = False
                keep[-1] = True
            lon, lat = lon[keep], lat[keep]
        return ImputedPath(lon=lon, lat=lat, fallback=False)

    # -- introspection ------------------------------------------------------
    @property
    def n_nodes(self) -> int:
        return int(self._node_ids.size)

    @property
    def n_edges(self) -> int:
        return self.graph.number_of_edges()
