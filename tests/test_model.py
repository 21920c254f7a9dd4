"""Unit tests for HabitModel (A* imputation, snapping, inverse projection)
on small hand-built graphs."""
import networkx as nx
import numpy as np
import pytest

from repro.core.model import HabitModel
from repro.hexgrid.hex import HexGrid, grid_distance

GRID = HexGrid(8, 56.0, 11.5)


def _chain_graph(lons, lats, weights=None):
    """Directed chain of cells following given coordinates."""
    cells = [int(GRID.to_cell(lo, la)) for lo, la in zip(lons, lats)]
    g = nx.DiGraph()
    for c, lo, la in zip(cells, lons, lats):
        g.add_node(c, mlon=float(lo), mlat=float(la), cnt=10, nves=2)
    for i, (a, b) in enumerate(zip(cells[:-1], cells[1:])):
        w = 1 if weights is None else weights[i]
        g.add_edge(a, b, transitions=w, gdist=int(grid_distance(a, b)))
    return cells, g


LONS = np.round(np.linspace(10.0, 10.5, 12), 4)
LATS = np.round(55.0 + 0.05 * np.sin(np.linspace(0, 3, 12)), 4)


@pytest.fixture()
def chain_model():
    cells, g = _chain_graph(LONS, LATS)
    return cells, HabitModel(grid=GRID, graph=g)


# --- snapping ---------------------------------------------------------------

def test_snap_inside_node_cell(chain_model):
    cells, model = chain_model
    assert model.snap(LONS[3], LATS[3]) == cells[3]


def test_snap_outside_returns_nearest(chain_model):
    cells, model = chain_model
    # a point ~20 km south of the chain snaps to the nearest chain node
    # (by projected distance to the node medians)
    probe_lon, probe_lat = LONS[5], LATS[5] - 0.2
    node = model.snap(probe_lon, probe_lat)
    assert node in cells
    px, py = GRID.project(probe_lon, probe_lat)
    nx_, ny_ = GRID.project(LONS, LATS)
    expect = cells[int(np.argmin((nx_ - px) ** 2 + (ny_ - py) ** 2))]
    assert node == expect


def test_snap_empty_model_raises():
    model = HabitModel(grid=GRID, graph=nx.DiGraph())
    with pytest.raises(ValueError):
        model.snap(10.0, 55.0)


# --- path search ------------------------------------------------------------

def test_cell_path_follows_chain(chain_model):
    cells, model = chain_model
    path = model.cell_path(cells[0], cells[-1])
    assert path == cells


def test_cell_path_same_node(chain_model):
    cells, model = chain_model
    assert model.cell_path(cells[4], cells[4]) == [cells[4]]


def test_cell_path_respects_direction(chain_model):
    cells, model = chain_model
    # the chain is directed forward only
    assert model.cell_path(cells[-1], cells[0]) is None


def test_cell_path_matches_networkx_shortest(chain_model):
    cells, model = chain_model
    expect = nx.shortest_path(model.graph, cells[0], cells[-1])
    assert model.cell_path(cells[0], cells[-1]) == expect


def test_cell_path_minimizes_transitions():
    """A* must take the fewer-hop branch, matching the paper's objective."""
    lons_a = [10.0, 10.1, 10.2, 10.3]
    lats_a = [55.0, 55.0, 55.0, 55.0]
    cells_a, g = _chain_graph(lons_a, lats_a)
    # add a longer detour between the same endpoints
    detour_lons = [10.0, 10.05, 10.1, 10.15, 10.2, 10.25, 10.3]
    detour_lats = [55.0, 55.08, 55.1, 55.12, 55.1, 55.08, 55.0]
    for lo, la in zip(detour_lons[1:-1], detour_lats[1:-1]):
        g.add_node(int(GRID.to_cell(lo, la)), mlon=lo, mlat=la, cnt=1, nves=1)
    dcells = [int(GRID.to_cell(lo, la)) for lo, la in zip(detour_lons, detour_lats)]
    for a, b in zip(dcells[:-1], dcells[1:]):
        if a != b:
            g.add_edge(a, b, transitions=1, gdist=int(grid_distance(a, b)))
    model = HabitModel(grid=GRID, graph=g)
    path = model.cell_path(cells_a[0], cells_a[-1])
    assert path == cells_a  # 3 hops beats the ~6-hop detour


# --- inverse projection -----------------------------------------------------

def test_project_cells_median(chain_model):
    cells, model = chain_model
    lon, lat = model.project_cells(cells[:3], p="w")
    assert lon == pytest.approx(LONS[:3])
    assert lat == pytest.approx(LATS[:3])


def test_project_cells_center(chain_model):
    cells, model = chain_model
    lon, lat = model.project_cells(cells[:3], p="c")
    exp_lon, exp_lat = GRID.cell_center(np.asarray(cells[:3]))
    assert lon == pytest.approx(exp_lon)
    assert lat == pytest.approx(exp_lat)


def test_project_cells_bad_option(chain_model):
    cells, model = chain_model
    with pytest.raises(ValueError):
        model.project_cells(cells[:2], p="x")


def test_median_projection_differs_from_center(chain_model):
    cells, model = chain_model
    wlon, _ = model.project_cells(cells, p="w")
    clon, _ = model.project_cells(cells, p="c")
    assert not np.allclose(wlon, clon)


# --- impute -----------------------------------------------------------------

def test_impute_endpoints_preserved(chain_model):
    cells, model = chain_model
    res = model.impute(LONS[0], LATS[0], LONS[-1], LATS[-1])
    assert res.lon[0] == LONS[0] and res.lon[-1] == LONS[-1]
    assert not res.fallback


def test_impute_visits_intermediate_cells(chain_model):
    cells, model = chain_model
    res = model.impute(LONS[0], LATS[0], LONS[-1], LATS[-1])
    assert res.lon.size >= len(cells) - 2


def test_impute_fallback_on_disconnection(chain_model):
    cells, model = chain_model
    res = model.impute(LONS[-1], LATS[-1], LONS[0], LATS[0])  # against direction
    assert res.fallback
    assert res.lon.size == 2


def test_impute_dedupes_consecutive_positions(chain_model):
    cells, model = chain_model
    # endpoints exactly on node medians: first/last projected cell collapses
    res = model.impute(LONS[0], LATS[0], LONS[-1], LATS[-1])
    d = np.hypot(np.diff(res.lon), np.diff(res.lat))
    assert (d > 0).all()


def test_properties(chain_model):
    cells, model = chain_model
    assert model.n_nodes == len(cells)
    assert model.n_edges == len(cells) - 1
