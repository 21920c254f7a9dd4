"""Tests for the GTI baseline: Spark graph build, shortest-path inference,
and the rd-scaling behaviour the paper's Tables 2/4 rely on."""
import numpy as np
import pytest

from repro.baselines.gti import GTI


@pytest.fixture(scope="module")
def gti_small(lab):
    return lab.gti("KIEL", rm_m=250.0, rd_deg=1e-4)


@pytest.fixture(scope="module")
def gti_big(lab):
    return lab.gti("KIEL", rm_m=250.0, rd_deg=1e-3)


def test_fit_produces_graph(gti_small):
    assert gti_small.n_nodes > 500
    assert gti_small.n_edges > 400


def test_edge_count_grows_with_rd(gti_small, gti_big):
    """Candidate edges multiply with the degree radius (Table 2 shape)."""
    assert gti_big.n_edges > gti_small.n_edges


def test_storage_grows_with_rd(gti_small, gti_big):
    assert gti_big.storage_bytes() > gti_small.storage_bytes()


def test_impute_path_between_endpoints(lab, gti_big):
    gaps = lab.gaps("KIEL")
    g = gaps[0]
    res = gti_big.impute(g.start_lon, g.start_lat, g.end_lon, g.end_lat)
    assert res.lon[0] == pytest.approx(g.start_lon)
    assert res.lon[-1] == pytest.approx(g.end_lon)


def test_impute_follows_real_tracks(lab, gti_big, kiel_trips):
    """Every path vertex is (near) an actually observed training position."""
    gaps = lab.gaps("KIEL")
    res = gti_big.impute(
        gaps[0].start_lon, gaps[0].start_lat, gaps[0].end_lon, gaps[0].end_lat
    )
    if res.fallback:
        pytest.skip("disconnected at this tiny scale")
    from repro.geo.geodesy import haversine_m

    lon = kiel_trips["lon"].to_numpy()
    lat = kiel_trips["lat"].to_numpy()
    for plon, plat in zip(res.lon[1:-1][::5], res.lat[1:-1][::5]):
        d = haversine_m(np.full(lon.size, plon), np.full(lon.size, plat), lon, lat)
        assert float(d.min()) < 100.0


def test_dijkstra_equals_networkx(gti_small):
    """The CSR Dijkstra must match networkx's shortest path cost."""
    import networkx as nx

    g = nx.Graph()
    n = gti_small.n_nodes
    for u in range(n):
        for k in range(gti_small._indptr[u], gti_small._indptr[u + 1]):
            g.add_edge(u, int(gti_small._nbr[k]), weight=float(gti_small._w[k]))
    rng = np.random.default_rng(0)
    for _ in range(5):
        s, t = int(rng.integers(0, n)), int(rng.integers(0, n))
        path = gti_small._dijkstra(s, t)
        try:
            ref = nx.shortest_path_length(g, s, t, weight="weight")
        except (nx.NetworkXNoPath, nx.NodeNotFound):
            assert path is None
            continue
        assert path is not None
        got = sum(
            float(np.hypot(gti_small._x[a] - gti_small._x[b], gti_small._y[a] - gti_small._y[b]))
            for a, b in zip(path[:-1], path[1:])
        )
        assert got == pytest.approx(ref, rel=1e-9)


def test_dijkstra_trivial_path(gti_small):
    assert gti_small._dijkstra(0, 0) == [0]


def test_snap_returns_nearest_node(gti_small):
    i = gti_small._snap(float(gti_small._lon[7]), float(gti_small._lat[7]))
    d_self = 0.0
    x, y = gti_small._x, gti_small._y
    d = np.hypot(x - x[7], y - y[7])
    assert np.hypot(x[i] - x[7], y[i] - y[7]) == pytest.approx(d_self, abs=1e-6) or d[i] == d.min()


def test_unfitted_raises():
    g = GTI()
    with pytest.raises(AssertionError):
        g.impute(0, 0, 1, 1)


def test_resample_bounds_node_count(spark, lab, kiel_trips):
    """Coarser resampling must yield fewer nodes."""
    from repro.ais.datasets import REGION_OF, to_spark

    region = REGION_OF["KIEL"]
    train, _ = lab.train_test("KIEL")
    fine = GTI(rm_m=250.0, rd_deg=1e-4, resample_s=60.0).fit(
        to_spark(spark, train), lat0=region.lat0, lon0=region.lon0
    )
    coarse = GTI(rm_m=250.0, rd_deg=1e-4, resample_s=300.0).fit(
        to_spark(spark, train), lat0=region.lat0, lon0=region.lon0
    )
    assert coarse.n_nodes < fine.n_nodes
