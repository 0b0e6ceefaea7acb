"""TemporalGraph model: triangle enumeration, incremental updates."""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import TemporalGraph
from repro.tgraph.generators import random_temporal_graph, triangle_rich_graph
from repro.triangles.brute import triangles_with_mts


def _model_triangles(g: TemporalGraph) -> set[tuple[int, int, int, int]]:
    tri = g.triangles()
    out = set()
    for tid in range(tri.n):
        verts = sorted({x for e in tri.tri_e[tid] for x in g.edges[int(e)]})
        assert len(verts) == 3
        out.add((*verts, int(tri.mts[tid])))
    return out


@pytest.mark.parametrize("seed", range(8))
def test_triangles_match_brute(seed):
    flat = random_temporal_graph(n_vertices=14, n_edges=45, n_timestamps=12, seed=seed)
    g = TemporalGraph.from_flat(flat)
    assert _model_triangles(g) == set(triangles_with_mts(flat))


def test_triangles_on_clique_graph():
    flat = triangle_rich_graph(n_cliques=2, clique_size=5, seed=3)
    g = TemporalGraph.from_flat(flat)
    assert _model_triangles(g) == set(triangles_with_mts(flat))


def test_basic_accessors():
    flat = pd.DataFrame({"u": [0, 1, 0], "v": [1, 2, 2], "t": [1, 2, 3]})
    g = TemporalGraph.from_flat(flat)
    assert g.m == 3
    assert g.vertices == {0, 1, 2}
    tri = g.triangles()
    assert tri.n == 1
    assert int(tri.mts[0]) == 2
    assert g.delta_max == 2


def test_to_flat_roundtrip():
    flat = random_temporal_graph(n_vertices=10, n_edges=25, seed=1)
    g = TemporalGraph.from_flat(flat)
    g2 = TemporalGraph.from_flat(g.to_flat())
    assert g2.edges == g.edges
    assert all(np.array_equal(a, b) for a, b in zip(g2.times, g.times))


# -- incremental updates (the §VI stream) ------------------------------------


def test_insert_noop():
    g = TemporalGraph.from_flat(pd.DataFrame({"u": [0], "v": [1], "t": [5]}))
    assert g.insert(0, 1, 5)["kind"] == "noop"
    assert g.insert(3, 3, 1)["kind"] == "noop"


def test_insert_timestamp_updates_mts():
    flat = pd.DataFrame({"u": [0, 1, 0], "v": [1, 2, 2], "t": [0, 50, 100]})
    g = TemporalGraph.from_flat(flat)
    g.triangles()
    assert g.delta_max == 100
    d = g.insert(0, 1, 99)  # tightens the triangle to span 50
    assert d["kind"] == "ts"
    assert d["changed"] == [(0, 100, 50)]
    assert int(g.triangles().mts[0]) == 50


def test_insert_edge_creates_triangles():
    flat = pd.DataFrame({"u": [0, 1], "v": [1, 2], "t": [3, 7]})
    g = TemporalGraph.from_flat(flat)
    g.triangles()
    d = g.insert(2, 0, 5)
    assert d["kind"] == "edge"
    assert len(d["new_tris"]) == 1
    assert int(g.triangles().mts[d["new_tris"][0]]) == 4


@pytest.mark.parametrize("seed", range(6))
def test_incremental_equals_rebuild(seed):
    """Streaming inserts keep the triangle store identical to a rebuild."""
    rng = np.random.default_rng(seed)
    flat = random_temporal_graph(n_vertices=12, n_edges=30, n_timestamps=20, seed=seed)
    g = TemporalGraph.from_flat(flat)
    g.triangles()
    for _ in range(15):
        u, v = int(rng.integers(0, 12)), int(rng.integers(0, 12))
        t = int(rng.integers(0, 20))
        g.insert(u, v, t)
    fresh = TemporalGraph.from_flat(g.to_flat())
    assert _model_triangles(g) == _model_triangles(fresh)


def test_copy_is_independent():
    g = TemporalGraph.from_flat(pd.DataFrame({"u": [0, 1, 0], "v": [1, 2, 2], "t": [1, 2, 3]}))
    g.triangles()
    h = g.copy()
    g.insert(0, 1, 9)
    assert len(h.times[h.eid[(0, 1)]]) == 1
    assert h.triangles().n == 1
