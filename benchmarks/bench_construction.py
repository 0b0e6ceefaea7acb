"""Fig. 14 shape — index construction: DBA vs MBA.

Paper claim: both scale ~linearly with graph size and MBA is consistently
faster (it invalidates each triangle once; DBA once per k).
"""
import pytest

from repro.core.kspan import dba
from repro.core.mba import mba
from repro.core.model import TemporalGraph
from repro.tgraph.generators import analog

BENCH = [("email", 1.0), ("superuser", 0.5), ("stackoverflow", 0.3)]
IDS = [f"{n}@{sf}" for n, sf in BENCH]

_GRAPHS: dict = {}


def _graph(name, sf):
    key = (name, sf)
    if key not in _GRAPHS:
        g = TemporalGraph.from_flat(analog(name, sf=sf, seed=7))
        g.triangles()  # δ-triangle list built once, outside the timer (both
        # algorithms consume the same list, as in the paper)
        _GRAPHS[key] = g
    return _GRAPHS[key]


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_dba_construction(benchmark, name, sf):
    g = _graph(name, sf)
    benchmark.pedantic(lambda: dba(g), rounds=2, iterations=1)


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_mba_construction(benchmark, name, sf):
    g = _graph(name, sf)
    benchmark.pedantic(lambda: mba(g), rounds=2, iterations=1)
