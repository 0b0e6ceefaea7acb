"""Fig. 10 shape — query latency: Online-Query vs TC-Query vs DC-Query.

Paper claim: the index-based queries answer in interactive time, 2–4 orders
of magnitude faster than the index-free Online-Query, at the default
parameters k = 30%·kmax, δ = 60%·δmax.
"""
import pytest

from repro.core.online import online_query
from repro.tables.perf import default_params

BENCH = [("email", 1.0), ("youtube", 0.5), ("wikitalk", 0.5), ("stackoverflow", 0.3)]
IDS = [f"{n}@{sf}" for n, sf in BENCH]


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_online_query(benchmark, built, name, sf):
    g, table, _tc, _dc = built(name, sf)
    k, d = default_params(table)
    benchmark.pedantic(lambda: online_query(g, k, d), rounds=3, iterations=1)


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_tc_query(benchmark, built, name, sf):
    _g, table, tc, _dc = built(name, sf)
    k, d = default_params(table)
    result = benchmark(lambda: tc.query_ids(k, d))
    assert len(result) == table.truss_size(k, d)


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_dc_query(benchmark, built, name, sf):
    _g, table, _tc, dc = built(name, sf)
    k, d = default_params(table)
    result = benchmark(lambda: dc.query_ids(k, d))
    assert len(result) == table.truss_size(k, d)
