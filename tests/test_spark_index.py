"""Hybrid distributed index construction + DataFrame-resident TC-Query."""
import math

import pytest

from repro.core.mba import mba
from repro.core.model import TemporalGraph
from repro.core.online import online_query
from repro.core.spark_index import (
    build_index_spark,
    kspan_table_to_df,
    tc_query_spark,
    temporal_graph_from_spark,
)
from repro.tgraph.generators import random_temporal_graph, triangle_rich_graph
from repro.tgraph.schema import pack_flat


def test_temporal_graph_from_spark_equals_local(spark):
    flat_pdf = random_temporal_graph(n_vertices=14, n_edges=50, n_timestamps=10, seed=2)
    packed = pack_flat(spark.createDataFrame(flat_pdf))
    g_spark = temporal_graph_from_spark(packed)
    g_local = TemporalGraph.from_flat(flat_pdf)
    assert g_spark.edges == g_local.edges
    ts, tl = g_spark.triangles(), g_local.triangles()
    assert ts.n == tl.n
    spark_set = {tuple(sorted(map(int, ts.tri_e[i]))) + (int(ts.mts[i]),) for i in range(ts.n)}
    local_set = {tuple(sorted(map(int, tl.tri_e[i]))) + (int(tl.mts[i]),) for i in range(tl.n)}
    assert spark_set == local_set


def test_build_index_spark_equals_local_mba(spark):
    flat_pdf = triangle_rich_graph(n_cliques=2, clique_size=6, n_timestamps=15, seed=3)
    table, _df = build_index_spark(spark.createDataFrame(flat_pdf))
    local = mba(TemporalGraph.from_flat(flat_pdf))
    assert table.equal(local)


def test_tc_query_spark_matches_online(spark):
    flat_pdf = triangle_rich_graph(n_cliques=2, clique_size=7, n_timestamps=20, seed=4)
    flat = spark.createDataFrame(flat_pdf)
    table, index_df = build_index_spark(flat)
    edges = pack_flat(flat).select("src", "dst")
    g = TemporalGraph.from_flat(flat_pdf)
    for k in range(2, table.kmax + 2):
        for d in (0, 3, table.delta_max, math.inf):
            got = {
                (int(r["src"]), int(r["dst"]))
                for r in tc_query_spark(index_df, edges, k, d).collect()
            }
            assert got == online_query(g, k, d), (k, d)


def test_index_df_partitioned_by_k(spark):
    flat_pdf = triangle_rich_graph(n_cliques=2, clique_size=6, seed=5)
    _table, index_df = build_index_spark(spark.createDataFrame(flat_pdf))
    assert set(index_df.columns) == {"k", "kspan", "src", "dst"}
    # the filter should reach the index without a shuffle: one stage scan
    plan = tc_query_spark(index_df, None, 4, 10)._jdf.queryExecution().executedPlan().toString()
    assert "Exchange" not in plan.split("InMemoryTableScan")[0]
