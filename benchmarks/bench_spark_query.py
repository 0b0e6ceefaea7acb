"""Distributed query path: Spark Online-Query vs the DataFrame index scan.

The local benches (bench_query.py) mirror the paper's single-machine C++
comparison; this one exercises the Catalyst plans end to end.
"""
import pytest

from repro.core.online import online_query_spark
from repro.core.spark_index import build_index_spark, tc_query_spark
from repro.tables.perf import default_params
from repro.tgraph.generators import analog
from repro.tgraph.schema import pack_flat
from repro.triangles.enumerate import enumerate_triangles

NAME, SF = "email", 0.5

_STATE: dict = {}


def _setup(spark):
    if not _STATE:
        flat = spark.createDataFrame(analog(NAME, sf=SF, seed=7))
        packed = pack_flat(flat).cache()
        edges = packed.select("src", "dst").cache()
        tris = enumerate_triangles(packed).cache()
        tris.count(), edges.count()
        table, index_df = build_index_spark(flat)
        index_df.count()
        k, d = default_params(table)
        _STATE.update(edges=edges, tris=tris, index_df=index_df, k=k, d=d)
    return _STATE


def test_online_query_spark(benchmark, spark):
    s = _setup(spark)
    benchmark.pedantic(
        lambda: online_query_spark(s["edges"], s["tris"], s["k"], s["d"]).count(),
        rounds=1,
        iterations=1,
    )


def test_tc_query_spark_scan(benchmark, spark):
    s = _setup(spark)
    benchmark.pedantic(
        lambda: tc_query_spark(s["index_df"], s["edges"], s["k"], s["d"]).count(),
        rounds=3,
        iterations=1,
    )
