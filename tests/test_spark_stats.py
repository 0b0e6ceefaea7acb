"""Table I statistics: Spark aggregations vs the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.tgraph.generators import analog, random_temporal_graph
from repro.tgraph.schema import pack_flat
from repro.tgraph.stats import basic_stats, dataset_stats
from repro.triangles.brute import triangles_with_mts


def test_basic_stats_against_duckdb(spark):
    flat_pdf = random_temporal_graph(n_vertices=20, n_edges=80, n_timestamps=15, seed=6)
    flat = spark.createDataFrame(flat_pdf)
    packed = pack_flat(flat)
    # |E| and |τ| as one aggregate row, checked by the oracle
    spark_row = packed.agg(
        F.count(F.lit(1)).alias("E"), F.avg(F.size("ts")).alias("tau")
    )
    sql = """
        SELECT COUNT(*) AS E, AVG(cnt) AS tau FROM (
            SELECT u, v, CAST(COUNT(DISTINCT t) AS DOUBLE) AS cnt
            FROM flat GROUP BY u, v
        )
    """
    assert_equivalent(spark_row, sql, flat=flat_pdf)
    # scalar cross-check of the full dict
    stats = basic_stats(flat)
    assert stats["V"] == len(set(flat_pdf["u"]) | set(flat_pdf["v"]))
    assert stats["E"] == len(flat_pdf[["u", "v"]].drop_duplicates())
    assert stats["n"] == flat_pdf["t"].nunique()


def test_distinct_timestamp_count_oracle(spark):
    flat_pdf = random_temporal_graph(n_vertices=12, n_edges=40, n_timestamps=9, seed=7)
    flat = spark.createDataFrame(flat_pdf)
    spark_row = flat.agg(F.countDistinct("t").alias("n"))
    assert_equivalent(spark_row, "SELECT COUNT(DISTINCT t) AS n FROM flat", flat=flat_pdf)


def test_dataset_stats_full(spark):
    flat_pdf = analog("email", sf=0.06, seed=2)
    s = dataset_stats(spark, flat_pdf)
    assert s["tri"] == len(triangles_with_mts(flat_pdf))
    assert s["kmax"] >= 3  # the dense core guarantees non-trivial trusses
    assert 0 < s["dmax"] < 803
    assert s["V"] > 0 and s["E"] > 0
    assert s["tau"] > 1.0  # email analog has tau = 11.5 at full scale
