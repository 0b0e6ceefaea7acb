"""Distributed construction and DataFrame-resident index (DESIGN.md S13).

Division of labour (DESIGN.md §2, "Layering decisions"):

* Spark (Catalyst) does the *data-parallel* work over partitioned temporal
  edges: normalization, triangle enumeration, minimum-time-span evaluation,
  support counting, and iterative static truss decomposition — the stages
  whose cost is driven by |E| and |∆|.
* The δ-sweep of DBA/MBA is a sequential cascade; it runs on the driver
  over the Spark-computed triangle relation (PySpark has no GraphX API and
  δmax ≈ 2000 Spark rounds would be pure scheduler overhead).
* The finished k-span table is published back as a DataFrame partitioned
  by k; TC-Query then *is* a Catalyst filter — the predicate
  ``k = K AND kspan <= δ`` prunes to one partition and scans only rows
  that belong to the answer, mirroring TC-Query's suffix-scan optimality.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..tgraph.schema import pack_flat
from ..triangles.enumerate import enumerate_triangles
from .kspan import KspanTable
from .mba import mba
from .model import TemporalGraph, TriangleStore


def trussness_spark(
    edges: DataFrame, triangles: DataFrame, *, max_k: int = 64
) -> DataFrame:
    """Distributed static truss decomposition.

    Iterative simultaneous pruning per level k: edges that cannot hold
    support ≥ k−2 among surviving triangles are dropped with trn = k−1.
    Returns DataFrame(src, dst, trn).
    """
    alive = edges.select("src", "dst").localCheckpoint()
    tri = triangles.select("a", "b", "c").localCheckpoint()
    out: list[DataFrame] = []
    k = 3
    while alive.count() > 0 and k <= max_k + 1:
        # prune to fixpoint at level k
        while True:
            t = (
                tri.join(alive.select(F.col("src").alias("a"), F.col("dst").alias("b")), ["a", "b"], "left_semi")
                .join(alive.select(F.col("src").alias("b"), F.col("dst").alias("c")), ["b", "c"], "left_semi")
                .join(alive.select(F.col("src").alias("a"), F.col("dst").alias("c")), ["a", "c"], "left_semi")
            )
            sup = (
                t.select(
                    F.explode(
                        F.array(
                            F.struct(F.col("a").alias("src"), F.col("b").alias("dst")),
                            F.struct(F.col("b").alias("src"), F.col("c").alias("dst")),
                            F.struct(F.col("a").alias("src"), F.col("c").alias("dst")),
                        )
                    ).alias("e")
                )
                .select("e.src", "e.dst")
                .groupBy("src", "dst")
                .agg(F.count(F.lit(1)).alias("sup"))
            )
            keep = sup.where(F.col("sup") >= F.lit(k - 2)).select("src", "dst")
            new_alive = alive.join(keep, ["src", "dst"], "left_semi").localCheckpoint()
            n_new, n_old = new_alive.count(), alive.count()
            dropped = alive.join(new_alive, ["src", "dst"], "left_anti")
            if n_new < n_old:
                out.append(dropped.withColumn("trn", F.lit(k - 1)))
            alive = new_alive
            tri = t.localCheckpoint()
            if n_new == n_old:
                break
        k += 1
    if alive.count() > 0:
        raise RuntimeError("trussness_spark: exceeded max_k")
    spark = edges.sparkSession
    if not out:
        return spark.createDataFrame([], "src long, dst long, trn long")
    res = out[0]
    for df in out[1:]:
        res = res.unionByName(df)
    return res


def temporal_graph_from_spark(packed: DataFrame) -> TemporalGraph:
    """Driver model whose triangle store was computed *by Spark*.

    Collects the packed edges and the Spark-enumerated triangle relation,
    then wires the TriangleStore directly (no local re-enumeration).
    """
    edges_pdf = packed.orderBy("src", "dst").toPandas()
    tri_pdf = enumerate_triangles(packed).toPandas()
    edges = list(zip(edges_pdf["src"].astype(int), edges_pdf["dst"].astype(int)))
    times = [np.asarray(sorted(ts), dtype=np.int64) for ts in edges_pdf["ts"]]
    g = TemporalGraph(edges, times)
    if len(tri_pdf):
        e1 = [g.eid[(int(a), int(b))] for a, b in zip(tri_pdf["a"], tri_pdf["b"])]
        e2 = [g.eid[(int(b), int(c))] for b, c in zip(tri_pdf["b"], tri_pdf["c"])]
        e3 = [g.eid[(int(a), int(c))] for a, c in zip(tri_pdf["a"], tri_pdf["c"])]
        tri_e = np.stack(
            [np.asarray(e1), np.asarray(e2), np.asarray(e3)], axis=1
        ).astype(np.int64)
        mts = tri_pdf["mts"].to_numpy(dtype=np.int64)
    else:
        tri_e = np.zeros((0, 3), dtype=np.int64)
        mts = np.zeros(0, dtype=np.int64)
    edge_tris: list[list[int]] = [[] for _ in range(g.m)]
    for tid in range(len(mts)):
        for e in tri_e[tid]:
            edge_tris[int(e)].append(tid)
    g._tri = TriangleStore(tri_e, mts, edge_tris)
    return g


def build_index_spark(flat: DataFrame) -> tuple[KspanTable, DataFrame]:
    """Hybrid distributed index construction.

    flat (u, v, t) → packed edges (Catalyst) → triangles + mts (Catalyst)
    → MBA δ-sweep on the driver → k-span table DataFrame partitioned by k.
    """
    packed = pack_flat(flat)
    g = temporal_graph_from_spark(packed)
    table = mba(g)
    return table, kspan_table_to_df(flat.sparkSession, table)


def kspan_table_to_df(spark: SparkSession, table: KspanTable) -> DataFrame:
    """Publish the k-span table as DataFrame(k, kspan, src, dst), hash-
    partitioned by k so a TC-Query scan touches a single partition group."""
    rows = []
    for k in range(3, table.kmax + 1):
        s = table.spans[k]
        for e in np.flatnonzero(s >= 0):
            u, v = table.edges[int(e)]
            rows.append((k, int(s[e]), u, v))
    pdf = pd.DataFrame(rows, columns=["k", "kspan", "src", "dst"])
    if not len(pdf):
        return spark.createDataFrame([], "k long, kspan long, src long, dst long")
    df = spark.createDataFrame(pdf)
    return df.repartition("k").sortWithinPartitions(F.desc("kspan")).cache()


def tc_query_spark(index_df: DataFrame, edges: DataFrame, k: int, delta: float) -> DataFrame:
    """TC-Query as a Catalyst filter on the DataFrame-resident index.

    ``edges`` (src, dst) is needed only for the k ≤ 2 degenerate case
    (the whole graph, which the index does not store).
    """
    if k <= 2:
        return edges.select("src", "dst")
    return index_df.where(
        (F.col("k") == F.lit(k)) & (F.col("kspan") <= F.lit(delta))
    ).select("src", "dst")
