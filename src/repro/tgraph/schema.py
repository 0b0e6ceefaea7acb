"""Canonical temporal-graph schema and normalization.

A temporal graph is exchanged between components in one of two layouts:

* **flat**: one row per interaction, columns ``(u, v, t)`` — the on-disk /
  generator layout, and the layout the DuckDB oracle queries run over;
* **packed**: one row per static edge, columns ``(src, dst, ts)`` where
  ``src < dst`` and ``ts`` is the sorted array of *distinct* timestamps —
  the layout the triangle enumerator and all indexes consume.

Normalization maps flat → packed: orient every edge so ``src < dst``, drop
self-loops, and deduplicate + sort timestamps per edge. Timestamps are
integers (the paper uses consecutive naturals 0..n).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

#: column names of the flat layout
FLAT_COLS = ("u", "v", "t")
#: column names of the packed layout
PACKED_COLS = ("src", "dst", "ts")


def normalize_flat_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """Normalize a flat pandas frame: orient u<v, drop self-loops, dedup rows.

    Returns a flat frame with columns ``(u, v, t)``, ``u < v``, no duplicate
    (u, v, t) rows, deterministic row order.
    """
    u = pdf["u"].to_numpy()
    v = pdf["v"].to_numpy()
    lo, hi = u.copy(), v.copy()
    swap = u > v
    lo[swap], hi[swap] = v[swap], u[swap]
    out = pd.DataFrame({"u": lo, "v": hi, "t": pdf["t"].to_numpy()})
    out = out[out["u"] != out["v"]]
    return (
        out.drop_duplicates()
        .sort_values(["u", "v", "t"])
        .reset_index(drop=True)
        .astype({"u": "int64", "v": "int64", "t": "int64"})
    )


def pack_flat(flat: DataFrame) -> DataFrame:
    """Flat Spark frame → packed Spark frame (src<dst, sorted distinct ts).

    Pure DataFrame ops so Catalyst plans the whole normalization: orient,
    filter self-loops, and aggregate timestamps with ``sort_array(collect_set)``.
    """
    lo = F.least("u", "v").alias("src")
    hi = F.greatest("u", "v").alias("dst")
    return (
        flat.where(F.col("u") != F.col("v"))
        .select(lo, hi, F.col("t").cast("long").alias("t"))
        .groupBy("src", "dst")
        .agg(F.sort_array(F.collect_set("t")).alias("ts"))
    )


def flat_to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Create a flat Spark frame from a (possibly unnormalized) pandas frame."""
    return spark.createDataFrame(normalize_flat_pdf(pdf))


def packed_to_pandas(packed: DataFrame) -> pd.DataFrame:
    """Collect a packed Spark frame deterministically (sorted by src, dst)."""
    return packed.orderBy("src", "dst").toPandas()


def flat_pdf_to_packed_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """Driver-local flat → packed conversion (mirrors :func:`pack_flat`)."""
    flat = normalize_flat_pdf(pdf)
    grouped = flat.groupby(["u", "v"], sort=True)["t"].agg(
        lambda s: sorted(set(int(x) for x in s))
    )
    out = grouped.reset_index()
    out.columns = ["src", "dst", "ts"]
    return out
