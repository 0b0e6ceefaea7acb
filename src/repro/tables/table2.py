"""Table II — index statistics (paper §VII-C).

Per dataset: average D_k entry count, TC-Index total stored edges, DC-Index
total stored edges, DC total / |E|, DC space (MB, explicit byte model — see
DESIGN.md §6.4), and the compression ratio DC-total / Σ_{k,δ}|T_{k,δ}|
(storing every truss verbatim is the denominator).

The k-span table is built by the hybrid Spark pipeline when a session is
supplied (triangles + mts enumerated by Catalyst), or fully locally
otherwise.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..core.dc_index import DCIndex
from ..core.mba import mba
from ..core.model import TemporalGraph
from ..core.spark_index import build_index_spark
from ..core.tc_index import TCIndex
from ..tgraph.generators import DATASETS, analog

#: Paper's Table II, for side-by-side reporting in EXPERIMENTS.md.
PAPER_TABLE2: dict[str, dict] = {
    "email": dict(avg_entry=290, tc_total=162_000, dc_total=154_000, ratio=9.57, space_mb=0.76, compression=17.5e-4),
    "mathoverflow": dict(avg_entry=1478, tc_total=1_959_000, dc_total=1_871_000, ratio=10.40, space_mb=9.35, compression=6.25e-4),
    "askubuntu": dict(avg_entry=1086, tc_total=959_000, dc_total=958_000, ratio=2.10, space_mb=7.33, compression=11.43e-4),
    "superuser": dict(avg_entry=1365, tc_total=2_108_000, dc_total=2_106_000, ratio=2.95, space_mb=13.83, compression=7.4e-4),
    "wikitalk": dict(avg_entry=1089, tc_total=10_600_000, dc_total=10_580_000, ratio=3.79, space_mb=62.01, compression=7.67e-4),
    "youtube": dict(avg_entry=170, tc_total=16_740_000, dc_total=14_250_000, ratio=1.52, space_mb=125.93, compression=1.11e-2),
    "stackoverflow": dict(avg_entry=2028, tc_total=139_070_000, dc_total=138_920_000, ratio=4.93, space_mb=746.15, compression=6.00e-4),
    "wikipedia": dict(avg_entry=1304, tc_total=164_240_000, dc_total=163_400_000, ratio=4.47, space_mb=902.63, compression=8.60e-4),
}


def index_stats_row(name: str, *, sf: float = 1.0, seed: int = 7, spark: SparkSession | None = None) -> dict:
    """Build both indexes on one analog and compute its Table II row."""
    flat_pdf = analog(name, sf=sf, seed=seed)
    if spark is not None:
        table, _df = build_index_spark(spark.createDataFrame(flat_pdf))
    else:
        table = mba(TemporalGraph.from_flat(flat_pdf))
    tc = TCIndex(table)
    dc = DCIndex(table)
    cells = table.total_truss_cells()
    return {
        "dataset": name,
        "E": table.m,
        "avg_entry": tc.avg_entries(),
        "tc_total": tc.total_edges(),
        "dc_total": dc.total_edges(),
        "ratio": dc.total_edges() / max(1, table.m),
        "space_mb": dc.space_bytes() / 1e6,
        "compression": dc.total_edges() / cells if cells else float("nan"),
    }


def table2(
    *,
    sf: float = 1.0,
    seed: int = 7,
    datasets: list[str] | None = None,
    spark: SparkSession | None = None,
) -> pd.DataFrame:
    names = datasets or sorted(DATASETS)
    return pd.DataFrame([index_stats_row(n, sf=sf, seed=seed, spark=spark) for n in names])
