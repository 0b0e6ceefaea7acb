"""Table I — dataset statistics (paper §VII-A).

Columns: |V|, |E|, n (distinct timestamps), |τ| (mean timestamps/edge),
|∆| (triangles), kmax, δmax — computed by the Spark dataflow
(:func:`repro.tgraph.stats.dataset_stats`) over each synthetic analog.
``PAPER_TABLE1`` holds the published numbers for side-by-side reporting.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..tgraph.generators import DATASETS, PAPER_TABLE1, analog
from ..tgraph.stats import dataset_stats


def table1(
    spark: SparkSession,
    *,
    sf: float = 1.0,
    seed: int = 7,
    datasets: list[str] | None = None,
) -> pd.DataFrame:
    """Measured Table I over the synthetic analogs."""
    names = datasets or sorted(DATASETS)
    rows = []
    for name in names:
        s = dataset_stats(spark, analog(name, sf=sf, seed=seed))
        s["dataset"] = name
        rows.append(s)
    df = pd.DataFrame(rows)
    return df[["dataset", "V", "E", "n", "tau", "tri", "kmax", "dmax"]]


def table1_with_paper(measured: pd.DataFrame) -> pd.DataFrame:
    """Interleave measured rows with the paper's numbers (suffix ``_paper``)."""
    paper = pd.DataFrame(
        [{"dataset": k, **{f"{c}_paper": v for c, v in d.items()}} for k, d in PAPER_TABLE1.items()]
    )
    return measured.merge(paper, on="dataset")


def format_table(df: pd.DataFrame) -> str:
    return df.to_string(index=False, float_format=lambda x: f"{x:.2f}")
