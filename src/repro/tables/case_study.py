"""Fig. 2 case-study table (paper §I, Example 1).

On the Email analog, fix k and shrink δ (∞ → 200 → 150 → 100 — our analog
keeps the paper's n = 803 time axis, so the same δ values apply). For each
(k, δ)-truss report: vertex count, edge count, triangle count (static
triangles inside the subgraph), average local clustering coefficient, and
duration (max − min timestamp over the subgraph's edges).

The paper's claim this harness checks: as δ drops, the truss gets more
clustered (coefficient rises 0.72 → 0.85) while the duration of the whole
truss barely moves — i.e. δ, not subgraph duration, is what tightens
temporal cohesion.
"""
from __future__ import annotations

import math
from itertools import combinations

import pandas as pd

from ..core.mba import mba
from ..core.model import TemporalGraph
from ..core.tc_index import TCIndex
from ..tgraph.generators import analog

#: the embedded table of the paper's Fig. 2 (Email, k = 16)
PAPER_CASE_STUDY = pd.DataFrame(
    {
        "delta": ["inf", 200, 150, 100],
        "vertices": [213, 130, 108, 38],
        "edges": [4402, 2355, 1735, 564],
        "triangles": [42683, 21738, 14978, 4670],
        "coefficient": [0.72, 0.77, 0.81, 0.85],
        "duration": [803, 803, 803, 802],
    }
)


def subgraph_metrics(g: TemporalGraph, edges: set[tuple[int, int]]) -> dict:
    """vertex/edge/triangle counts, avg local clustering, duration."""
    adj: dict[int, set[int]] = {}
    for u, v in edges:
        adj.setdefault(u, set()).add(v)
        adj.setdefault(v, set()).add(u)
    tri = 0
    coeffs = []
    for v, nb in adj.items():
        d = len(nb)
        if d < 2:
            coeffs.append(0.0)
            continue
        links = sum(1 for a, b in combinations(sorted(nb), 2) if b in adj.get(a, ()))
        tri += links  # each triangle counted once per vertex → /3 below
        coeffs.append(2.0 * links / (d * (d - 1)))
    tmin, tmax = math.inf, -math.inf
    for e in edges:
        ts = g.times[g.eid[e]]
        tmin = min(tmin, int(ts[0]))
        tmax = max(tmax, int(ts[-1]))
    return {
        "vertices": len(adj),
        "edges": len(edges),
        "triangles": tri // 3,
        "coefficient": (sum(coeffs) / len(coeffs)) if coeffs else 0.0,
        "duration": (tmax - tmin) if edges else 0,
    }


def case_study(
    *,
    sf: float = 1.0,
    seed: int = 7,
    k: int | None = None,
    deltas: tuple = (math.inf, 200, 150, 100),
) -> pd.DataFrame:
    """The Fig. 2 table on the Email analog (k defaults to ~70% of kmax,
    matching the paper's k = 16 vs kmax = 23)."""
    g = TemporalGraph.from_flat(analog("email", sf=sf, seed=seed))
    table = mba(g)
    idx = TCIndex(table)
    if k is None:
        k = max(3, round(0.7 * table.kmax))
    rows = []
    for d in deltas:
        edges = idx.query(k, d)
        row = {"k": k, "delta": "inf" if d == math.inf else d}
        row.update(subgraph_metrics(g, edges))
        rows.append(row)
    return pd.DataFrame(rows)
