"""Driver-local temporal-graph model.

``TemporalGraph`` holds the packed representation (oriented static edges +
sorted distinct timestamp arrays) with O(1) edge lookup and per-vertex
neighbor maps, plus a lazily-built ``TriangleStore``: the flat triangle
list (edge-id triples + minimum time span) and the per-edge triangle-id
inverted lists that every peeling/maintenance algorithm in this package
consumes.

The model supports the paper's streaming update (§VI): ``insert(u, v, t)``
applies a timestamp insertion or an edge insertion in place and — when the
triangle store is already materialized — updates it *incrementally* (new
triangles from common neighbors / mts recomputation for affected triangles
only), returning exactly the delta the dynamic-maintenance algorithm needs.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from ..triangles.mts import mts3


@dataclass
class TriangleStore:
    """Flat triangle list + inverted per-edge lists.

    ``tri_e[t] = (e1, e2, e3)`` are edge ids of triangle t; ``mts[t]`` its
    minimum time span; ``edge_tris[e]`` the ids of triangles containing e.
    Appending (edge insertion) grows the arrays; mts updates (timestamp
    insertion) mutate ``mts`` in place.
    """

    tri_e: np.ndarray  # (T, 3) int64
    mts: np.ndarray  # (T,) int64
    edge_tris: list[list[int]] = field(default_factory=list)

    @property
    def n(self) -> int:
        return len(self.mts)

    def append(self, edges: tuple[int, int, int], m: int) -> int:
        tid = self.n
        self.tri_e = np.vstack([self.tri_e, np.asarray(edges, dtype=np.int64)])
        self.mts = np.append(self.mts, np.int64(m))
        for e in edges:
            while e >= len(self.edge_tris):
                self.edge_tris.append([])
            self.edge_tris[e].append(tid)
        return tid


class TemporalGraph:
    """Packed temporal graph with lazy triangle store."""

    def __init__(self, edges: list[tuple[int, int]], times: list[np.ndarray]):
        assert len(edges) == len(times)
        self.edges: list[tuple[int, int]] = list(edges)
        self.times: list[np.ndarray] = [np.asarray(t, dtype=np.int64) for t in times]
        self.eid: dict[tuple[int, int], int] = {e: i for i, e in enumerate(self.edges)}
        self.nbr: dict[int, dict[int, int]] = {}
        for i, (u, v) in enumerate(self.edges):
            self.nbr.setdefault(u, {})[v] = i
            self.nbr.setdefault(v, {})[u] = i
        self._tri: TriangleStore | None = None

    # -- constructors -----------------------------------------------------
    @classmethod
    def from_flat(cls, flat: pd.DataFrame) -> "TemporalGraph":
        """Build from a flat (u, v, t) frame (normalized on the way in)."""
        from ..tgraph.schema import flat_pdf_to_packed_pdf

        packed = flat_pdf_to_packed_pdf(flat)
        edges = list(zip(packed["src"].astype(int), packed["dst"].astype(int)))
        times = [np.asarray(ts, dtype=np.int64) for ts in packed["ts"]]
        return cls(edges, times)

    def copy(self) -> "TemporalGraph":
        g = TemporalGraph(list(self.edges), [t.copy() for t in self.times])
        if self._tri is not None:
            g._tri = TriangleStore(
                self._tri.tri_e.copy(),
                self._tri.mts.copy(),
                [list(x) for x in self._tri.edge_tris],
            )
        return g

    # -- basic accessors ---------------------------------------------------
    @property
    def m(self) -> int:
        return len(self.edges)

    @property
    def vertices(self) -> set[int]:
        return set(self.nbr)

    def to_flat(self) -> pd.DataFrame:
        rows_u, rows_v, rows_t = [], [], []
        for (u, v), ts in zip(self.edges, self.times):
            rows_u.extend([u] * len(ts))
            rows_v.extend([v] * len(ts))
            rows_t.extend(int(x) for x in ts)
        return pd.DataFrame({"u": rows_u, "v": rows_v, "t": rows_t})

    # -- triangles ----------------------------------------------------------
    def triangles(self) -> TriangleStore:
        """Enumerate all triangles (once) with their minimum time span.

        Oriented enumeration: for each edge (u, v) with u < v, close with
        common neighbors w > v, so each triangle is emitted exactly once.
        """
        if self._tri is not None:
            return self._tri
        tri_rows: list[tuple[int, int, int]] = []
        mts_rows: list[int] = []
        for e_uv, (u, v) in enumerate(self.edges):
            nu, nv = self.nbr[u], self.nbr[v]
            small, large = (nu, nv) if len(nu) <= len(nv) else (nv, nu)
            for w in small:
                if w > v and w in large:
                    e_uw = self.nbr[u][w]
                    e_vw = self.nbr[v][w]
                    m = mts3(self.times[e_uv], self.times[e_vw], self.times[e_uw])
                    tri_rows.append((e_uv, e_vw, e_uw))
                    mts_rows.append(m)
        tri_e = (
            np.asarray(tri_rows, dtype=np.int64)
            if tri_rows
            else np.zeros((0, 3), dtype=np.int64)
        )
        mts = np.asarray(mts_rows, dtype=np.int64)
        edge_tris: list[list[int]] = [[] for _ in range(self.m)]
        for tid in range(len(mts)):
            for e in tri_e[tid]:
                edge_tris[int(e)].append(tid)
        self._tri = TriangleStore(tri_e, mts, edge_tris)
        return self._tri

    @property
    def delta_max(self) -> int:
        t = self.triangles()
        return int(t.mts.max()) if t.n else 0

    # -- streaming updates (§VI) --------------------------------------------
    def insert(self, u: int, v: int, t: int) -> dict:
        """Insert temporal edge (u, v, t); returns the structural delta.

        Timestamp insertion (static edge exists): adds t to τ(u,v) and
        recomputes mts for the triangles containing the edge. Edge
        insertion: registers the new static edge and appends its new
        triangles (common neighbors of u and v). Either way the triangle
        store — if built — stays exact.

        Returns a dict with keys: ``kind`` ('ts'|'edge'|'noop'), ``eid``,
        ``changed`` (list of (tid, old_mts, new_mts)) and ``new_tris``
        (list of tids appended).
        """
        if u == v:
            return {"kind": "noop", "eid": -1, "changed": [], "new_tris": []}
        a, b = (u, v) if u < v else (v, u)
        if (a, b) in self.eid:
            e0 = self.eid[(a, b)]
            ts = self.times[e0]
            if t in ts:
                return {"kind": "noop", "eid": e0, "changed": [], "new_tris": []}
            pos = int(np.searchsorted(ts, t))
            self.times[e0] = np.insert(ts, pos, t)
            changed = []
            if self._tri is not None:
                for tid in self._tri.edge_tris[e0]:
                    e1, e2, e3 = (int(x) for x in self._tri.tri_e[tid])
                    old = int(self._tri.mts[tid])
                    new = mts3(self.times[e1], self.times[e2], self.times[e3])
                    if new != old:
                        self._tri.mts[tid] = new
                        changed.append((tid, old, new))
            return {"kind": "ts", "eid": e0, "changed": changed, "new_tris": []}
        # edge insertion
        e0 = self.m
        self.edges.append((a, b))
        self.times.append(np.asarray([t], dtype=np.int64))
        self.eid[(a, b)] = e0
        self.nbr.setdefault(a, {})[b] = e0
        self.nbr.setdefault(b, {})[a] = e0
        new_tids = []
        if self._tri is not None:
            while e0 >= len(self._tri.edge_tris):
                self._tri.edge_tris.append([])
            na, nb = self.nbr[a], self.nbr[b]
            small, large = (na, nb) if len(na) <= len(nb) else (nb, na)
            for w in sorted(small):
                if w in large and w != a and w != b:
                    e_aw = self.nbr[a][w]
                    e_bw = self.nbr[b][w]
                    m = mts3(self.times[e0], self.times[e_bw], self.times[e_aw])
                    new_tids.append(self._tri.append((e0, e_bw, e_aw), m))
        return {"kind": "edge", "eid": e0, "changed": [], "new_tris": new_tids}
