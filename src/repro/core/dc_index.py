"""Dual Containment Index (DC-Index, §IV-B) and DC-Query.

Derivation, exactly as in the paper:

1. **(k, δ)-truss graph** (Def. 6): nodes are all trusses T_{k,δ},
   3 ≤ k ≤ kmax, 0 ≤ δ ≤ δmax; a *vertical* edge T_{k,δ} → T_{k+1,δ} and a
   *horizontal* edge T_{k,δ} → T_{k,δ−1} carry the incremental-edge-set
   sizes (the sink is always contained in the source).
2. **Arborescence** (Def. 7): every node keeps only its lighter outgoing
   edge — a minimum-weight spanning arborescence rooted at T_{kmax,0}.
3. **Reduction** (Def. 8): nodes whose kept edge has weight 0 are identical
   to their sink and are removed; survivors re-point to the next remaining
   node on their root path.
4. **Incremental edge set tree**: each kept node stores the edges of its
   truss minus its parent's truss; the root stores T_{kmax,0} in full.
5. **Compressed lookup table**: per k, the run-length-encoded map δ → tree
   node representing T_{k,δ} (runs keyed by their smallest δ).

DC-Query(k, δ): one lookup-row bisection + a root-path walk unioning the
IESes — same output-optimal complexity as TC-Query (Theorem 4), and the
tree is space-optimal among structures with that query time (Theorem 3);
in particular total stored edges ≤ TC-Index's (each node stores
min(w_h, w_v) ≤ w_h, and TC's rows are exactly the Σ w_h + |T_{k,0}|
decomposition).
"""
from __future__ import annotations

import bisect
from dataclasses import dataclass, field

import numpy as np

from .kspan import KspanTable


@dataclass
class DCNode:
    """One kept node of the incremental edge set tree."""

    k: int
    delta: int
    parent: tuple[int, int] | None  # key of the next node on the root path
    edge_ids: np.ndarray = field(default_factory=lambda: np.zeros(0, dtype=np.int64))


class DCIndex:
    """Tree-structured index over all (k, δ)-trusses."""

    def __init__(self, table: KspanTable):
        self.edges = table.edges
        self.kmax = table.kmax
        self.delta_max = table.delta_max
        self._build(table)

    # -- construction --------------------------------------------------------
    def _build(self, table: KspanTable) -> None:
        kmax, dmax, m = table.kmax, table.delta_max, table.m
        ks = list(range(3, kmax + 1))
        if not ks:
            self.nodes: dict[tuple[int, int], DCNode] = {}
            self.rows: dict[int, tuple[list[int], list[tuple[int, int]]]] = {}
            self.root: tuple[int, int] | None = None
            return

        # |T_{k,δ}| for all k, δ — per-k histogram of k-spans, then cumsum.
        size: dict[int, np.ndarray] = {}
        for k in ks:
            s = table.spans[k]
            s = s[s >= 0]
            hist = np.bincount(s, minlength=dmax + 1)
            size[k] = np.cumsum(hist)

        # Choose the lighter outgoing edge per node; resolve representatives.
        # rep[(k,δ)] = the kept node whose truss is identical to T_{k,δ}.
        rep: dict[tuple[int, int], tuple[int, int]] = {}
        choice: dict[tuple[int, int], tuple[str, int]] = {}  # kept: (dir, weight)
        root = (kmax, 0)
        for d in range(0, dmax + 1):
            for k in reversed(ks):
                node = (k, d)
                w_v = int(size[k][d] - size[k + 1][d]) if k < kmax else None
                w_h = int(size[k][d] - size[k][d - 1]) if d > 0 else None
                if node == root:
                    rep[node] = node
                    choice[node] = ("root", int(size[k][d]))
                    continue
                # pick the lighter existing out-edge (ties prefer vertical,
                # which chains toward the root fastest; any tie-break is
                # correct since both sinks are then identical sets)
                if w_v is not None and (w_h is None or w_v <= w_h):
                    direction, w, sink = "v", w_v, (k + 1, d)
                else:
                    direction, w, sink = "h", w_h, (k, d - 1)
                if w == 0:
                    rep[node] = rep[sink]
                else:
                    rep[node] = node
                    choice[node] = (direction, w)

        # Materialize kept nodes with parent pointers.
        self.root = root
        self.nodes = {}
        for (k, d), (direction, _w) in choice.items():
            if direction == "root":
                parent = None
            elif direction == "v":
                parent = rep[(k + 1, d)]
            else:
                parent = rep[(k, d - 1)]
            self.nodes[(k, d)] = DCNode(k, d, parent)

        # Fill IES payloads.
        #  horizontal node (k,δ): edges with k-span exactly δ
        #  vertical node (k,δ):  edges with span_k ≤ δ < span_{k+1}
        #  root:                 all of T_{kmax,0}
        for k in ks:
            s = table.spans[k]
            in_k = s >= 0
            nxt = table.spans.get(k + 1)
            if nxt is None:
                nxt_eff = np.full(m, np.iinfo(np.int64).max, dtype=np.int64)
            else:
                nxt_eff = np.where(nxt >= 0, nxt, np.iinfo(np.int64).max)
            h_deltas = sorted(
                d for (kk, d) in self.nodes if kk == k and choice[(kk, d)][0] == "h"
            )
            v_deltas = sorted(
                d for (kk, d) in self.nodes if kk == k and choice[(kk, d)][0] == "v"
            )
            # horizontal: group edges by span value
            if h_deltas:
                hset = set(h_deltas)
                buckets: dict[int, list[int]] = {d: [] for d in h_deltas}
                for e in np.flatnonzero(in_k):
                    sp = int(s[e])
                    if sp in hset:
                        buckets[sp].append(int(e))
                for d in h_deltas:
                    self.nodes[(k, d)].edge_ids = np.asarray(buckets[d], dtype=np.int64)
            # vertical: edge e belongs to every chosen δ in [span_k(e), span_{k+1}(e)−1]
            if v_deltas:
                vbuckets: dict[int, list[int]] = {d: [] for d in v_deltas}
                for e in np.flatnonzero(in_k):
                    lo = int(s[e])
                    hi = int(min(nxt_eff[e] - 1, self.delta_max))
                    if hi < lo:
                        continue
                    i = bisect.bisect_left(v_deltas, lo)
                    while i < len(v_deltas) and v_deltas[i] <= hi:
                        vbuckets[v_deltas[i]].append(int(e))
                        i += 1
                for d in v_deltas:
                    self.nodes[(k, d)].edge_ids = np.asarray(vbuckets[d], dtype=np.int64)
        # root payload: T_{kmax,0}
        s = table.spans[kmax]
        self.nodes[root].edge_ids = np.flatnonzero(s == 0).astype(np.int64)

        # Compressed lookup table: per-k runs of identical representatives.
        self.rows = {}
        for k in ks:
            starts: list[int] = []
            reps: list[tuple[int, int]] = []
            prev = None
            for d in range(0, dmax + 1):
                r = rep[(k, d)]
                if r != prev:
                    starts.append(d)
                    reps.append(r)
                    prev = r
            self.rows[k] = (starts, reps)

    # -- query ---------------------------------------------------------------
    def query_ids(self, k: int, delta: float) -> np.ndarray:
        """Edge ids of T_{k,δ}: lookup + union of IESes on the root path."""
        if k <= 2:
            return np.arange(len(self.edges))
        if k > self.kmax or k not in self.rows:
            return np.zeros(0, dtype=np.int64)
        if delta < 0:
            return np.zeros(0, dtype=np.int64)
        # clamp before int(): δ may be float('inf') (= the static k-truss)
        delta_c = self.delta_max if delta >= self.delta_max else int(delta)
        starts, reps = self.rows[k]
        i = bisect.bisect_right(starts, delta_c) - 1
        node_key = reps[i]
        parts = []
        while node_key is not None:
            node = self.nodes[node_key]
            parts.append(node.edge_ids)
            node_key = node.parent
        if not parts:
            return np.zeros(0, dtype=np.int64)
        return np.concatenate(parts)

    def query(self, k: int, delta: float) -> set[tuple[int, int]]:
        return {self.edges[int(e)] for e in self.query_ids(k, delta)}

    # -- statistics (Table II) -------------------------------------------------
    def total_edges(self) -> int:
        """Total edge entries stored across all tree nodes."""
        return sum(len(n.edge_ids) for n in self.nodes.values())

    def space_bytes(self) -> int:
        """Byte model: 8 B/edge entry + 12 B/tree node + 16 B/lookup run."""
        n_runs = sum(len(starts) for starts, _ in self.rows.values())
        return 8 * self.total_edges() + 12 * len(self.nodes) + 16 * n_runs
