"""Deterministic synthetic temporal graphs.

The paper evaluates on 8 public temporal graphs (SNAP/KONECT). The container
is offline, so we generate *analogs* that preserve the shape parameters the
algorithms are sensitive to (see DESIGN.md §3):

* **planted dense cores** — a few dense quasi-clique communities give the
  graph a non-trivial truss hierarchy (kmax in the teens–thirties, like the
  paper's narrow kmax band), on top of a sparse community periphery;
* **event-burst timestamps** — each community has a handful of event times;
  a fraction of interactions cluster around them (⇒ triangles with small
  minimum time span), the rest are uniform over [0, n) (⇒ triangles with mts
  up to ~n, so δmax ≈ n as in Table I). Together these reproduce the wide,
  non-long-tailed mts distribution of the paper's Fig. 9.

All generators are deterministic in ``seed`` and return the **flat** layout
(one row per interaction, columns ``u, v, t`` — see ``schema.py``).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from .schema import normalize_flat_pdf


@dataclass(frozen=True)
class AnalogSpec:
    """Shape parameters of one synthetic dataset analog.

    ``v``/``e`` are the vertex/static-edge targets at sf=1.0 (our bench
    scale, 10–500× below the paper's sizes). ``n`` and ``tau`` match the
    paper's Table I exactly (number of distinct timestamps, mean timestamps
    per edge). ``core_*`` control the planted dense communities that set
    kmax; the periphery absorbs the remaining edge budget.
    """

    v: int
    e: int
    n: int
    tau: float
    core_comms: int
    core_size: int
    p_core: float
    periph_comm_size: int = 50
    p_inter: float = 0.08
    burst_prob: float = 0.7
    burst_width_frac: float = 0.01
    events_per_comm: int = 8
    #: probability a bursty edge syncs on its community's *primary* event
    #: (vs a uniformly chosen one). High values create a dense synchronized
    #: sub-community — the (k, small-δ)-trusses of the paper's case study.
    primary_frac: float = 0.7
    #: vertices shared between consecutive dense cores. Overlap glues the
    #: cores into one static k-truss (lower clustering coefficient, like the
    #: paper's multi-community Email 16-truss) that δ then splits back into
    #: single synchronized cores (higher coefficient) — the Fig. 2 trend.
    core_overlap: int = 0


#: Synthetic analogs of the paper's 8 datasets (Table I), at our bench scale.
DATASETS: dict[str, AnalogSpec] = {
    "email": AnalogSpec(
        v=300, e=4500, n=803, tau=11.5, core_comms=4, core_size=40, p_core=0.85,
        burst_prob=0.9, primary_frac=0.8, core_overlap=12,
    ),
    "mathoverflow": AnalogSpec(v=2400, e=16000, n=2450, tau=1.6, core_comms=6, core_size=45, p_core=0.75),
    "askubuntu": AnalogSpec(v=5000, e=15000, n=2613, tau=1.2, core_comms=4, core_size=38, p_core=0.75),
    "superuser": AnalogSpec(v=6000, e=20000, n=2773, tau=1.2, core_comms=5, core_size=42, p_core=0.75),
    "wikitalk": AnalogSpec(v=9000, e=30000, n=2320, tau=1.4, core_comms=6, core_size=48, p_core=0.75),
    "youtube": AnalogSpec(v=4000, e=35000, n=225, tau=1.0, core_comms=6, core_size=44, p_core=0.70),
    "stackoverflow": AnalogSpec(v=12000, e=60000, n=2774, tau=1.2, core_comms=8, core_size=56, p_core=0.75),
    "wikipedia": AnalogSpec(v=10000, e=50000, n=2235, tau=1.1, core_comms=8, core_size=50, p_core=0.72),
}

#: Paper's Table I, for side-by-side reporting in EXPERIMENTS.md.
PAPER_TABLE1: dict[str, dict] = {
    "email": dict(V=900, E=16_000, n=803, tau=11.5, tri=105_000, kmax=23, dmax=800),
    "mathoverflow": dict(V=24_000, E=187_000, n=2450, tau=1.6, tri=1_400_000, kmax=42, dmax=2336),
    "askubuntu": dict(V=159_000, E=455_000, n=2613, tau=1.2, tri=680_000, kmax=26, dmax=2040),
    "superuser": dict(V=194_000, E=714_000, n=2773, tau=1.2, tri=1_500_000, kmax=35, dmax=2692),
    "wikitalk": dict(V=1_100_000, E=2_700_000, n=2320, tau=1.4, tri=8_100_000, kmax=49, dmax=2231),
    "youtube": dict(V=322_000, E=9_300_000, n=225, tau=1.0, tri=12_000_000, kmax=33, dmax=225),
    "stackoverflow": dict(V=2_600_000, E=28_100_000, n=2774, tau=1.2, tri=114_200_000, kmax=79, dmax=2768),
    "wikipedia": dict(V=1_800_000, E=36_500_000, n=2235, tau=1.1, tri=126_600_000, kmax=59, dmax=2231),
}


def _dedup_pairs(pairs: np.ndarray) -> np.ndarray:
    """Unique undirected pairs (rows already oriented lo<hi)."""
    if len(pairs) == 0:
        return pairs.reshape(0, 2)
    return np.unique(pairs, axis=0)


def _static_topology(
    spec: AnalogSpec, sf: float, rng: np.random.Generator
) -> tuple[np.ndarray, np.ndarray, int]:
    """Sample the static edge set.

    Returns ``(pairs, comm_of_edge, n_comms)`` where ``pairs`` is an (m, 2)
    int array with lo<hi and ``comm_of_edge[i]`` is the community id of edge
    i (-1 for inter-community edges). Core communities occupy the lowest
    vertex ids so a given core stays intact under scale-factor changes.
    """
    n_v = max(spec.core_size + 4, int(round(spec.v * sf)))
    e_target = max(8, int(round(spec.e * sf)))
    core_comms = max(1, int(round(spec.core_comms * sf))) if sf < 1.0 else spec.core_comms
    core_comms = min(core_comms, max(1, n_v // spec.core_size))

    pairs_list: list[np.ndarray] = []
    comm_list: list[np.ndarray] = []

    # Dense cores: enumerate each community's vertex pairs, keep p_core of
    # them. Consecutive cores share ``core_overlap`` vertices.
    stride = max(1, spec.core_size - spec.core_overlap)
    iu, iv = np.triu_indices(spec.core_size, k=1)
    for c in range(core_comms):
        base = c * stride
        keep = rng.random(len(iu)) < spec.p_core
        p = np.stack([iu[keep] + base, iv[keep] + base], axis=1)
        pairs_list.append(p)
        comm_list.append(np.full(len(p), c, dtype=np.int64))

    if pairs_list:
        cp = np.concatenate(pairs_list)
        cc = np.concatenate(comm_list)
        core_pairs, idx = np.unique(cp, axis=0, return_index=True)
        core_comm_ids = cc[idx]
    else:
        core_pairs = np.zeros((0, 2), int)
        core_comm_ids = np.zeros(0, dtype=np.int64)
    n_core_v = (core_comms - 1) * stride + spec.core_size if core_comms else 0

    # Periphery: sparse communities of fixed size over the remaining vertices.
    periph_v = n_v - n_core_v
    n_periph_comms = max(0, periph_v // spec.periph_comm_size)
    e_rest = max(0, e_target - len(core_pairs))
    n_comms = core_comms + n_periph_comms

    rest: list[np.ndarray] = []
    rest_comm: list[np.ndarray] = []
    if e_rest > 0 and n_v >= 4:
        n_inter = int(e_rest * spec.p_inter) if n_v > spec.core_size else 0
        n_intra = e_rest - n_inter
        if n_periph_comms > 0 and n_intra > 0:
            # Oversample intra-periphery pairs, dedup later.
            m = int(n_intra * 1.6) + 8
            comm = rng.integers(0, n_periph_comms, m)
            a = rng.integers(0, spec.periph_comm_size, m)
            b = rng.integers(0, spec.periph_comm_size, m)
            ok = a != b
            comm, a, b = comm[ok], a[ok], b[ok]
            base = n_core_v + comm * spec.periph_comm_size
            lo = np.minimum(a, b) + base
            hi = np.maximum(a, b) + base
            rest.append(np.stack([lo, hi], axis=1))
            rest_comm.append(comm + core_comms)
        if n_inter > 0:
            m = int(n_inter * 1.6) + 8
            a = rng.integers(0, n_v, m)
            b = rng.integers(0, n_v, m)
            ok = a != b
            a, b = a[ok], b[ok]
            lo, hi = np.minimum(a, b), np.maximum(a, b)
            rest.append(np.stack([lo, hi], axis=1))
            rest_comm.append(np.full(len(lo), -1, dtype=np.int64))

    if rest:
        rp = np.concatenate(rest)
        rc = np.concatenate(rest_comm)
        # Dedup periphery pairs and drop any that collide with core pairs.
        rp, idx = np.unique(rp, axis=0, return_index=True)
        rc = rc[idx]
        if len(core_pairs):
            core_keys = core_pairs[:, 0].astype(np.int64) * n_v + core_pairs[:, 1]
            rest_keys = rp[:, 0].astype(np.int64) * n_v + rp[:, 1]
            keep = ~np.isin(rest_keys, core_keys)
            rp, rc = rp[keep], rc[keep]
        # Trim to budget deterministically (random permutation from rng).
        if len(rp) > e_rest:
            sel = rng.permutation(len(rp))[:e_rest]
            sel.sort()
            rp, rc = rp[sel], rc[sel]
        pairs = np.concatenate([core_pairs, rp])
        comms = np.concatenate([core_comm_ids, rc])
    else:
        pairs = core_pairs
        comms = core_comm_ids

    return pairs, comms.astype(np.int64), n_comms


def analog(name: str, *, sf: float = 1.0, seed: int = 7) -> pd.DataFrame:
    """Generate the flat (u, v, t) interaction table for a dataset analog.

    ``sf`` scales |V| and |E| (and the number of dense cores) while keeping
    core density — so kmax is roughly scale-invariant, like the paper's
    observation that kmax stays in a narrow band across dataset sizes.
    """
    spec = DATASETS[name]
    # zlib.crc32 is a stable hash (str hash() is salted per process).
    import zlib

    rng = np.random.default_rng((seed, zlib.crc32(name.encode())))
    pairs, comm_of_edge, n_comms = _static_topology(spec, sf, rng)
    m = len(pairs)
    n_ticks = spec.n

    # Interaction counts per edge: mean ≈ tau, minimum 1. Exponential (not
    # Poisson) so most edges carry a single timestamp with a heavy tail —
    # matching real communication graphs, and necessary for δmax ≈ n
    # (Table I): sparse-τ edges far apart in time create triangles whose
    # minimum span approaches the whole observation window.
    counts = 1 + np.round(rng.exponential(max(0.0, spec.tau - 1.0), m)).astype(np.int64)
    edge_idx = np.repeat(np.arange(m), counts)
    total = len(edge_idx)

    # Community event times drive bursts. Event 0 is the community's
    # *primary*; later events scatter around it at growing spreads, giving
    # each community nested synchronization rings — so shrinking δ peels a
    # truss gradually (the paper's Fig. 2 gradient) instead of all-or-nothing.
    n_c = max(1, n_comms)
    primary_t = rng.integers(0, n_ticks, size=(n_c, 1))
    ranks = np.arange(spec.events_per_comm)[None, :]
    spread = (ranks * 0.06 * n_ticks) * rng.standard_normal((n_c, spec.events_per_comm))
    events = np.clip(primary_t + np.round(spread).astype(np.int64), 0, n_ticks - 1)
    width = max(1.0, spec.burst_width_frac * n_ticks)

    # Bursts are *per edge*: each bursty edge's interactions cluster around
    # one community event. A triangle's minimum span is then governed by how
    # far apart its three edges' events lie — same event ⇒ tiny mts,
    # different events ⇒ mts of the order of the event spacing — which
    # spreads triangle counts across the whole [0, n) span axis (the
    # paper's Fig. 9 shape, and what makes δ an effective knob in Fig. 2).
    edge_burst = (comm_of_edge >= 0) & (rng.random(m) < spec.burst_prob)
    edge_event = rng.integers(0, spec.events_per_comm, m)
    primary = rng.random(m) < spec.primary_frac
    edge_event = np.where(primary, 0, edge_event)  # event 0 = primary
    edge_center = events[np.clip(comm_of_edge, 0, None), edge_event]
    burst = edge_burst[edge_idx]
    t = rng.integers(0, n_ticks, total)  # uniform background
    if burst.any():
        centers = edge_center[edge_idx]
        jitter = np.round(rng.normal(0.0, width, total)).astype(np.int64)
        t = np.where(burst, np.clip(centers + jitter, 0, n_ticks - 1), t)

    flat = pd.DataFrame({"u": pairs[edge_idx, 0], "v": pairs[edge_idx, 1], "t": t})
    return normalize_flat_pdf(flat)


def random_temporal_graph(
    *,
    n_vertices: int,
    n_edges: int,
    n_timestamps: int = 32,
    tau: float = 2.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Small Erdős–Rényi-style temporal graph for property/brute-force tests."""
    rng = np.random.default_rng(seed)
    m = int(n_edges * 1.8) + 8
    a = rng.integers(0, n_vertices, m)
    b = rng.integers(0, n_vertices, m)
    ok = a != b
    a, b = a[ok], b[ok]
    pairs = _dedup_pairs(np.stack([np.minimum(a, b), np.maximum(a, b)], axis=1))
    if len(pairs) > n_edges:
        sel = rng.permutation(len(pairs))[:n_edges]
        sel.sort()
        pairs = pairs[sel]
    counts = 1 + rng.poisson(max(0.0, tau - 1.0), len(pairs))
    edge_idx = np.repeat(np.arange(len(pairs)), counts)
    t = rng.integers(0, n_timestamps, len(edge_idx))
    flat = pd.DataFrame({"u": pairs[edge_idx, 0], "v": pairs[edge_idx, 1], "t": t})
    return normalize_flat_pdf(flat)


def triangle_rich_graph(
    *, n_cliques: int = 3, clique_size: int = 8, n_timestamps: int = 24, tau: float = 2.5, seed: int = 1
) -> pd.DataFrame:
    """Overlapping-clique temporal graph: guaranteed non-trivial trusses.

    Cliques overlap by two vertices, so trusses of multiple k values and
    k-spans of multiple δ values exist — a good unit-test workload.
    """
    rng = np.random.default_rng(seed)
    rows = []
    start = 0
    for _ in range(n_cliques):
        verts = list(range(start, start + clique_size))
        for i in range(len(verts)):
            for j in range(i + 1, len(verts)):
                for _ in range(1 + rng.poisson(max(0.0, tau - 1.0))):
                    rows.append((verts[i], verts[j], int(rng.integers(0, n_timestamps))))
        start += clique_size - 2  # two-vertex overlap with the next clique
    return normalize_flat_pdf(pd.DataFrame(rows, columns=["u", "v", "t"]))


def coarsen_time(flat: pd.DataFrame, merge: int) -> pd.DataFrame:
    """Merge every ``merge`` consecutive timestamps into one (Fig. 15 setup)."""
    out = flat.copy()
    out["t"] = out["t"] // merge
    return normalize_flat_pdf(out)
