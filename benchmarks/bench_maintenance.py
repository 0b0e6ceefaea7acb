"""Fig. 16 shape — dynamic maintenance: TC-IM / DC-IM vs rebuild.

Paper claim: the filter-and-verification update is up to two orders of
magnitude faster than rebuilding the index from scratch per insertion, and
TC-IM slightly outperforms DC-IM (tree re-derivation overhead).

Each maintenance benchmark measures a batch of N reinsertions of removed
temporal edges (per-insertion time = reported time / N); the rebuild
benchmark measures ONE full MBA reconstruction, i.e. the per-insertion cost
of the no-index-maintenance baseline.
"""
import numpy as np
import pytest

from repro.core.maintainers import DCMaintainer, TCMaintainer
from repro.core.mba import mba
from repro.core.model import TemporalGraph
from repro.tgraph.generators import analog

NAME, SF, N_UPDATES = "mathoverflow", 0.5, 40


def _workload():
    flat = analog(NAME, sf=SF, seed=7)
    rng = np.random.default_rng(7)
    idx = rng.choice(len(flat), size=N_UPDATES, replace=False)
    victims = flat.iloc[sorted(idx)]
    rest = flat.drop(index=victims.index)
    return rest, [(int(u), int(v), int(t)) for u, v, t in victims.itertuples(index=False)]


@pytest.mark.parametrize("maintainer_cls", [TCMaintainer, DCMaintainer], ids=["tc_im", "dc_im"])
def test_maintain_insertions(benchmark, maintainer_cls):
    rest, victims = _workload()

    def setup():
        g = TemporalGraph.from_flat(rest)
        g.triangles()
        return (maintainer_cls(g),), {}

    def run(m):
        for u, v, t in victims:
            m.insert(u, v, t)

    benchmark.pedantic(run, setup=setup, rounds=2, iterations=1)


def test_rebuild_from_scratch(benchmark):
    flat = analog(NAME, sf=SF, seed=7)

    def run():
        g = TemporalGraph.from_flat(flat)
        return mba(g)

    benchmark.pedantic(run, rounds=2, iterations=1)
