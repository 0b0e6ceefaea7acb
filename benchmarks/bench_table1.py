"""Table I regeneration cost: the Spark statistics dataflow per dataset."""
import pytest

from repro.tgraph.generators import analog
from repro.tgraph.stats import dataset_stats

BENCH = [("email", 1.0), ("askubuntu", 1.0)]
IDS = [f"{n}@{sf}" for n, sf in BENCH]


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_table1_stats(benchmark, spark, name, sf):
    flat_pdf = analog(name, sf=sf, seed=7)
    result = benchmark.pedantic(
        lambda: dataset_stats(spark, flat_pdf), rounds=2, iterations=1
    )
    assert result["kmax"] >= 3
