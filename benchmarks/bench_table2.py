"""Table II regeneration cost: build both indexes and compute statistics."""
import pytest

from repro.tables.table2 import index_stats_row

BENCH = [("email", 1.0), ("superuser", 0.5)]
IDS = [f"{n}@{sf}" for n, sf in BENCH]


@pytest.mark.parametrize("name,sf", BENCH, ids=IDS)
def test_table2_row(benchmark, name, sf):
    row = benchmark.pedantic(
        lambda: index_stats_row(name, sf=sf, seed=7), rounds=2, iterations=1
    )
    assert row["dc_total"] <= row["tc_total"]
