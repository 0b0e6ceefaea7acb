"""Fig. 2 case-study table regeneration cost (Email analog)."""
from repro.tables.case_study import case_study


def test_case_study(benchmark):
    df = benchmark.pedantic(lambda: case_study(sf=1.0, seed=7), rounds=2, iterations=1)
    assert df["edges"].is_monotonic_decreasing
