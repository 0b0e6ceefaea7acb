"""Shared benchmark fixtures: build each analog's graph/table/indexes once."""
import pytest

from repro.tables.perf import build_all

_CACHE: dict = {}


@pytest.fixture(scope="session")
def built():
    """``built(name, sf)`` → (graph, kspan table, TCIndex, DCIndex), cached."""

    def get(name: str, sf: float):
        key = (name, sf)
        if key not in _CACHE:
            _CACHE[key] = build_all(name, sf=sf, seed=7)
        return _CACHE[key]

    return get
