"""Temporal-graph substrate: schema, synthetic generators, statistics."""
