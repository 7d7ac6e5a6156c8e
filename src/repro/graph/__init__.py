"""Temporal-graph substrate: schema, adjacency, generators, datasets."""
