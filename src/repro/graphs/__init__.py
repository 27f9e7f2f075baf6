"""Graph substrate: synthetic data-graph generators, distributed storage
model (partitioning / adjacency), and query-graph definitions."""
