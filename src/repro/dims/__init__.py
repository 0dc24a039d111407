"""Grouping and partitioning: dimensions, primitives, Algorithm 1, LPT partitioner (paper §IV)."""
