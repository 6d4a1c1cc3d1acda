"""Graph data: deterministic synthetic generators, the Table I surrogate
dataset registry, and Spark edge-list utilities."""
