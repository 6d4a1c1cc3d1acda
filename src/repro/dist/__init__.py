"""Distributed maximal clique enumeration: the paper's algorithms as a
Spark DataFrame job partitioned by root branches (vertex or edge)."""
