"""Distributed graph-analytics substrate (DataFrame / Spark SQL only).

Everything the paper's preprocessing needs, as Catalyst-planned jobs:
degrees, triangle counting, per-edge support, k-core decomposition (δ) and
k-truss decomposition (τ). Validated in tests against the exact local peels
in ``repro.core.ordering`` and, where expressible in SQL, against the DuckDB
oracle.
"""
