"""Benchmark reproducing evaluation Table 6 (bench-scale surrogates)."""
from benchmarks._common import run_table

from repro.tables import table6


def test_table6(benchmark):
    rows = run_table(benchmark, table6, "table6.json", scale="bench")
    assert len(rows) == 16
