"""Benchmark reproducing evaluation Table 1 (bench-scale surrogates)."""
from benchmarks._common import run_table

from repro.tables import table1


def test_table1(benchmark):
    rows = run_table(benchmark, table1, "table1.json", scale="bench")
    assert len(rows) == 16
