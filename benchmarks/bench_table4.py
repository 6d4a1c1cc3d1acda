"""Benchmark reproducing evaluation Table 4 (bench-scale surrogates)."""
from benchmarks._common import run_table

from repro.tables import table4


def test_table4(benchmark):
    rows = run_table(benchmark, table4, "table4.json", scale="bench")
    assert len(rows) == 16
