"""Benchmark reproducing evaluation Table 2 (bench-scale surrogates)."""
from benchmarks._common import run_table

from repro.tables import table2


def test_table2(benchmark):
    rows = run_table(benchmark, table2, "table2.json", scale="bench")
    assert len(rows) == 16
