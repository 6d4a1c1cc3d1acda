"""Benchmark reproducing evaluation Table 3 (bench-scale surrogates)."""
from benchmarks._common import run_table

from repro.tables import table3


def test_table3(benchmark):
    rows = run_table(benchmark, table3, "table3.json", scale="bench")
    assert len(rows) == 16
