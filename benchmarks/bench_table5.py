"""Benchmark reproducing evaluation Table 5 (bench-scale surrogates)."""
from benchmarks._common import run_table

from repro.tables import table5


def test_table5(benchmark):
    rows = run_table(benchmark, table5, "table5.json", scale="bench")
    assert len(rows) == 16
