"""Smoke-run the table harnesses at test scale (they are the engines behind
jobs/ and benchmarks/)."""
import pytest

from repro import tables

SUBSET = ["NA", "DB"]


def test_table1_rows():
    rows = tables.table1(names=SUBSET, scale="test")
    assert [r["dataset"] for r in rows] == SUBSET
    for r in rows:
        assert r["paper_delta"] > 0 and r["delta"] > 0
        assert isinstance(r["condition"], bool)


def test_table2_rows():
    rows = tables.table2(names=SUBSET, scale="test")
    for r in rows:
        assert r["cliques"] > 0
        assert r["hbbmcpp_s"] > 0 and r["rdegen_s"] > 0
        assert r["hbbmcpp_paper_s"] is not None


def test_table3_rows():
    rows = tables.table3(names=SUBSET, scale="test")
    for r in rows:
        assert {"hbbmcpp_s", "hbbmcp_s", "rdegen_s", "refpp_s", "rcdpp_s", "facpp_s"} <= set(r)


def test_table4_rows():
    rows = tables.table4(names=SUBSET, scale="test")
    for r in rows:
        assert r["d1_calls"] > 0 and r["d3_calls"] > 0
        assert r["d1_paper_s"] is not None


def test_table5_rows():
    rows = tables.table5(names=SUBSET, scale="test")
    for r in rows:
        assert r["t0_ratio"] is None
        assert 0 <= r["t3_ratio"] <= 100
        assert r["t3_calls"] <= r["t0_calls"]


def test_table6_rows():
    rows = tables.table6(names=SUBSET, scale="test")
    for r in rows:
        assert {"hbbmcpp_s", "vbbmc_dgn_s", "hbbmc_dgn_s", "hbbmc_mdg_s"} <= set(r)


def test_format_markdown():
    md = tables.format_markdown([{"a": 1, "b": "x"}])
    assert md.splitlines()[0] == "| a | b |"
    assert "| 1 | x |" in md


def test_table2_dist_mode(spark):
    rows = tables.table2(names=["DB"], scale="test", mode="dist", spark=spark)
    assert rows[0]["cliques"] > 0


def test_dist_mode_requires_spark():
    with pytest.raises(ValueError, match="SparkSession"):
        tables.table2(names=["DB"], scale="test", mode="dist", spark=None)
