"""Spark-distributed LBP: scan-partitioned execution over a broadcast
store matches the oracle."""
import pytest

from repro.oracle import assert_equivalent
from repro.proc.distributed import run_distributed, run_distributed_df, scan_ranges
from repro.proc.plan import Predicate as Pr
from repro.proc.plan import QueryEdge as E
from repro.proc.plan import QuerySpec, to_sql


class TestScanRanges:
    def test_covers_everything(self):
        parts = scan_ranges(100, 7)
        assert parts[0][0] == 0 and parts[-1][1] == 100
        total = sum(hi - lo for lo, hi in parts)
        assert total == 100

    def test_more_parts_than_items(self):
        parts = scan_ranges(3, 16)
        assert len(parts) == 3

    def test_single_part(self):
        assert scan_ranges(10, 1) == [(0, 10)]


def test_distributed_count(spark, ldbc, ldbc_store):
    spec = QuerySpec(
        "dist_count", {"a": "Person", "b": "Person", "c": "Person"},
        [E("a", "b", "knows", "e1"), E("b", "c", "knows")],
        [Pr("e1", "date", ">", 1_350_000_000)], "count",
    )
    got = run_distributed(spark, ldbc_store, spec, n_parts=8)
    df = run_distributed_df(spark, ldbc_store, spec, n_parts=8)
    sql = to_sql(spec, ldbc.schema)
    assert_equivalent(df, sql, **ldbc.sql_tables())
    assert got == df.collect()[0]["cnt"]


def test_distributed_projection(spark, ldbc, ldbc_store):
    spec = QuerySpec(
        "dist_proj", {"c": "Comment", "p": "Person"},
        [E("c", "p", "hasCreator")],
        [Pr("p", "birthday", ">", 15_000)],
        [("c", "id"), ("p", "fName")],
        ["c", "p"],
    )
    df = run_distributed(spark, ldbc_store, spec, n_parts=4)
    sql = to_sql(spec, ldbc.schema)
    assert_equivalent(df, sql, **ldbc.sql_tables())


def test_distributed_empty_projection(spark, ldbc, ldbc_store):
    spec = QuerySpec(
        "dist_empty", {"a": "Person", "b": "Person"},
        [E("a", "b", "knows")], [Pr("a", "id", "=", -5)],
        [("b", "id")],
    )
    df = run_distributed(spark, ldbc_store, spec, n_parts=4)
    assert df.count() == 0
    assert df.columns == ["b_id"]


def test_distributed_matches_local(spark, ldbc, ldbc_store):
    from repro.proc.lbp import run_lbp

    spec = QuerySpec(
        "dist_vs_local", {"p": "Person", "o": "Org"},
        [E("p", "o", "workAt", "w")], [Pr("w", "year", ">=", 2000)], "count",
    )
    assert run_distributed(spark, ldbc_store, spec, n_parts=6) == run_lbp(
        ldbc_store, spec
    )
