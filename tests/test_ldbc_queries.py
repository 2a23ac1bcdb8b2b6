"""Adapted LDBC IS/IC queries (Tables 6a/6b): oracle-checked on LBP and
on the GF-RV Volcano baseline."""
import pytest

from repro.bench.queries_ldbc import ALL_LDBC, IC_QUERIES, IS_QUERIES
from repro.oracle import assert_equivalent
from repro.util import pandas_to_spark
from repro.proc.lbp import run_lbp_df
from repro.proc.plan import to_sql
from repro.proc.volcano import run_volcano_df
from repro.storage.rv_model import RowStore


@pytest.fixture(scope="module")
def rv(ldbc):
    return RowStore(ldbc)


@pytest.mark.parametrize("spec", ALL_LDBC, ids=lambda s: s.name)
def test_ldbc_lbp_vs_oracle(spark, ldbc, ldbc_store, spec):
    got = run_lbp_df(ldbc_store, spec)
    sql = to_sql(spec, ldbc.schema)
    assert_equivalent(pandas_to_spark(spark, got), sql, **ldbc.sql_tables())


@pytest.mark.parametrize("spec", ALL_LDBC, ids=lambda s: s.name)
def test_ldbc_volcano_rv_vs_oracle(spark, ldbc, rv, spec):
    got = run_volcano_df(rv, spec)
    sql = to_sql(spec, ldbc.schema)
    assert_equivalent(pandas_to_spark(spark, got), sql, **ldbc.sql_tables())


def test_query_set_shape():
    assert len(IS_QUERIES) == 7
    assert len(IC_QUERIES) == 11  # IC10 omitted, as in the paper
    assert {q.name for q in IS_QUERIES} == {f"IS0{i}" for i in range(1, 8)}


def test_all_queries_start_from_filtered_vertex():
    # The paper's plans start at the selective node (p.id = const).
    for q in ALL_LDBC:
        if q.join_order and q.predicates:
            first = q.join_order[0]
            assert any(
                p.var == first and p.op == "=" for p in q.predicates
            ), q.name
