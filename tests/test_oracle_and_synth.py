"""The provided DuckDB oracle and TPC-H-lite generators keep working
alongside the graph reproduction (they share the Spark session and the
oracle is the correctness backbone of every query test)."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


def test_oracle_on_tpch_join(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = spark.sql(
        "SELECT o.o_orderpriority AS pri, COUNT(*) AS cnt "
        "FROM {li} li JOIN {o} o ON li.l_orderkey = o.o_orderkey "
        "GROUP BY o.o_orderpriority",
        li=li,
        o=o,
    )
    assert_equivalent(
        got,
        "SELECT o.o_orderpriority AS pri, COUNT(*) AS cnt "
        "FROM li JOIN o ON li.l_orderkey = o.o_orderkey "
        "GROUP BY o.o_orderpriority",
        li=li,
        o=o,
    )


def test_oracle_catches_wrong_result(spark, ldbc):
    import pandas as pd

    wrong = spark.createDataFrame(pd.DataFrame({"cnt": [-1]}))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT COUNT(*) AS cnt FROM v_Person",
            **ldbc.sql_tables(),
        )


def test_zipf_and_uniform_generators(spark):
    z = synth_data.zipf_keys(spark, n=2000, n_keys=50).toPandas()
    u = synth_data.uniform_keys(spark, n=2000, n_keys=50).toPandas()
    assert z["k"].value_counts().iloc[0] > u["k"].value_counts().iloc[0]
