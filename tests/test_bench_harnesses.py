"""Smoke + shape tests for the per-table harnesses at tiny scale."""
import numpy as np
import pytest

from repro.bench.lbp_vs_volcano import khop_count_spec, khop_filter_spec, table5
from repro.bench.memory import COMPONENTS, format_table2, table2, table2_with_factors
from repro.bench.prop_pages import khop_read_kernel, khop_spec, table3, format_table3
from repro.bench.single_card import CONFIGS, format_table4, reply_khop, table4
from repro.bench.sensitivity import (
    CM_GRID,
    k_sweep,
    table7,
    table7_extremes,
    table8,
)
from repro.proc.lbp import run_lbp
from repro.storage.graph_store import GraphStore, StorageConfig


class TestTable2:
    def test_columns_and_components(self, ldbc):
        df = table2(ldbc)
        assert list(df.columns) == [
            "GF-RV", "+COLS", "+NEW-IDS", "+0-SUPR", "+NULL",
        ]
        assert list(df.index) == COMPONENTS

    def test_totals_shrink(self, ldbc_mid):
        df = table2(ldbc_mid)
        assert df.loc["total", "+NULL"] < df.loc["total", "GF-RV"]

    def test_factors_and_format(self, ldbc):
        df = table2(ldbc)
        w = table2_with_factors(df)
        assert "GF-CL ×" in w.columns
        txt = format_table2(df, "test")
        assert "Table 2" in txt

    def test_spark_build_same_numbers(self, spark, ldbc):
        assert table2(ldbc).equals(table2(ldbc, spark=spark))


class TestTable3:
    def test_kernel_matches_lbp_all_cells(self, ldbc, ldbc_store_uncompressed):
        for h in (1, 2):
            for d in ("fwd", "bwd"):
                spec = khop_spec("knows", "Person", "date", h, direction=d)
                assert khop_read_kernel(
                    ldbc_store_uncompressed, "knows", "date", h, d
                ) == run_lbp(ldbc_store_uncompressed, spec)

    def test_kernel_matches_lbp_edge_columns(self, ldbc):
        store = GraphStore.build(
            ldbc, StorageConfig(edge_prop_storage="edge_columns")
        )
        for h in (1, 2):
            for d in ("fwd", "bwd"):
                spec = khop_spec("knows", "Person", "date", h, direction=d)
                assert khop_read_kernel(store, "knows", "date", h, d) == (
                    run_lbp(store, spec)
                )

    def test_harness_rows(self, wiki):
        df = table3({"WIKI": wiki})
        assert len(df) == 8  # 2 hops x 2 plans x 2 configs
        assert set(df.config) == {"PAGE_P", "COL_E"}
        assert (df["seconds"] > 0).all()
        assert "Table 3" in format_table3(df)

    def test_counts_agree_across_configs(self, wiki):
        df = table3({"WIKI": wiki})
        for (_, _, h), grp in df.groupby(["dataset", "plan", "hops"]):
            assert grp["count"].nunique() == 1


class TestTable4:
    def test_configs_and_counts(self, ldbc):
        df = table4(ldbc)
        assert set(df.index) == set(CONFIGS)
        for h in (1, 2, 3):
            assert df[f"{h}-hop_count"].nunique() == 1  # same answers
        assert "Table 4" in format_table4(df)

    def test_vcol_smaller_than_csr(self, ldbc_mid):
        df = table4(ldbc_mid)
        assert df.loc["V-COL-UNC", "mem_bytes"] < df.loc["CSR-UNC", "mem_bytes"]
        assert df.loc["V-COL-C", "mem_bytes"] < df.loc["CSR-C", "mem_bytes"]
        # NULL compression shrinks the half-empty replyOf storage.
        assert df.loc["V-COL-C", "mem_bytes"] < df.loc["V-COL-UNC", "mem_bytes"]

    def test_reply_khop_spec(self):
        spec = reply_khop(2)
        assert len(spec.edges) == 2 and spec.returns == "count"


class TestTable5:
    def test_systems_agree_and_lbp_wins(self, ldbc):
        df = table5({"LDBC": ldbc}, hops=(1, 2))
        assert len(df) == 4
        assert (df["count"] >= 0).all()
        # LBP should win the 2-hop workloads even at tiny scale.
        two_hop = df[df.hops == 2]
        assert (two_hop["speedup"] > 1).all()

    def test_specs(self):
        f = khop_filter_spec("knows", "Person", "date", 3)
        assert f.edges[-1].var == "e3" and f.edges[0].var is None
        c = khop_count_spec("knows", "Person", 2)
        assert not c.predicates


class TestSensitivity:
    def test_table7_grid(self):
        df = table7(sf=0.01, rhos=(100, 50), repeats=1)
        assert len(df) == 2 * len(CM_GRID)
        assert (df["ms"] > 0).all()

    def test_table8_overhead_ordering(self):
        df = table8(sf=0.02)
        df = df.set_index(["c", "m"])
        # Overhead grows with m at fixed c; (8,8) ~ (16,16) (both m/c = 1).
        assert df.loc[(16, 8), "overhead_bytes"] < df.loc[(16, 32), "overhead_bytes"]
        ratio = df.loc[(8, 8), "overhead_bytes"] / df.loc[(16, 16), "overhead_bytes"]
        assert 0.8 < ratio < 1.3

    def test_vanilla_much_slower(self):
        df = table7_extremes(sf=0.01, repeats=1)
        assert df.loc["Vanilla-NULL", "ms"] > df.loc["J-NULL", "ms"] * 5

    def test_k_sweep_includes_edge_columns(self, wiki):
        df = k_sweep(wiki, ks=(2, 128), repeats=1)
        assert list(df["k"]) == ["2", "128", "*"]
