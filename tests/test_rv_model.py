"""GF-RV row store, Neo4j-style linked store, and byte accounting."""
import numpy as np
import pytest

from repro.storage.rv_model import LinkedStore, RowStore, rv_memory_report


@pytest.fixture(scope="module")
def rv(ldbc):
    return RowStore(ldbc)


@pytest.fixture(scope="module")
def linked(ldbc):
    return LinkedStore(ldbc)


def test_scan_counts(ldbc, rv, linked):
    for label in ldbc.schema.vertices:
        n = ldbc.n_vertices(label)
        assert len(rv.scan(label)) == n
        assert len(linked.scan(label)) == n


@pytest.mark.parametrize("label", ["knows", "hasCreator", "containerOf"])
def test_adjacency_matches_tables(ldbc, rv, linked, label):
    et = ldbc.etables[label]
    for v in range(0, min(25, ldbc.n_vertices(ldbc.schema.edges[label].src))):
        ref = sorted(et[et.src == v]["dst"].tolist())
        assert sorted(n for n, _ in rv.adj_iter(label, v, "fwd")) == ref
        assert sorted(n for n, _ in linked.adj_iter(label, v, "fwd")) == ref


def test_backward_adjacency(ldbc, rv):
    et = ldbc.etables["knows"]
    v = int(et["dst"].iloc[0])
    ref = sorted(et[et.dst == v]["src"].tolist())
    assert sorted(n for n, _ in rv.adj_iter("knows", v, "bwd")) == ref


def test_vertex_property_reads(ldbc, rv, linked):
    t = ldbc.vtables["Person"]
    for v in range(10):
        assert rv.vprop("Person", v, "fName") == t["fName"].iloc[v]
        assert linked.vprop("Person", v, "fName") == t["fName"].iloc[v]
    assert rv.vprop("Person", 0, "nonexistent") is None


def test_edge_property_reads(ldbc, rv, linked):
    et = ldbc.etables["knows"]
    for eid in range(10):
        assert rv.eprop("knows", eid, "date") == et["date"].iloc[eid]
        assert linked.eprop("knows", eid, "date") == et["date"].iloc[eid]


def test_null_properties_omitted_from_records(ldbc):
    data = ldbc
    # Comments with NULL creationDate have no such record entry.
    import pandas as pd

    from repro.graphs.datasets import ldbc_lite

    sparse = ldbc_lite(sf=0.01, comment_date_null_frac=0.5)
    rv = RowStore(sparse)
    t = sparse.vtables["Comment"]
    null_rows = t.index[t["creationDate"].isna()][:5]
    for v in null_rows:
        assert rv.vprop("Comment", int(v), "creationDate") is None


class TestByteAccounting:
    def test_components(self, ldbc):
        rep = rv_memory_report(ldbc)
        assert set(rep) == {
            "vertex_props", "edge_props", "fwd_adj", "bwd_adj", "total",
        }
        assert rep["total"] == sum(
            v for k, v in rep.items() if k != "total"
        )

    def test_adjacency_is_16_bytes_per_edge_plus_offsets(self, ldbc):
        rep = rv_memory_report(ldbc)
        n_edges = sum(len(t) for t in ldbc.etables.values())
        offs = sum(
            8 * (ldbc.n_vertices(e.src) + 1)
            for e in ldbc.schema.edges.values()
        )
        assert rep["fwd_adj"] == 16 * n_edges + offs

    def test_edge_props_include_per_edge_pointer(self, ldbc):
        # Even property-less edge labels pay 8 bytes per edge (§8.2).
        rep = rv_memory_report(ldbc)
        n_edges = sum(len(t) for t in ldbc.etables.values())
        assert rep["edge_props"] >= 8 * n_edges

    def test_string_value_bytes(self):
        from repro.storage.rv_model import _value_bytes

        assert _value_bytes("str", "abc") == 7  # 4B length + payload
        assert _value_bytes("int32", 5) == 4
        assert _value_bytes("int64", 5) == 8
        assert _value_bytes("float64", 5.0) == 8
