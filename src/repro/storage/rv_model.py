"""GF-RV row-oriented storage: byte accounting and executable stores.

The paper's baseline GF-RV (§8) uses 8-byte vertex and edge IDs, CSR
adjacency lists storing (edge ID, neighbour ID) pairs, and the
*interpreted attribute layout* for vertex and edge properties: each
record is a sequence of (key, type, value) entries, plus one 8-byte
pointer per vertex/edge to its record — even for property-less edges.

Two things live here:

- :func:`rv_memory_report` — the byte accounting of that layout over a
  :class:`GraphData`, the GF-RV column of Table 2.
- :class:`RowStore` / :class:`LinkedStore` — executable stores for the
  Volcano baselines. ``RowStore`` reads a property by linearly scanning
  the record's key list (GF-RV). ``LinkedStore`` chains both property
  records and adjacency entries through per-entry links (the Neo4j-style
  record layout of §9) — every step is a pointer dereference.
"""
from __future__ import annotations

import numpy as np

from repro.graphs.data import GraphData

_NUM_BYTES = {"int32": 4, "int64": 8, "float64": 8}
_KEY_TYPE_BYTES = 2  # 1-byte key code + 1-byte type tag per entry
_PTR = 8


def _value_bytes(dtype: str, v) -> int:
    if dtype == "str":
        return 4 + len(str(v).encode())
    return _NUM_BYTES[dtype]


def _record_bytes(table, props) -> int:
    total = 0
    for p in props:
        col = table[p.name]
        present = col.notna()
        total += int(present.sum()) * _KEY_TYPE_BYTES
        if p.dtype == "str":
            total += int(
                col[present].map(lambda s: 4 + len(str(s).encode())).sum()
            )
        else:
            total += int(present.sum()) * _NUM_BYTES[p.dtype]
    return total


def rv_memory_report(data: GraphData) -> dict[str, int]:
    """Bytes of GF-RV's layout, per Table 2 component."""
    vertex_props = 0
    for name, vl in data.schema.vertices.items():
        t = data.vtables[name]
        vertex_props += _PTR * len(t) + _record_bytes(t, vl.props)
    edge_props = 0
    fwd = bwd = 0
    for name, el in data.schema.edges.items():
        t = data.etables[name]
        n_e = len(t)
        edge_props += _PTR * n_e + _record_bytes(t, el.props)
        n_src = data.n_vertices(el.src)
        n_dst = data.n_vertices(el.dst)
        # CSR offsets (8 B each) + (edge ID, neighbour ID) 16 B per edge.
        fwd += _PTR * (n_src + 1) + 16 * n_e
        bwd += _PTR * (n_dst + 1) + 16 * n_e
    return {
        "vertex_props": vertex_props,
        "edge_props": edge_props,
        "fwd_adj": fwd,
        "bwd_adj": bwd,
        "total": vertex_props + edge_props + fwd + bwd,
    }


class RowStore:
    """Executable GF-RV store: interpreted-attribute rows + int64 CSRs."""

    def __init__(self, data: GraphData) -> None:
        self.schema = data.schema
        self.n_vertices = {k: len(t) for k, t in data.vtables.items()}
        # Vertex records: list of (key, value) tuples; NULLs omitted.
        self.vrows: dict[str, list[list[tuple[str, object]]]] = {}
        for name, vl in data.schema.vertices.items():
            t = data.vtables[name]
            cols = [(p.name, t[p.name].tolist()) for p in vl.props]
            self.vrows[name] = [
                [(k, vals[i]) for k, vals in cols if vals[i] == vals[i] and vals[i] is not None]
                for i in range(len(t))
            ]
        # Adjacency: per label, per direction, int64 offsets + (eid, nbr).
        self.adj: dict[str, dict[str, tuple[np.ndarray, np.ndarray, np.ndarray]]] = {}
        self.erows: dict[str, list[list[tuple[str, object]]]] = {}
        for name, el in data.schema.edges.items():
            t = data.etables[name]
            cols = [(p.name, t[p.name].tolist()) for p in el.props]
            self.erows[name] = [
                [(k, vals[i]) for k, vals in cols if vals[i] == vals[i] and vals[i] is not None]
                for i in range(len(t))
            ]
            src = t["src"].to_numpy(dtype=np.int64)
            dst = t["dst"].to_numpy(dtype=np.int64)
            eids = np.arange(len(t), dtype=np.int64)
            self.adj[name] = {
                "fwd": self._csr(self.n_vertices[el.src], src, dst, eids),
                "bwd": self._csr(self.n_vertices[el.dst], dst, src, eids),
            }

    @staticmethod
    def _csr(n, owners, nbrs, eids):
        # Materialized as native lists: the Volcano adapter iterates one
        # pair at a time and numpy scalar indexing would tax GF-RV with
        # simulator overhead the paper's Java arrays don't have.
        order = np.argsort(owners, kind="stable")
        deg = np.bincount(owners, minlength=n)
        offsets = np.concatenate(([0], np.cumsum(deg))).astype(np.int64)
        pairs = list(zip(nbrs[order].tolist(), eids[order].tolist()))
        return [
            pairs[offsets[v]:offsets[v + 1]] for v in range(n)
        ]

    # -- Volcano adapter API -------------------------------------------------

    def scan(self, label: str):
        return range(self.n_vertices[label])

    def adj_iter(self, edge_label: str, v: int, direction: str):
        return iter(self.adj[edge_label][direction][v])

    def vprop(self, label: str, v: int, prop: str):
        for k, val in self.vrows[label][v]:  # interpreted layout: key scan
            if k == prop:
                return val
        return None

    def eprop(self, edge_label: str, eref: int, prop: str):
        for k, val in self.erows[edge_label][eref]:
            if k == prop:
                return val
        return None


class LinkedStore:
    """Neo4j-style linked-record store: every property and adjacency
    entry is a cons cell ``(payload..., next)`` walked one link at a time."""

    def __init__(self, data: GraphData) -> None:
        base = RowStore(data)
        self.schema = data.schema
        self.n_vertices = base.n_vertices
        self.vchains = {
            lbl: [self._chain(r) for r in rows] for lbl, rows in base.vrows.items()
        }
        self.echains = {
            lbl: [self._chain(r) for r in rows] for lbl, rows in base.erows.items()
        }
        self.adj_chains: dict[str, dict[str, list]] = {}
        for lbl, dirs in base.adj.items():
            self.adj_chains[lbl] = {}
            for d, lists in dirs.items():
                chains = []
                for pairs in lists:
                    node = None
                    for nbr, eid in reversed(pairs):
                        node = (nbr, eid, node)
                    chains.append(node)
                self.adj_chains[lbl][d] = chains

    @staticmethod
    def _chain(kvs):
        node = None
        for k, v in reversed(kvs):
            node = (k, v, node)
        return node

    def scan(self, label: str):
        return range(self.n_vertices[label])

    def adj_iter(self, edge_label: str, v: int, direction: str):
        node = self.adj_chains[edge_label][direction][v]
        while node is not None:
            yield node[0], node[1]
            node = node[2]

    def vprop(self, label: str, v: int, prop: str):
        node = self.vchains[label][v]
        while node is not None:
            if node[0] == prop:
                return node[1]
            node = node[2]
        return None

    def eprop(self, edge_label: str, eref: int, prop: str):
        node = self.echains[edge_label][eref]
        while node is not None:
            if node[0] == prop:
                return node[1]
            node = node[2]
        return None
