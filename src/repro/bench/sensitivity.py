"""Appendix A sensitivity analyses — Tables 7 and 8, plus the Fig 12
property-page ``k`` sweep (reported as a table; figures are out of
scope).

Table 7: runtime of the 1-hop query
``MATCH (a:Person)-[:likes]->(b:Comment) RETURN b.creationDate`` while
the Comment.creationDate column holds ρ% non-NULL values, for (c, m) ∈
{8,16} × {8,16,24,32}. The read path is exactly the query's sink: walk
the likes adjacency lists in forward order, gather b.creationDate
through the Jacobson-compressed column.

Table 8: bytes of the bit strings + prefix sums per (c, m) at ρ = 50%.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd

from repro.graphs.data import GraphData
from repro.graphs.datasets import ldbc_lite
from repro.storage.null_compression import NullableColumn

CM_GRID = [(8, 8), (8, 16), (8, 24), (8, 32), (16, 8), (16, 16), (16, 24), (16, 32)]


def _likes_read_order(data: GraphData) -> np.ndarray:
    """Comment offsets in the order the 1-hop likes plan reads them:
    forward adjacency-list order of the likes CSR."""
    et = data.etables["likes"]
    order = np.argsort(et["src"].to_numpy(), kind="stable")
    return et["dst"].to_numpy(dtype=np.int64)[order]


def _column(values: np.ndarray, mask: np.ndarray, c: int, m: int, mode: str):
    return NullableColumn(values, mask, mode=mode, c=c, m=m)


def table7(
    *, sf: float = 0.05, rhos=(100, 90, 80, 70, 60, 50, 40, 30, 20, 10),
    repeats: int = 3, seed: int = 42, block: int = 1024,
) -> pd.DataFrame:
    """Runtime (ms) of the 1-hop read per (c, m) and non-NULL ρ."""
    rows = []
    base = ldbc_lite(sf=sf, seed=seed)
    reads = _likes_read_order(base)
    n_comment = base.n_vertices("Comment")
    g = np.random.default_rng(seed)
    values = g.integers(1_200_000_000, 1_550_000_000, n_comment)
    for rho in rhos:
        mask = g.random(n_comment) < rho / 100.0
        for c, m in CM_GRID:
            col = _column(values, mask, c, m, "jacobson")
            best = None
            for _ in range(repeats):
                t0 = time.perf_counter()
                for lo in range(0, len(reads), block):
                    col.get_many(reads[lo:lo + block])
                dt = time.perf_counter() - t0
                best = dt if best is None else min(best, dt)
            rows.append({
                "rho": rho, "c": c, "m": m, "ms": best * 1000.0,
            })
    return pd.DataFrame(rows)


def table7_extremes(
    *, sf: float = 0.05, rho: int = 50, seed: int = 42, block: int = 1024,
    repeats: int = 3,
) -> pd.DataFrame:
    """The §8.5 three-way comparison at one density: Uncompressed vs
    J-NULL vs Vanilla-NULL (the latter's rank is O(p) per access)."""
    base = ldbc_lite(sf=sf, seed=seed)
    reads = _likes_read_order(base)
    n_comment = base.n_vertices("Comment")
    g = np.random.default_rng(seed)
    values = g.integers(1_200_000_000, 1_550_000_000, n_comment)
    mask = g.random(n_comment) < rho / 100.0
    rows = []
    for mode, label in (
        ("uncompressed", "Uncompressed"),
        ("jacobson", "J-NULL"),
        ("vanilla", "Vanilla-NULL"),
    ):
        col = _column(values, mask, 16, 16, mode)
        # Vanilla rank is O(n) per element: bound its sample to keep the
        # demonstration finite, then scale (documented; >20x is the claim).
        sample = reads if mode != "vanilla" else reads[: max(1, len(reads) // 50)]
        best = None
        for _ in range(repeats if mode != "vanilla" else 1):
            t0 = time.perf_counter()
            for lo in range(0, len(sample), block):
                col.get_many(sample[lo:lo + block])
            dt = time.perf_counter() - t0
            best = dt if best is None else min(best, dt)
        scale = len(reads) / len(sample)
        rows.append({"scheme": label, "ms": best * 1000.0 * scale,
                     "scaled": scale != 1.0})
    return pd.DataFrame(rows).set_index("scheme")


def table8(*, sf: float = 0.05, rho: int = 50, seed: int = 42) -> pd.DataFrame:
    """Overhead (bytes) of bit strings + prefix sums per (c, m)."""
    base = ldbc_lite(sf=sf, seed=seed)
    n_comment = base.n_vertices("Comment")
    g = np.random.default_rng(seed)
    values = g.integers(1_200_000_000, 1_550_000_000, n_comment)
    mask = g.random(n_comment) < rho / 100.0
    rows = []
    for c, m in CM_GRID:
        col = _column(values, mask, c, m, "jacobson")
        rows.append({
            "c": c, "m": m,
            "overhead_bytes": col.index.overhead_bytes(),
            "bits_per_element": col.index.overhead_bytes() * 8 / n_comment,
        })
    return pd.DataFrame(rows)


def k_sweep(
    data: GraphData, *, ks=(2, 8, 32, 128, 512, 2048, 8192), repeats: int = 1,
    spark=None,
) -> pd.DataFrame:
    """Fig 12 as a table: Table 3's 1-hop forward query across page sizes
    k, with '*' = pure edge columns (k = ∞)."""
    from repro.bench.prop_pages import khop_spec, _dataset_params
    from repro.proc.lbp import run_lbp
    from repro.storage.graph_store import GraphStore, StorageConfig

    elabel, vlabel, prop = _dataset_params(data)
    spec = khop_spec(elabel, vlabel, prop, 1, direction="fwd", name="k-sweep")
    rows = []
    for k in list(ks) + ["*"]:
        cfg = (
            StorageConfig(edge_prop_storage="edge_columns")
            if k == "*"
            else StorageConfig(k=int(k))
        )
        store = GraphStore.build(data, cfg, spark=spark)
        best = None
        for _ in range(repeats):
            t0 = time.perf_counter()
            run_lbp(store, spec)
            dt = time.perf_counter() - t0
            best = dt if best is None else min(best, dt)
        rows.append({"k": str(k), "seconds": best})
    return pd.DataFrame(rows)
