"""Table 3 — single-indexed property pages vs edge columns (§8.3).

k-hop path queries with edge-property predicates, run with a forward
plan (properties read in forward adjacency-list order — sequential
under PROP PAGES) and a backward plan (random reads under both
configurations). PAGE_P = property pages (k = 128); COL_E = edge
columns with randomized edge IDs.
"""
from __future__ import annotations

import time

import pandas as pd

from repro.graphs.data import GraphData
from repro.proc.lbp import run_lbp
from repro.proc.plan import Predicate as Pr
from repro.proc.plan import QueryEdge as E
from repro.proc.plan import QuerySpec
from repro.storage.graph_store import GraphStore, StorageConfig

PRED_DATE = 1_400_000_000


def khop_spec(
    edge_label: str,
    vlabel: str,
    prop: str,
    hops: int,
    *,
    direction: str = "fwd",
    name: str = "khop",
    src_pred=None,
) -> QuerySpec:
    """k-hop path over one edge label: the first edge's property is
    compared to a constant, each later edge's to the previous edge's
    (the paper's 1-/2-hop workloads of §8.3)."""
    vars_ = [chr(ord("a") + i) for i in range(hops + 1)]
    edges = [
        E(vars_[i], vars_[i + 1], edge_label, f"e{i + 1}") for i in range(hops)
    ]
    preds = [Pr("e1", prop, ">", PRED_DATE)]
    for i in range(2, hops + 1):
        preds.append(Pr(f"e{i}", prop, ">", value=None,
                        rhs_var=f"e{i - 1}", rhs_prop=prop))
    if src_pred is not None:
        preds.insert(0, src_pred)
    order = vars_ if direction == "fwd" else list(reversed(vars_))
    return QuerySpec(
        name,
        {v: vlabel for v in vars_},
        edges,
        preds,
        "count",
        order,
    )


def _dataset_params(data: GraphData):
    """(edge label, vertex label, property) for a Table 3 dataset."""
    if "knows" in data.schema.edges:
        return "knows", "Person", "date"
    return "link", "node", "timestamp"


def khop_read_kernel(
    store: GraphStore, elabel: str, prop: str, hops: int, direction: str,
    *, const: int = PRED_DATE,
) -> int:
    """Whole-graph vectorized execution of the Table 3 k-hop queries.

    This is the measurement instrument for the storage comparison: both
    configurations run the *identical* code; only the property reads
    differ (sequential slice / run-structured position read for forward
    property pages vs random gathers for edge columns and backward
    reads). Counts are asserted equal to :func:`run_lbp` in tests.
    """
    import numpy as np

    from repro.proc.operators import _eprop_block_multi, concat_ranges

    assert hops in (1, 2)
    es = store.edge(elabel)
    csr = es.csr(direction)
    cur_v = np.arange(csr.n_vertices, dtype=np.int64)
    carried = None
    for h in range(1, hops + 1):
        starts, ends = csr.ranges_of(cur_v)
        idx, contig, lens = concat_ranges(starts, ends)
        nbr = (
            csr.nbr[contig[0]:contig[1]] if contig is not None else csr.nbr[idx]
        ).astype(np.int64)
        blk = _eprop_block_multi(
            es, prop, direction, cur_v, lens, idx, contig, csr
        )
        vals = blk.data
        valid = (
            np.ones(len(vals), dtype=bool) if blk.nulls is None else ~blk.nulls
        )
        last = h == hops
        if direction == "fwd":
            # e1 > const at hop 1; e_h > e_{h-1} afterwards.
            mask = (vals > const) if h == 1 else (
                vals > np.repeat(carried, lens)
            )
            mask &= valid
            if last:
                return int(mask.sum())
            cur_v, carried = nbr[mask], vals[mask]
        else:
            # Backward plans bind the last edge first; all predicates
            # become checkable only at the final hop.
            if not last:
                mask = valid
                cur_v, carried = nbr[mask], vals[mask]
                continue
            if hops == 1:
                mask = (vals > const) & valid
            else:
                mask = (vals > const) & (np.repeat(carried, lens) > vals)
                mask &= valid
            return int(mask.sum())
    raise AssertionError("unreachable")


def table3(
    datasets: dict[str, GraphData], *, spark=None, repeats: int = 1
) -> pd.DataFrame:
    """Rows: (dataset, plan P_F/P_B, config, hop) → seconds and count."""
    rows = []
    for ds_name, data in datasets.items():
        elabel, vlabel, prop = _dataset_params(data)
        stores = {
            "PAGE_P": GraphStore.build(
                data, StorageConfig(edge_prop_storage="pages"), spark=spark
            ),
            "COL_E": GraphStore.build(
                data, StorageConfig(edge_prop_storage="edge_columns"),
                spark=spark,
            ),
        }
        for hops in (1, 2):
            for plan, direction in (("P_F", "fwd"), ("P_B", "bwd")):
                counts = {}
                for cfg_name, store in stores.items():
                    best = None
                    for _ in range(repeats):
                        t0 = time.perf_counter()
                        cnt = khop_read_kernel(
                            store, elabel, prop, hops, direction
                        )
                        dt = time.perf_counter() - t0
                        best = dt if best is None else min(best, dt)
                    counts[cfg_name] = cnt
                    rows.append({
                        "dataset": ds_name, "plan": plan, "hops": f"{hops}H",
                        "config": cfg_name, "seconds": best, "count": cnt,
                    })
                assert len(set(counts.values())) == 1, counts
    return pd.DataFrame(rows)


def format_table3(df: pd.DataFrame) -> str:
    piv = df.pivot_table(
        index=["dataset", "plan", "config"],
        columns="hops",
        values="seconds",
    )
    lines = ["Table 3 — runtime (s), property pages (PAGE_P) vs edge columns (COL_E)"]
    lines.append(piv.round(4).to_string())
    speed = []
    for (ds, plan), grp in df.groupby(["dataset", "plan"]):
        for h in sorted(grp["hops"].unique()):
            ce = grp[(grp.config == "COL_E") & (grp.hops == h)]["seconds"].iloc[0]
            pp = grp[(grp.config == "PAGE_P") & (grp.hops == h)]["seconds"].iloc[0]
            speed.append(
                f"{ds} {plan} {h}: COL_E/PAGE_P = {ce / pp:.1f}x"
            )
    lines.append("\n".join(speed))
    return "\n".join(lines)
