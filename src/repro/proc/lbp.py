"""LBP plan compilation and execution (paper §6).

``compile_lbp`` turns the logical plan of a :class:`QuerySpec` into a
pipeline of physical operators over a :class:`GraphStore`:

- ExtendStep → :class:`PhysListExtend` (CSR side) or
  :class:`PhysColumnExtend` (vertex-column side), per Table 1 storage;
  edge properties the query needs are materialized at the extend.
- Vertex properties referenced by a filter or RETURN are gathered by a
  :class:`PhysVertexPropRead` inserted right before first use.
- A terminal extend followed only by count(*) is fused into
  :class:`PhysCountListExtend` / :class:`PhysCountColumnExtend` so the
  last hop is aggregated directly from the factorized representation.

``run_lbp`` executes the pipeline single-threaded and returns an int
(count) or a pandas DataFrame (projections). The Spark-parallel variant
lives in :mod:`repro.proc.distributed`.
"""
from __future__ import annotations

import pandas as pd

from repro.proc.operators import (
    CollectSink,
    CountSink,
    Operator,
    PhysBatchExtend,
    PhysColumnExtend,
    PhysCountColumnExtend,
    PhysCountListExtend,
    PhysExtendFilterCount,
    PhysFilter,
    PhysListExtend,
    PhysScan,
    PhysVertexPropRead,
)
from repro.proc.plan import (
    ExtendStep,
    FilterStep,
    Predicate,
    QuerySpec,
    ScanStep,
    compile_logical,
    needed_eprops,
)
from repro.storage.graph_store import GraphStore


def compile_lbp(
    store: GraphStore,
    spec: QuerySpec,
    *,
    scan_range: tuple[int, int] | None = None,
    block_size: int = 1024,
) -> tuple[PhysScan, Operator]:
    steps = compile_logical(spec)
    ops: list[Operator] = []
    produced: set[str] = set()

    def ensure_vprop(var: str, prop: str) -> None:
        key = f"{var}.{prop}"
        if key in produced or var not in spec.vertices:
            return  # edge props are produced by their extend
        vcol = store.vprop_column(spec.vertices[var], prop)
        ops.append(PhysVertexPropRead(var, prop, vcol))
        produced.add(key)

    def bind_return_props(var: str) -> None:
        # RETURN properties are gathered as soon as the variable is
        # bound: one vectorized gather per chunk instead of one per
        # downstream emit (the blocks ride along through flattening).
        if spec.returns == "count":
            return
        for v, prop in spec.returns:
            if v == var and v in spec.vertices:
                ensure_vprop(v, prop)

    for step in steps:
        if isinstance(step, ScanStep):
            n = store.n_vertices[step.label]
            lo, hi = scan_range if scan_range else (0, n)
            ops.append(
                PhysScan(step.var, n, block_size=block_size, lo=lo, hi=hi)
            )
            bind_return_props(step.var)
        elif isinstance(step, ExtendStep):
            estore = store.edge(step.edge.label)
            eprops = needed_eprops(spec, step.edge.var) if step.edge.var else []
            for p in eprops:
                produced.add(f"{step.edge.var}.{p}")
            cls = (
                PhysColumnExtend
                if estore.storage_kind(step.direction) == "vcol"
                else PhysListExtend
            )
            ops.append(
                cls(
                    step.src_var,
                    step.out_var,
                    step.edge.var,
                    estore,
                    step.direction,
                    eprops,
                )
            )
            bind_return_props(step.out_var)
        elif isinstance(step, FilterStep):
            ensure_vprop(step.pred.var, step.pred.prop)
            if step.pred.rhs_var:
                ensure_vprop(step.pred.rhs_var, step.pred.rhs_prop)
            ops.append(PhysFilter(step.pred))
        else:
            raise TypeError(step)

    if spec.returns == "count":
        sink = _fuse_count_tail(ops)
        if sink is None:
            sink = CountSink()
            ops.append(sink)
    else:
        keys, names = [], []
        for var, prop in spec.returns:
            ensure_vprop(var, prop)
            keys.append(f"{var}.{prop}")
            names.append(f"{var}_{prop}")
        sink = CollectSink(keys, names)
        ops.append(sink)

    ops = _fuse_batch_extends(ops)
    for a, b in zip(ops, ops[1:]):
        a.next = b
    return ops[0], sink


def _fuse_batch_extends(ops: list[Operator]) -> list[Operator]:
    """Fuse each ListExtend with its adjacent out-var property reads and
    filters into a block-at-a-time :class:`PhysBatchExtend` (see its
    docstring for why this is the faithful vectorized form of LBP's
    flatten-and-iterate on non-terminal extends)."""
    out: list[Operator] = []
    i = 0
    while i < len(ops):
        op = ops[i]
        if not isinstance(op, PhysListExtend):
            out.append(op)
            i += 1
            continue
        vreads: list[tuple[str, object]] = []
        preds = []
        j = i + 1
        while j < len(ops):
            nxt = ops[j]
            if (
                isinstance(nxt, PhysVertexPropRead)
                and nxt.var == op.out_var
            ):
                vreads.append((nxt.prop, nxt.vcol))
                j += 1
                continue
            if isinstance(nxt, PhysFilter):
                preds.append(nxt.pred)
                j += 1
                continue
            break
        out.append(
            PhysBatchExtend(
                op.src_var, op.out_var, op.edge_var, op.estore,
                op.direction, op.eprops, vreads, preds,
            )
        )
        i = j
    return out


def _fuse_count_tail(ops: list[Operator]):
    """Fuse a count(*) plan tail in place; returns the sink or None.

    Two fusions (paper §6.2, aggregation on the factorized form):
    - terminal extend with no property reads → count adjacency-list
      lengths (:class:`PhysCountListExtend` / `PhysCountColumnExtend`);
    - terminal ListExtend + filters *only on that edge's properties* →
      block-at-a-time :class:`PhysExtendFilterCount`.
    """
    last = ops[-1]
    if isinstance(last, (PhysListExtend, PhysColumnExtend)) and not last.eprops:
        fused_cls = (
            PhysCountListExtend
            if isinstance(last, PhysListExtend)
            else PhysCountColumnExtend
        )
        sink = fused_cls(last.src_var, last.estore, last.direction)
        ops[-1] = sink
        return sink
    # Trailing run of filters over the final ListExtend's edge properties.
    i = len(ops) - 1
    preds = []
    while i >= 0 and isinstance(ops[i], PhysFilter):
        preds.append(ops[i].pred)
        i -= 1
    preds.reverse()
    if not preds or i < 0 or not isinstance(ops[i], PhysListExtend):
        return None
    ext = ops[i]
    _mirror = {"<": ">", "<=": ">=", ">": "<", ">=": "<=", "=": "=", "<>": "<>"}
    norm = []
    for p in preds:
        if (
            p.var != ext.edge_var
            and p.rhs_var == ext.edge_var
            and p.op in _mirror
        ):
            # a.x OP e.y  →  e.y mirror(OP) a.x, so the fused edge is lhs.
            p = Predicate(
                p.rhs_var, p.rhs_prop, _mirror[p.op],
                rhs_var=p.var, rhs_prop=p.prop,
            )
        norm.append(p)
    preds = norm
    for p in preds:
        if p.var != ext.edge_var:
            return None
        if p.rhs_var in (ext.edge_var, ext.out_var):
            return None
    if set(ext.eprops) - {p.prop for p in preds}:
        return None
    sink = PhysExtendFilterCount(
        ext.src_var, ext.estore, ext.direction, ext.edge_var, preds
    )
    del ops[i:]
    ops.append(sink)
    return sink


def _try_vectorized_count(
    store: GraphStore,
    spec: QuerySpec,
    scan_range: tuple[int, int] | None,
):
    """Fully-factorized count(*) of a predicate-free path query.

    With no predicates and count(*) output, the factorized count never
    needs tuples at all: it is the repeated product-of-list-sizes of
    §6.2, computed level by level as a weighted degree propagation
    (``w_next[nbr] += w[v]`` over each adjacency list). This is why the
    paper's GF-CL COUNT(*) runtimes barely grow with the hop count
    (Table 5). Returns None when the plan shape doesn't apply.
    """
    import numpy as np

    if spec.returns != "count" or spec.predicates:
        return None
    steps = compile_logical(spec)
    prev_out = None
    for s in steps:
        if isinstance(s, ScanStep):
            prev_out = s.var
        elif isinstance(s, ExtendStep):
            if s.src_var != prev_out:  # star shapes use the general engine
                return None
            prev_out = s.out_var
        else:
            return None
    scan = steps[0]
    n0 = store.n_vertices[scan.label]
    lo, hi = scan_range if scan_range else (0, n0)
    w = np.zeros(n0, dtype=np.float64)
    w[lo:hi] = 1.0
    for s in steps[1:]:
        es = store.edge(s.edge.label)
        n_out = store.n_vertices[spec.vertices[s.out_var]]
        if es.storage_kind(s.direction) == "csr":
            csr = es.csr(s.direction)
            if csr.null_compress:
                # Offsets exist only for non-empty lists; their weights
                # are w restricted to the set bits, in position order.
                present = csr.index.unpack_all()
                lens = np.diff(csr.offsets)
                per_edge = np.repeat(w[present], lens)
            else:
                per_edge = np.repeat(w, np.diff(csr.offsets))
            w = np.bincount(
                np.asarray(csr.nbr, dtype=np.int64),
                weights=per_edge,
                minlength=n_out,
            )
        else:
            # Vertex column: the whole-column scan reads values directly
            # (compacted values align with the set bits, in order).
            col = es.nbr_vcol(s.direction).col
            if col._all_set:
                targets, weights = col.values, w
            elif col.mode == "uncompressed":
                # NULL cells hold 0; zero their weights instead of
                # gathering — one pass, no indirection (the vertex-column
                # advantage over CSR offsets, §8.4).
                present = col.index.unpack_all()
                targets, weights = col.values, w * present
            else:
                present = col.index.unpack_all()
                targets, weights = col.values, w[present]
            w = np.bincount(
                np.asarray(targets, dtype=np.int64),
                weights=weights,
                minlength=n_out,
            )
        if len(w) < n_out:
            w = np.pad(w, (0, n_out - len(w)))
    return int(round(w.sum()))


def run_lbp(
    store: GraphStore,
    spec: QuerySpec,
    *,
    scan_range: tuple[int, int] | None = None,
    block_size: int = 1024,
):
    """Execute a spec; returns an int for count(*), else a DataFrame."""
    fast = _try_vectorized_count(store, spec, scan_range)
    if fast is not None:
        return fast
    scan, sink = compile_lbp(
        store, spec, scan_range=scan_range, block_size=block_size
    )
    scan.run()
    if isinstance(sink, CollectSink):
        return sink.result()
    return sink.count


def run_lbp_df(store: GraphStore, spec: QuerySpec, **kw) -> pd.DataFrame:
    """Like :func:`run_lbp` but always a DataFrame (count → one row
    ``cnt``), matching the oracle's SQL output shape."""
    res = run_lbp(store, spec, **kw)
    if isinstance(res, pd.DataFrame):
        return res
    return pd.DataFrame({"cnt": [res]})
