"""Predicate evaluation, vectorized (LBP) and scalar (Volcano).

Operators: ``=``, ``<>``, ``<``, ``<=``, ``>``, ``>=``, ``contains``,
``startswith``, ``in``. NULL operands make a predicate false (SQL
semantics, matching the DuckDB oracle).

On dictionary-encoded blocks, value-level predicates against a literal
are evaluated **on the dictionary** (z values) and broadcast through the
codes with one gather — the paper's operate-on-compressed-data path
(§5.1). Everything else is evaluated on decoded values with NULLs
masked out first.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.proc.chunk import Block

OPS = ("=", "<>", "<", "<=", ">", ">=", "contains", "startswith", "in")


def scalar_op(op: str, left, right) -> bool:
    """Tuple-at-a-time evaluation (the Volcano path)."""
    if left is None or right is None:
        return False
    if op == "=":
        return left == right
    if op == "<>":
        return left != right
    if op == "<":
        return left < right
    if op == "<=":
        return left <= right
    if op == ">":
        return left > right
    if op == ">=":
        return left >= right
    if op == "contains":
        return str(right) in str(left)
    if op == "startswith":
        return str(left).startswith(str(right))
    if op == "in":
        return left in right
    raise ValueError(f"unknown op {op!r}")


def _apply_masked(op: str, vals: np.ndarray, nulls: np.ndarray | None, lit):
    """Vectorized op against a literal; NULL rows are False."""
    n = len(vals)
    out = np.zeros(n, dtype=bool)
    nn = np.ones(n, dtype=bool) if nulls is None else ~np.asarray(nulls)
    if not nn.any():
        return out
    v = vals[nn]
    if op == "contains":
        res = pd.Series(v).str.contains(str(lit), regex=False).fillna(False)
        out[nn] = res.to_numpy(dtype=bool)
    elif op == "startswith":
        res = pd.Series(v).str.startswith(str(lit)).fillna(False)
        out[nn] = res.to_numpy(dtype=bool)
    elif op == "in":
        out[nn] = pd.Series(v).isin(list(lit)).to_numpy(dtype=bool)
    else:
        fn = {
            "=": np.equal,
            "<>": np.not_equal,
            "<": np.less,
            "<=": np.less_equal,
            ">": np.greater,
            ">=": np.greater_equal,
        }[op]
        out[nn] = fn(v, lit)
    return out


def eval_block_vs_literal(op: str, block: Block, lit) -> np.ndarray:
    """Boolean mask over a block. Dictionary-coded blocks evaluate the
    predicate once per distinct value and gather through the codes."""
    if block.dictionary is not None:
        dict_mask = _apply_masked(op, block.dictionary, None, lit)
        dict_mask = np.append(dict_mask, False)  # NULL slot
        idx = block.data.astype(np.int64)
        if block.nulls is not None:
            idx = np.where(block.nulls, len(block.dictionary), idx)
        return dict_mask[idx]
    return _apply_masked(op, block.data, block.nulls, lit)


def eval_block_vs_block(op: str, left: Block, right: Block) -> np.ndarray:
    """Both operands unflat in the same group (list/list case, §6.2)."""
    lv, rv = left.decoded(), right.decoded()
    n = len(lv)
    nn = np.ones(n, dtype=bool)
    if left.nulls is not None:
        nn &= ~left.nulls
    if right.nulls is not None:
        nn &= ~right.nulls
    out = np.zeros(n, dtype=bool)
    if nn.any():
        if lv.dtype != object and rv.dtype != object and op in (
            "=", "<>", "<", "<=", ">", ">=",
        ):
            out[nn] = _apply_pair(op, lv[nn], rv[nn])
        else:
            out[nn] = np.array(
                [scalar_op(op, a, b) for a, b in zip(lv[nn], rv[nn])],
                dtype=bool,
            )
    return out


def _apply_pair(op, a, b):
    fn = {
        "=": np.equal,
        "<>": np.not_equal,
        "<": np.less,
        "<=": np.less_equal,
        ">": np.greater,
        ">=": np.greater_equal,
    }[op]
    return fn(a, b)
