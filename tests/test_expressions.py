"""Predicate evaluation — scalar and vectorized, NULL semantics."""
import numpy as np
import pytest

from repro.proc.chunk import Block
from repro.proc.expressions import (
    eval_block_vs_block,
    eval_block_vs_literal,
    scalar_op,
)

OPS_TRUE = [
    ("=", 3, 3), ("<>", 3, 4), ("<", 1, 2), ("<=", 2, 2), (">", 5, 4),
    (">=", 4, 4), ("contains", "abcd", "bc"), ("startswith", "abcd", "ab"),
    ("in", "x", ["x", "y"]),
]
OPS_FALSE = [
    ("=", 3, 4), ("<>", 3, 3), ("<", 2, 1), ("<=", 3, 2), (">", 4, 5),
    (">=", 3, 4), ("contains", "abcd", "xz"), ("startswith", "abcd", "cd"),
    ("in", "z", ["x", "y"]),
]


@pytest.mark.parametrize("op,l,r", OPS_TRUE)
def test_scalar_true(op, l, r):
    assert scalar_op(op, l, r) is True


@pytest.mark.parametrize("op,l,r", OPS_FALSE)
def test_scalar_false(op, l, r):
    assert scalar_op(op, l, r) is False


@pytest.mark.parametrize("op", ["=", "<", "contains", "in"])
def test_scalar_null_is_false(op):
    assert scalar_op(op, None, "x") is False
    assert scalar_op(op, "x", None) is False


def test_scalar_unknown_op():
    with pytest.raises(ValueError):
        scalar_op("like", 1, 2)


class TestBlockVsLiteral:
    def test_numeric_comparison(self):
        b = Block(np.array([1, 5, 10]))
        assert list(eval_block_vs_literal(">", b, 4)) == [False, True, True]

    def test_null_rows_false(self):
        b = Block(np.array([5, 5]), np.array([False, True]))
        assert list(eval_block_vs_literal("=", b, 5)) == [True, False]

    def test_contains_on_strings(self):
        b = Block(np.array(["alpha", "beta", None], dtype=object),
                  np.array([False, False, True]))
        assert list(eval_block_vs_literal("contains", b, "a")) == [
            True, True, False,
        ]

    def test_startswith(self):
        b = Block(np.array(["abc", "xbc"], dtype=object))
        assert list(eval_block_vs_literal("startswith", b, "ab")) == [
            True, False,
        ]

    def test_in(self):
        b = Block(np.array(["a", "b", "c"], dtype=object))
        assert list(eval_block_vs_literal("in", b, ["a", "c"])) == [
            True, False, True,
        ]

    def test_dictionary_coded_evaluates_on_dictionary(self):
        # codes over dictionary ['ab', 'cd']; code 2 = NULL
        b = Block(
            np.array([0, 1, 0, 2]),
            np.array([False, False, False, True]),
            dictionary=np.array(["ab", "cd"], dtype=object),
        )
        assert list(eval_block_vs_literal("contains", b, "a")) == [
            True, False, True, False,
        ]
        assert list(eval_block_vs_literal("=", b, "cd")) == [
            False, True, False, False,
        ]


class TestBlockVsBlock:
    def test_numeric(self):
        l = Block(np.array([1, 5, 7]))
        r = Block(np.array([2, 5, 3]))
        assert list(eval_block_vs_block(">", l, r)) == [False, False, True]
        assert list(eval_block_vs_block("=", l, r)) == [False, True, False]

    def test_nulls_either_side_false(self):
        l = Block(np.array([1, 5]), np.array([True, False]))
        r = Block(np.array([0, 5]), np.array([False, True]))
        assert list(eval_block_vs_block("=", l, r)) == [False, False]

    def test_object_fallback(self):
        l = Block(np.array(["b", "a"], dtype=object))
        r = Block(np.array(["a", "b"], dtype=object))
        assert list(eval_block_vs_block(">", l, r)) == [True, False]
