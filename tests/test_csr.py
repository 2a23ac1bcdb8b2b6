"""Unit tests for the CSR adjacency structure (§4.1.1)."""
import numpy as np
import pytest

from repro.storage.csr import CSR

OWNERS = np.array([3, 0, 3, 1, 3, 0])
NBRS = np.array([7, 1, 8, 2, 9, 0])
SLOTS = np.array([10, 11, 12, 13, 14, 15])


def _ref_lists():
    return {0: [1, 0], 1: [2], 2: [], 3: [7, 8, 9], 4: []}


@pytest.mark.parametrize("null_compress", [False, True])
@pytest.mark.parametrize("zero_suppress", [False, True])
def test_neighbour_lists(null_compress, zero_suppress):
    csr = CSR(5, OWNERS, NBRS, zero_suppress=zero_suppress,
              null_compress=null_compress)
    for v, ref in _ref_lists().items():
        s, e = csr.range_of(v)
        assert list(csr.nbr[s:e].astype(int)) == ref
        assert csr.degree(v) == len(ref)


@pytest.mark.parametrize("null_compress", [False, True])
def test_vectorized_ranges_match_scalar(null_compress):
    csr = CSR(5, OWNERS, NBRS, null_compress=null_compress)
    vs = np.array([0, 1, 2, 3, 4, 2, 0])
    starts, ends = csr.ranges_of(vs)
    for v, s, e in zip(vs, starts, ends):
        assert (int(s), int(e)) == csr.range_of(int(v))
    assert (csr.degrees_of(vs) == ends - starts).all()


def test_slots_follow_owner_sort():
    csr = CSR(5, OWNERS, NBRS, slots=SLOTS)
    s, e = csr.range_of(3)
    assert list(csr.slots[s:e].astype(int)) == [10, 12, 14]
    s, e = csr.range_of(0)
    assert list(csr.slots[s:e].astype(int)) == [11, 15]


def test_edge_ids_are_8_bytes():
    csr = CSR(5, OWNERS, NBRS, edge_ids=np.arange(6), zero_suppress=True)
    assert csr.edge_ids.dtype == np.int64
    s, e = csr.range_of(3)
    assert list(csr.edge_ids[s:e]) == [0, 2, 4]


def test_zero_suppression_shrinks_dtype():
    a = CSR(5, OWNERS, NBRS, zero_suppress=True)
    b = CSR(5, OWNERS, NBRS, zero_suppress=False)
    assert a.nbr.dtype == np.uint8
    assert b.nbr.dtype == np.int64
    assert a.nbytes() < b.nbytes()


def test_null_compression_shrinks_offsets_when_sparse():
    n = 10_000
    owners = np.array([5, 5, 42])  # almost every list empty
    nbrs = np.array([1, 2, 3])
    dense = CSR(n, owners, nbrs, null_compress=False)
    sparse = CSR(n, owners, nbrs, null_compress=True)
    assert sparse.nbytes() < dense.nbytes()
    assert sparse.range_of(5) == dense.range_of(5)
    assert sparse.range_of(9999) == (0, 0)


def test_empty_csr():
    csr = CSR(4, np.array([], dtype=np.int64), np.array([], dtype=np.int64))
    assert csr.range_of(2) == (0, 0)
    assert csr.n_edges == 0


def test_stable_order_within_list():
    # Stable sort keeps the original relative order of a vertex's edges,
    # which is what aligns CSR order with property-page order.
    owners = np.array([1, 1, 1])
    nbrs = np.array([9, 3, 5])
    csr = CSR(2, owners, nbrs)
    s, e = csr.range_of(1)
    assert list(csr.nbr[s:e].astype(int)) == [9, 3, 5]


def test_nbytes_accounts_all_arrays():
    csr = CSR(5, OWNERS, NBRS, slots=SLOTS, zero_suppress=False)
    expected = csr.offsets.nbytes + csr.nbr.nbytes + csr.slots.nbytes
    assert csr.nbytes() == expected
