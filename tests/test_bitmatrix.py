"""Unit tests for the packed bitslice matrix."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.sketch.bitmatrix import BitMatrix


def dense(M: BitMatrix) -> np.ndarray:
    return np.unpackbits(M.rows, axis=1, bitorder="little")[:, : M.ncols]


class TestSetGet:
    def test_set_and_get(self):
        M = BitMatrix(10, 30)
        M.set_bits(np.array([0, 9, 4]), np.array([0, 29, 7]))
        assert M.get_bit(0, 0) and M.get_bit(9, 29) and M.get_bit(4, 7)
        assert not M.get_bit(0, 1) and not M.get_bit(1, 0)

    def test_duplicates_harmless(self):
        M = BitMatrix(4, 8)
        M.set_bits(np.array([1, 1, 1]), np.array([3, 3, 3]))
        assert dense(M).sum() == 1

    def test_from_pairs_equals_incremental(self):
        rows = np.array([0, 1, 2, 3, 0])
        cols = np.array([5, 6, 7, 0, 5])
        a = BitMatrix.from_pairs(4, 8, rows, cols)
        b = BitMatrix(4, 8)
        for r, c in zip(rows, cols):
            b.set_bits(np.array([r]), np.array([c]))
        assert a == b

    def test_empty_pairs(self):
        M = BitMatrix.from_pairs(4, 8, np.array([], dtype=np.int64), np.array([], dtype=np.int64))
        assert M.bits_set == 0

    @pytest.mark.parametrize("row,col", [(-1, 0), (10, 0), (0, -1), (0, 30)])
    def test_out_of_range(self, row, col):
        M = BitMatrix(10, 30)
        with pytest.raises(IndexError):
            M.set_bits(np.array([row]), np.array([col]))

    def test_misaligned_arrays(self):
        with pytest.raises(ValueError, match="align"):
            BitMatrix(4, 4).set_bits(np.array([1, 2]), np.array([1]))

    @pytest.mark.parametrize("m,ncols", [(0, 4), (4, 0), (-1, 4)])
    def test_bad_shape(self, m, ncols):
        with pytest.raises(ValueError):
            BitMatrix(m, ncols)


class TestSlices:
    def test_and_slices_matches_dense(self):
        g = np.random.default_rng(0)
        M = BitMatrix(32, 50)
        M.set_bits(g.integers(0, 32, 300), g.integers(0, 50, 300))
        d = dense(M)
        for _ in range(20):
            rows = g.integers(0, 32, 3)
            got = np.unpackbits(M.and_slices(rows), bitorder="little")[:50]
            assert np.array_equal(got, d[rows].min(axis=0))

    def test_single_row_slice(self):
        M = BitMatrix(4, 12)
        M.set_bits(np.array([2, 2]), np.array([0, 11]))
        assert np.array_equal(M.slice_cols(M.and_slices(np.array([2]))), [0, 11])

    def test_slice_cols_ignores_padding(self):
        # ncols not byte-aligned: bits beyond ncols must never be reported.
        M = BitMatrix(2, 10)
        M.set_bits(np.array([0]), np.array([9]))
        assert np.array_equal(M.slice_cols(M.and_slices(np.array([0]))), [9])
        assert M.slice_cols(np.full(2, 0xFF, dtype=np.uint8)).max() == 9

    def test_and_slices_disjoint_rows_empty(self):
        M = BitMatrix(4, 16)
        M.set_bits(np.array([0, 1]), np.array([3, 7]))
        assert len(M.slice_cols(M.and_slices(np.array([0, 1])))) == 0

    def test_and_slices_returns_copy(self):
        M = BitMatrix(4, 16)
        M.set_bits(np.array([1]), np.array([2]))
        s = M.and_slices(np.array([1]))
        s[:] = 0
        assert M.get_bit(1, 2)


class TestAccounting:
    def test_memory_bytes(self):
        assert BitMatrix(100, 17).memory_bytes == 100 * 3

    def test_bits_set(self):
        M = BitMatrix(8, 8)
        M.set_bits(np.array([0, 1, 2]), np.array([0, 1, 2]))
        assert M.bits_set == 3

    def test_equality(self):
        a, b = BitMatrix(4, 8), BitMatrix(4, 8)
        assert a == b
        a.set_bits(np.array([0]), np.array([0]))
        assert a != b
        assert a != BitMatrix(4, 9)
        assert a != "nope"

    @settings(max_examples=30, deadline=None)
    @given(
        st.lists(
            st.tuples(st.integers(0, 15), st.integers(0, 20)), min_size=0, max_size=60
        )
    )
    def test_dense_roundtrip_hypothesis(self, pairs):
        M = BitMatrix(16, 21)
        if pairs:
            r, c = map(np.array, zip(*pairs))
            M.set_bits(r, c)
        d = dense(M)
        assert d.sum() == M.bits_set
        for rr, cc in pairs:
            assert d[rr, cc] == 1 and M.get_bit(rr, cc)
