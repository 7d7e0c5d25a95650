"""Unit tests for the hand-rolled CSR Boolean matrix (repro.core.csr),
including property tests against dense numpy reference semantics."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.csr import BoolCSR


def dense_matmul(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    return (a.astype(np.int64) @ b.astype(np.int64)) > 0


class TestConstruction:
    def test_empty(self):
        m = BoolCSR.empty(4)
        assert m.nnz == 0 and m.n == 4
        assert not m.to_dense().any()

    def test_from_coo(self):
        m = BoolCSR.from_coo(3, [0, 2, 2], [1, 0, 2])
        d = m.to_dense()
        assert d[0, 1] and d[2, 0] and d[2, 2] and m.nnz == 3

    def test_from_coo_dedups(self):
        m = BoolCSR.from_coo(3, [1, 1, 1], [2, 2, 2])
        assert m.nnz == 1

    def test_from_coo_out_of_range(self):
        with pytest.raises(ValueError):
            BoolCSR.from_coo(2, [0], [5])
        with pytest.raises(ValueError):
            BoolCSR.from_coo(2, [-1], [0])

    def test_from_coo_length_mismatch(self):
        with pytest.raises(ValueError):
            BoolCSR.from_coo(2, [0, 1], [0])

    def test_from_dense_roundtrip(self):
        a = np.array([[1, 0], [1, 1]], dtype=bool)
        assert (BoolCSR.from_dense(a).to_dense() == a).all()

    def test_from_dense_requires_square(self):
        with pytest.raises(ValueError):
            BoolCSR.from_dense(np.zeros((2, 3), dtype=bool))

    def test_indices_sorted_per_row(self):
        m = BoolCSR.from_coo(4, [1, 1, 1], [3, 0, 2])
        row = m.indices[m.indptr[1] : m.indptr[2]]
        assert list(row) == sorted(row)

    def test_to_coo(self):
        m = BoolCSR.from_coo(3, [2, 0], [1, 2])
        rows, cols = m.to_coo()
        assert list(zip(rows, cols)) == [(0, 2), (2, 1)]

    def test_equality(self):
        a = BoolCSR.from_coo(3, [0], [1])
        b = BoolCSR.from_coo(3, [0], [1])
        c = BoolCSR.from_coo(3, [1], [0])
        assert a == b and a != c


class TestSpmm:
    def test_identity(self):
        eye = BoolCSR.from_dense(np.eye(4, dtype=bool))
        m = BoolCSR.from_coo(4, [0, 1], [2, 3])
        assert eye.spmm(m) == m
        assert m.spmm(eye) == m

    def test_chain(self):
        # path 0->1->2: product has 0->2
        a = BoolCSR.from_coo(3, [0], [1])
        b = BoolCSR.from_coo(3, [1], [2])
        assert a.spmm(b) == BoolCSR.from_coo(3, [0], [2])

    def test_no_connection(self):
        a = BoolCSR.from_coo(3, [0], [1])
        b = BoolCSR.from_coo(3, [2], [0])
        assert a.spmm(b).nnz == 0

    def test_empty_operand(self):
        a = BoolCSR.from_coo(3, [0], [1])
        assert a.spmm(BoolCSR.empty(3)).nnz == 0
        assert BoolCSR.empty(3).spmm(a).nnz == 0

    def test_dimension_mismatch(self):
        with pytest.raises(ValueError):
            BoolCSR.empty(2).spmm(BoolCSR.empty(3))

    def test_fanout_dedup(self):
        # two paths 0->{1,2}->3 produce a single (0,3)
        a = BoolCSR.from_coo(4, [0, 0], [1, 2])
        b = BoolCSR.from_coo(4, [1, 2], [3, 3])
        assert a.spmm(b) == BoolCSR.from_coo(4, [0], [3])

    @settings(max_examples=60, deadline=None)
    @given(st.data())
    def test_matches_dense_reference(self, data):
        n = data.draw(st.integers(1, 12))
        a = data.draw(
            st.lists(st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)), max_size=30)
        )
        b = data.draw(
            st.lists(st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)), max_size=30)
        )
        ma = BoolCSR.from_coo(n, [r for r, _ in a], [c for _, c in a])
        mb = BoolCSR.from_coo(n, [r for r, _ in b], [c for _, c in b])
        expect = dense_matmul(ma.to_dense(), mb.to_dense())
        assert (ma.spmm(mb).to_dense() == expect).all()


class TestUnion:
    def test_union_basic(self):
        a = BoolCSR.from_coo(3, [0], [1])
        b = BoolCSR.from_coo(3, [1], [2])
        u = a.union(b)
        assert u == BoolCSR.from_coo(3, [0, 1], [1, 2])

    def test_union_overlap(self):
        a = BoolCSR.from_coo(3, [0, 1], [1, 2])
        b = BoolCSR.from_coo(3, [1], [2])
        assert a.union(b) == a

    def test_union_with_empty_returns_operand(self):
        a = BoolCSR.from_coo(3, [0], [1])
        assert a.union(BoolCSR.empty(3)) == a
        assert BoolCSR.empty(3).union(a) == a

    def test_union_dimension_mismatch(self):
        with pytest.raises(ValueError):
            BoolCSR.empty(2).union(BoolCSR.empty(3))

    @settings(max_examples=40, deadline=None)
    @given(st.data())
    def test_matches_dense_or(self, data):
        n = data.draw(st.integers(1, 10))
        a = data.draw(
            st.lists(st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)), max_size=25)
        )
        b = data.draw(
            st.lists(st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)), max_size=25)
        )
        ma = BoolCSR.from_coo(n, [r for r, _ in a], [c for _, c in a])
        mb = BoolCSR.from_coo(n, [r for r, _ in b], [c for _, c in b])
        assert (
            ma.union(mb).to_dense() == (ma.to_dense() | mb.to_dense())
        ).all()
