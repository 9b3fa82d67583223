"""Unit tests for the CSR sparse substrate (repro.lina.sparse)."""
import numpy as np
import pytest

from repro.lina.sparse import CSR


def _rand_dense(n, m, sp, seed=0):
    g = np.random.default_rng(seed)
    a = g.random((n, m))
    a[g.random((n, m)) >= sp] = 0.0
    return a


SHAPES = [(1, 1), (5, 3), (17, 9), (64, 64), (100, 7), (3, 200)]
SPARSITIES = [0.0, 0.05, 0.3, 1.0]


@pytest.mark.parametrize("shape", SHAPES)
@pytest.mark.parametrize("sp", SPARSITIES)
def test_dense_roundtrip(shape, sp):
    a = _rand_dense(*shape, sp)
    np.testing.assert_allclose(CSR.from_dense(a).to_dense(), a)


@pytest.mark.parametrize("shape", SHAPES)
def test_from_coo_matches_from_dense(shape):
    a = _rand_dense(*shape, 0.3, seed=1)
    rows, cols = np.nonzero(a)
    c = CSR.from_coo(rows, cols, a[rows, cols], a.shape)
    np.testing.assert_allclose(c.to_dense(), a)


def test_random_sparsity():
    c = CSR.random(200, 300, 0.05, seed=3)
    assert c.nnz == round(200 * 300 * 0.05)
    assert abs(c.sparsity - 0.05) < 1e-9
    assert (c.values != 0).all()


@pytest.mark.parametrize("shape", SHAPES)
@pytest.mark.parametrize("sp", SPARSITIES)
def test_transpose(shape, sp):
    a = _rand_dense(*shape, sp, seed=2)
    np.testing.assert_allclose(CSR.from_dense(a).transpose().to_dense(), a.T)


@pytest.mark.parametrize("shape", [(10, 6), (33, 17), (100, 100)])
@pytest.mark.parametrize("sp", [0.0, 0.1, 0.5])
def test_spmv(shape, sp):
    a = _rand_dense(*shape, sp, seed=4)
    v = np.random.default_rng(5).random(shape[1])
    np.testing.assert_allclose(CSR.from_dense(a).spmv(v), a @ v, atol=1e-12)


@pytest.mark.parametrize("k", [1, 3, 20])
@pytest.mark.parametrize("sp", [0.0, 0.1, 0.5])
def test_spmm(k, sp):
    a = _rand_dense(40, 25, sp, seed=6)
    b = np.random.default_rng(7).random((25, k))
    np.testing.assert_allclose(CSR.from_dense(a).spmm(b), a @ b, atol=1e-12)


@pytest.mark.parametrize("k", [1, 3, 20])
@pytest.mark.parametrize("sp", [0.0, 0.1, 0.5])
def test_tspmm(k, sp):
    a = _rand_dense(40, 25, sp, seed=8)
    b = np.random.default_rng(9).random((40, k))
    np.testing.assert_allclose(CSR.from_dense(a).tspmm(b), a.T @ b, atol=1e-12)


def test_row_slice():
    a = _rand_dense(30, 10, 0.3, seed=10)
    c = CSR.from_dense(a)
    np.testing.assert_allclose(c.row_slice(5, 17).to_dense(), a[5:17])
    np.testing.assert_allclose(c.row_slice(0, 30).to_dense(), a)
    assert c.row_slice(4, 4).shape == (0, 10)


def test_mult_dense_sparse_safe():
    a = _rand_dense(20, 15, 0.2, seed=11)
    d = np.random.default_rng(12).random((20, 15))
    np.testing.assert_allclose(
        CSR.from_dense(a).mult_dense(d).to_dense(), a * d, atol=1e-12
    )


def test_scale_values():
    a = _rand_dense(20, 15, 0.2, seed=13)
    c = CSR.from_dense(a).scale_values(lambda v: v**2)
    np.testing.assert_allclose(c.to_dense(), a**2, atol=1e-12)


@pytest.mark.parametrize("sp", [0.0, 0.15, 0.6])
def test_aggregations(sp):
    a = _rand_dense(25, 13, sp, seed=14)
    c = CSR.from_dense(a)
    assert abs(c.sum() - a.sum()) < 1e-10
    np.testing.assert_allclose(c.row_sums(), a.sum(axis=1), atol=1e-12)
    np.testing.assert_allclose(c.col_sums(), a.sum(axis=0), atol=1e-12)


def test_empty_rows_spmv():
    a = np.zeros((6, 4))
    a[1, 2] = 3.0
    a[4, 0] = -1.0
    v = np.arange(4.0)
    np.testing.assert_allclose(CSR.from_dense(a).spmv(v), a @ v)


def test_row_index():
    a = np.array([[0.0, 1.0], [0.0, 0.0], [2.0, 3.0]])
    c = CSR.from_dense(a)
    np.testing.assert_array_equal(c.row_index(), [0, 2, 2])
    np.testing.assert_array_equal(c.row_nnz(), [1, 0, 2])
