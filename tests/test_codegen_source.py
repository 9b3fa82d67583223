"""Generated-source structure and the vector-primitive library."""
import numpy as np
import pytest

from repro.core import hop as H
from repro.core import vectlib as vl
from repro.core.codegen import compile_source, render_source
from repro.core.pipeline import compile_dag
from repro.lina.sparse import CSR


def _single_source(expr, policy="cost"):
    plan = compile_dag([expr.hop], policy)
    fused = [s for s in plan.specs if s.template]
    assert fused, "expected a fused operator"
    return plan.spoofs[fused[0].root.hid].src


# ------------------------------------------------------------- source shape
def test_cell_source_uses_primitives_not_inlined_bodies():
    X, Y = H.var("X", 100, 20), H.var("Y", 100, 20)
    src = _single_source(H.sum_(X * Y * 2.0))
    # paper §5.2 'instruction footprint': generated code calls the shared
    # primitive library instead of inlining primitive bodies
    assert "vl.mul" in src
    assert "def genexec(a, b):" in src
    assert src.count("\n") < 12  # lean operator


def test_row_source_has_matmult_primitive():
    X, v = H.var("X", 500, 40), H.var("v", 40, 1)
    src = _single_source(X.T @ (X @ v))
    assert "vl.mm(" in src and "vl.tmm_acc(" in src
    assert "template=R" in src and "col_agg_t" in src


def test_outer_source_has_dot_rows():
    n, m, r = 200, 150, 8
    X = H.var("X", n, m, 0.05)
    U, V = H.var("U", n, r), H.var("V", m, r)
    src = _single_source(((X != 0) * (U @ V.T)) @ V)
    assert "vl.dot_rows(ur, vr)" in src
    assert "template=O" in src and "right_mm" in src


def test_equivalent_plans_render_identical_sources():
    def build():
        X, Y = H.var("X", 64, 8), H.var("Y", 64, 8)
        return H.sum_(X * Y + 1.0)

    assert _single_source(build()) == _single_source(build())


def test_literals_inlined():
    X = H.var("X", 50, 5)
    src = _single_source(H.sum_(X * 3.5 + 0.25))
    assert "3.5" in src and "0.25" in src


def test_compile_source_roundtrip():
    src = "def genexec(a, b):\n    t0 = vl.mul(a, 2.0)\n    return t0\n"
    fn = compile_source(src)
    np.testing.assert_allclose(fn(np.ones((2, 2)), []), 2 * np.ones((2, 2)))


# ------------------------------------------------------------ vectlib units
def test_vectlib_dense_sparse_dispatch():
    a = np.array([[1.0, 0.0], [0.0, 2.0]])
    c = CSR.from_dense(a)
    d = np.array([[3.0, 4.0], [5.0, 6.0]])
    np.testing.assert_allclose(vl.mul(c, d).to_dense(), a * d)
    np.testing.assert_allclose(vl.mul(d, c).to_dense(), a * d)
    np.testing.assert_allclose(vl.add(c, d), a + d)
    np.testing.assert_allclose(vl.mm(c, d), a @ d)
    np.testing.assert_allclose(vl.tmm_acc(c, d), a.T @ d)
    np.testing.assert_allclose(vl.row_sums(c), a.sum(1, keepdims=True))
    np.testing.assert_allclose(vl.t(c).to_dense(), a.T)
    assert vl.sum_all(c) == pytest.approx(3.0)


def test_vectlib_sparse_safe_scalar_ops_stay_sparse():
    a = np.array([[1.0, 0.0], [0.0, 2.0]])
    c = CSR.from_dense(a)
    assert isinstance(vl.mul(c, 3.0), CSR)
    assert isinstance(vl.pow_(c, 2.0), CSR)
    assert isinstance(vl.neq(c, 0.0), CSR)
    np.testing.assert_allclose(vl.neq(c, 0.0).to_dense(), (a != 0) * 1.0)


def test_vectlib_comparisons_return_float():
    x = np.array([[1.0, 2.0]])
    out = vl.gt(x, 1.5)
    assert out.dtype == np.float64
    np.testing.assert_allclose(out, [[0.0, 1.0]])


def test_vectlib_outer_primitives():
    g = np.random.default_rng(0)
    u, v = g.random((10, 4)), g.random((10, 4))
    np.testing.assert_allclose(
        vl.dot_rows(u, v), np.einsum("ij,ij->i", u, v)
    )
    w = g.random(10)
    rixv = g.integers(0, 6, 10)
    out = vl.outer_right_acc(w, rixv, v, 6, 4)
    ref = np.zeros((6, 4))
    np.add.at(ref, rixv, w[:, None] * v)
    np.testing.assert_allclose(out, ref)


def test_vectlib_row_index_aggs():
    x = np.array([[3.0, 1.0, 2.0], [0.0, 5.0, -1.0]])
    np.testing.assert_allclose(vl.row_imins(x), [[2.0], [3.0]])
    np.testing.assert_allclose(vl.row_imaxs(x), [[1.0], [2.0]])
    np.testing.assert_allclose(vl.rix(x, 1, 3), x[:, 1:3])
