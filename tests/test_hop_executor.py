"""HOP DAG construction, size/sparsity inference, and the Base interpreter."""
import numpy as np
import pytest

from repro.core import hop as H
from repro.core.executor import execute_base, execute_single
from repro.lina.compressed import CLAMatrix
from repro.lina.sparse import CSR


def _rand(n, m, seed=0):
    return np.random.default_rng(seed).random((n, m))


# ------------------------------------------------------------ shape inference
def test_shapes_edsl():
    X = H.var("X", 100, 10)
    v = H.var("v", 10, 1)
    assert (X @ v).shape == (100, 1)
    assert (X.T @ (X @ v)).shape == (10, 1)
    assert H.row_sums(X).shape == (100, 1)
    assert H.col_sums(X).shape == (1, 10)
    assert H.sum_(X).shape == (1, 1)
    assert (X * 2.0).shape == (100, 10)
    assert X.T.shape == (10, 100)
    assert X.cols(1, 4).shape == (100, 3)


def test_shape_mismatch_raises():
    X = H.var("X", 100, 10)
    with pytest.raises(AssertionError):
        _ = X @ X


def test_sparsity_inference():
    X = H.var("X", 100, 100, sparsity=0.1)
    Y = H.var("Y", 100, 100, sparsity=0.5)
    assert (X * Y).hop.sparsity == pytest.approx(0.05)
    assert (X + Y).hop.sparsity == pytest.approx(0.6)
    assert (X != 0).hop.sparsity == pytest.approx(0.1)
    assert H.exp(X).hop.sparsity == 1.0  # exp(0) != 0
    assert H.sqrt(X).hop.sparsity == pytest.approx(0.1)
    assert X.T.hop.sparsity == pytest.approx(0.1)


def test_memory_estimate_dense_vs_sparse():
    dense = H.var("D", 1000, 1000, sparsity=1.0).hop.memory_bytes()
    sparse = H.var("S", 1000, 1000, sparsity=0.01).hop.memory_bytes()
    assert dense == 8e6
    assert sparse < dense / 10


def test_postorder_visits_once():
    X = H.var("X", 10, 10)
    s = X * X  # same node consumed twice
    order = H.postorder([s.hop])
    assert len(order) == 2  # leaf + b(*)
    cons = H.consumers([s.hop])
    assert len(cons[X.hop.hid]) == 2


# ---------------------------------------------------------------- Base interp
@pytest.mark.parametrize(
    "op,npf",
    [("b(+)", np.add), ("b(-)", np.subtract), ("b(*)", np.multiply),
     ("b(/)", np.divide), ("b(min)", np.minimum), ("b(max)", np.maximum)],
)
def test_binary_dense(op, npf):
    a, b = _rand(7, 5, 1), _rand(7, 5, 2) + 0.1
    X, Y = H.var("X", 7, 5), H.var("Y", 7, 5)
    out = execute_single(H.Expr(H.binop(op, X.hop, Y.hop)), {"X": a, "Y": b})
    np.testing.assert_allclose(out, npf(a, b))


@pytest.mark.parametrize(
    "fn,npf",
    [(H.exp, np.exp), (H.log, np.log), (H.sqrt, np.sqrt), (H.abs_, np.abs),
     (H.sigmoid, lambda x: 1 / (1 + np.exp(-x)))],
)
def test_unary_dense(fn, npf):
    a = _rand(7, 5, 3) + 0.2
    out = execute_single(fn(H.var("X", 7, 5)), {"X": a})
    np.testing.assert_allclose(out, npf(a))


def test_broadcast_col_and_row_vectors():
    a = _rand(6, 4, 4)
    c = _rand(6, 1, 5)
    r = _rand(1, 4, 6)
    X, Cv, Rv = H.var("X", 6, 4), H.var("C", 6, 1), H.var("R", 1, 4)
    np.testing.assert_allclose(execute_single(X * Cv, {"X": a, "C": c}), a * c)
    np.testing.assert_allclose(execute_single(X - Rv, {"X": a, "R": r}), a - r)


def test_scalar_broadcast_and_literals():
    a = _rand(5, 5, 7)
    X = H.var("X", 5, 5)
    np.testing.assert_allclose(execute_single(1.0 - 2.0 * X, {"X": a}), 1 - 2 * a)
    np.testing.assert_allclose(execute_single(X**2.0, {"X": a}), a**2)


@pytest.mark.parametrize("aggfn,npf", [
    (H.sum_, lambda a: a.sum()),
    (H.row_sums, lambda a: a.sum(axis=1, keepdims=True)),
    (H.col_sums, lambda a: a.sum(axis=0, keepdims=True)),
    (H.row_maxs, lambda a: a.max(axis=1, keepdims=True)),
    (H.row_imins, lambda a: (a.argmin(axis=1) + 1.0).reshape(-1, 1)),
    (H.max_, lambda a: a.max()),
])
def test_aggregations(aggfn, npf):
    a = _rand(9, 6, 8)
    out = execute_single(aggfn(H.var("X", 9, 6)), {"X": a})
    np.testing.assert_allclose(out, npf(a))


def test_matmult_chain():
    x, v = _rand(20, 8, 9), _rand(8, 1, 10)
    X, V = H.var("X", 20, 8), H.var("v", 8, 1)
    out = execute_single(X.T @ (X @ V), {"X": x, "v": v})
    np.testing.assert_allclose(out, x.T @ (x @ v))


def test_rix():
    a = _rand(6, 8, 11)
    out = execute_single(H.var("X", 6, 8).cols(2, 5), {"X": a})
    np.testing.assert_allclose(out, a[:, 2:5])


def test_transpose_roundtrip():
    a = _rand(4, 9, 12)
    out = execute_single(H.var("X", 4, 9).T.T, {"X": a})
    np.testing.assert_allclose(out, a)


def test_multi_root_with_cse():
    a = _rand(10, 10, 13)
    X = H.var("X", 10, 10)
    sq = X * X
    r1, r2 = H.sum_(sq), H.row_sums(sq)
    out1, out2 = execute_base([r1.hop, r2.hop], {"X": a})
    np.testing.assert_allclose(out1, (a * a).sum())
    np.testing.assert_allclose(out2, (a * a).sum(axis=1, keepdims=True))


def test_unbound_leaf_raises():
    with pytest.raises(KeyError):
        execute_single(H.var("nope", 2, 2), {})


# ----------------------------------------------------------------- sparse path
def _sparse_case(seed=20):
    g = np.random.default_rng(seed)
    a = g.random((30, 20))
    a[g.random((30, 20)) >= 0.2] = 0.0
    return a


def test_sparse_elementwise_chain_stays_sparse():
    a = _sparse_case()
    d = _rand(30, 20, 21)
    X, D = H.var("X", 30, 20, 0.2), H.var("D", 30, 20)
    out = execute_single(H.sum_((X != 0) * D), {"X": CSR.from_dense(a), "D": d})
    np.testing.assert_allclose(out, ((a != 0) * d).sum())


def test_sparse_matmult():
    a = _sparse_case(22)
    v = _rand(20, 1, 23)
    X, V = H.var("X", 30, 20, 0.2), H.var("v", 20, 1)
    out = execute_single(X @ V, {"X": CSR.from_dense(a), "v": v})
    np.testing.assert_allclose(out, a @ v)


def test_dense_times_sparse_mm():
    a = _sparse_case(24)
    d = _rand(7, 30, 25)
    D, X = H.var("D", 7, 30), H.var("X", 30, 20, 0.2)
    out = execute_single(D @ X, {"D": d, "X": CSR.from_dense(a)})
    np.testing.assert_allclose(out, d @ a)


def test_als_expression_sparse_matches_dense():
    """Eq. (1): O = ((X != 0) * (U @ Vᵀ)) @ V + 1e-6 * U * r"""
    x = _sparse_case(26)
    u, v = _rand(30, 4, 27), _rand(20, 4, 28)
    r = _rand(30, 1, 29)
    X = H.var("X", 30, 20, 0.2)
    U, V, R = H.var("U", 30, 4), H.var("V", 20, 4), H.var("r", 30, 1)
    expr = ((X != 0) * (U @ V.T)) @ V + 1e-6 * U * R
    ref = ((x != 0) * (u @ v.T)) @ v + 1e-6 * u * r
    out_s = execute_single(expr, {"X": CSR.from_dense(x), "U": u, "V": v, "r": r})
    out_d = execute_single(expr, {"X": x, "U": u, "V": v, "r": r})
    np.testing.assert_allclose(out_s, ref, atol=1e-10)
    np.testing.assert_allclose(out_d, ref, atol=1e-10)


# ------------------------------------------------------------- compressed path
def test_compressed_sum_and_colsums():
    a = np.round(_rand(50, 4, 30), 1)  # low cardinality
    C = CLAMatrix.compress(a)
    X = H.var("X", 50, 4)
    np.testing.assert_allclose(execute_single(H.sum_(X), {"X": C}), a.sum())
    np.testing.assert_allclose(
        execute_single(H.col_sums(X), {"X": C}), a.sum(0, keepdims=True)
    )


def test_compressed_decompress_on_general_op():
    a = np.round(_rand(50, 4, 31), 1)
    C = CLAMatrix.compress(a)
    X = H.var("X", 50, 4)
    np.testing.assert_allclose(execute_single(H.exp(X), {"X": C}), np.exp(a))
