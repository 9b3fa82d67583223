"""Distributed substrate tests: RowBlockMatrix ops, distributed fused
operators, and the hybrid SparkEngine — with DuckDB-oracle checks for
every relational-style result (matmult as join+aggregate, cell-wise
aggregations over COO tables, TPC-H-lite column sums)."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.core import hop as H
from repro.core.executor import execute_base
from repro.core.pipeline import compile_dag
from repro.lina.sparse import CSR
from repro.oracle import assert_equivalent
from repro.sparkdist import ops
from repro.sparkdist.blocked import RowBlockMatrix
from repro.sparkdist.executor import SparkEngine
from repro.sparkdist.fusedexec import execute_dist

BS = 16  # small blocks so even tiny tests span multiple blocks


def _rand(n, m, seed=0):
    return np.random.default_rng(seed).random((n, m))


def _cells(a: np.ndarray) -> pd.DataFrame:
    i, j = np.indices(a.shape)
    return pd.DataFrame(
        {"i": i.ravel().astype(np.int64), "j": j.ravel().astype(np.int64), "v": a.ravel()}
    )


# ------------------------------------------------------------ blocked basics
def test_roundtrip_dense(spark):
    a = _rand(53, 7, 1)
    rb = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    assert rb.n_blocks == 4
    np.testing.assert_allclose(rb.to_numpy(), a)


def test_roundtrip_sparse(spark):
    a = _rand(40, 9, 2)
    a[a < 0.8] = 0.0
    rb = RowBlockMatrix.from_matrix(spark, CSR.from_dense(a), block_rows=BS)
    np.testing.assert_allclose(rb.to_numpy(), a)


def test_map_blocks(spark):
    a = _rand(33, 5, 3)
    rb = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    np.testing.assert_allclose(rb.map_blocks(lambda x: x * 2.0).to_numpy(), a * 2)


def test_elementwise_dist_dist(spark):
    a, b = _rand(45, 6, 4), _rand(45, 6, 5)
    ra = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    rb = RowBlockMatrix.from_matrix(spark, b, block_rows=BS)
    np.testing.assert_allclose(
        ops.elementwise(spark, "b(*)", ra, rb).to_numpy(), a * b
    )


def test_elementwise_dist_scalar_and_local(spark):
    a = _rand(45, 6, 6)
    c = _rand(45, 1, 7)  # row-aligned local column vector
    r = _rand(1, 6, 8)   # broadcast row vector
    ra = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    np.testing.assert_allclose(
        ops.elementwise(spark, "b(+)", ra, 3.0).to_numpy(), a + 3
    )
    np.testing.assert_allclose(
        ops.elementwise(spark, "b(*)", ra, c).to_numpy(), a * c
    )
    np.testing.assert_allclose(
        ops.elementwise(spark, "b(-)", ra, r).to_numpy(), a - r
    )


def test_matmult_broadcast_rhs(spark):
    a, v = _rand(50, 8, 9), _rand(8, 3, 10)
    ra = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    np.testing.assert_allclose(ops.matmult(spark, ra, v).to_numpy(), a @ v)


def test_matmult_tsmm(spark):
    # t(X) %*% Y with both distributed row-aligned
    x, y = _rand(60, 5, 11), _rand(60, 4, 12)
    rx = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    ry = RowBlockMatrix.from_matrix(spark, y, block_rows=BS)
    out = ops.matmult(spark, ops.TransposedRBM(rx), ry)
    np.testing.assert_allclose(out, x.T @ y, atol=1e-12)


def test_aggregates(spark):
    a = _rand(47, 6, 13)
    ra = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    assert ops.aggregate(spark, "ua(+)", ra) == pytest.approx(a.sum())
    np.testing.assert_allclose(
        ops.aggregate(spark, "ua(C+)", ra), a.sum(0, keepdims=True)
    )
    np.testing.assert_allclose(
        ops.aggregate(spark, "ua(R+)", ra).to_numpy(), a.sum(1, keepdims=True)
    )
    np.testing.assert_allclose(
        ops.aggregate(spark, "ua(Rimin)", ra).to_numpy(),
        (a.argmin(1) + 1.0).reshape(-1, 1),
    )


def test_rix(spark):
    a = _rand(30, 10, 14)
    ra = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    np.testing.assert_allclose(ops.rix(spark, ra, 2, 7).to_numpy(), a[:, 2:7])


# --------------------------------------------------------- oracle-backed
def test_oracle_matmult_as_join_aggregate(spark):
    """Distributed matmult must equal the SQL join+aggregate over COO."""
    a, b = _rand(20, 6, 15), _rand(6, 4, 16)
    ra = RowBlockMatrix.from_matrix(spark, a, block_rows=BS)
    c = ops.matmult(spark, ra, b)
    got = spark.createDataFrame(_cells(c.to_numpy()))
    assert_equivalent(
        got,
        """SELECT a.i AS i, b.j AS j, SUM(a.v * b.v) AS v
           FROM a JOIN b ON a.j = b.i GROUP BY a.i, b.j""",
        a=_cells(a),
        b=_cells(b),
    )


def test_oracle_fused_cell_sum_xyz(spark):
    """Generated distributed Cell operator vs DuckDB over cell tables."""
    n, m = 40, 8
    x, y, z = _rand(n, m, 17), _rand(n, m, 18), _rand(n, m, 19)
    X, Y, Z = H.var("X", n, m), H.var("Y", n, m), H.var("Z", n, m)
    plan = compile_dag([H.sum_(X * Y * Z).hop], "cost")
    (spoof,) = plan.spoofs.values()
    (spec,) = [s for s in plan.specs if s.template]
    vals = {}
    for hid in spec.input_hids:
        name = spec.input_hops[hid].name
        vals[hid] = RowBlockMatrix.from_matrix(
            spark, {"X": x, "Y": y, "Z": z}[name], block_rows=BS
        )
    total = execute_dist(spark, spoof, vals)
    got = spark.createDataFrame(pd.DataFrame({"total": [total]}))
    assert_equivalent(
        got,
        """SELECT SUM(x.v * y.v * z.v) AS total
           FROM x JOIN y ON x.i=y.i AND x.j=y.j
                  JOIN z ON x.i=z.i AND x.j=z.j""",
        x=_cells(x),
        y=_cells(y),
        z=_cells(z),
    )


def test_oracle_colsums_tpch_lineitem(spark):
    """colSums over a matrix built from TPC-H-lite lineitem == SQL SUMs."""
    li = synth_data.lineitem(spark, sf=0.001)
    pdf = li.select("l_quantity", "l_extendedprice", "l_discount", "l_tax").toPandas()
    X = pdf.to_numpy(dtype=np.float64)
    rb = RowBlockMatrix.from_matrix(spark, X, block_rows=1024)
    cs = ops.aggregate(spark, "ua(C+)", rb)
    got = spark.createDataFrame(
        pd.DataFrame(
            {
                "sq": [cs[0, 0]], "se": [cs[0, 1]],
                "sd": [cs[0, 2]], "st": [cs[0, 3]],
            }
        )
    )
    assert_equivalent(
        got,
        """SELECT SUM(l_quantity) AS sq, SUM(l_extendedprice) AS se,
                  SUM(l_discount) AS sd, SUM(l_tax) AS st FROM li""",
        li=pdf,
    )


# ----------------------------------------------------- distributed fused ops
def _compile_single(expr):
    plan = compile_dag([expr.hop], "cost")
    fused = [s for s in plan.specs if s.template]
    assert len(fused) == 1
    return plan, plan.spoofs[fused[0].root.hid], fused[0]


def test_fused_row_mmchain_dist(spark):
    n, m = 64, 12
    x, v = _rand(n, m, 20), _rand(m, 1, 21)
    X, V = H.var("X", n, m), H.var("v", m, 1)
    plan, spoof, spec = _compile_single(X.T @ (X @ V))
    vals = {}
    for hid in spec.input_hids:
        nm = spec.input_hops[hid].name
        if nm == "X":
            vals[hid] = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
        else:
            vals[hid] = v
    out = execute_dist(spark, spoof, vals)
    np.testing.assert_allclose(out, x.T @ (x @ v), atol=1e-10)


def test_fused_cell_rowagg_dist(spark):
    n, m = 48, 9
    x, y = _rand(n, m, 22), _rand(n, m, 23)
    X, Y = H.var("X", n, m), H.var("Y", n, m)
    plan, spoof, spec = _compile_single(H.row_sums(X * Y + 1.0))
    vals = {}
    for hid in spec.input_hids:
        nm = spec.input_hops[hid].name
        vals[hid] = RowBlockMatrix.from_matrix(
            spark, {"X": x, "Y": y}[nm], block_rows=BS
        )
    out = execute_dist(spark, spoof, vals)
    np.testing.assert_allclose(out.to_numpy(), (x * y + 1).sum(1, keepdims=True))


def test_fused_dist_sparse_main(spark):
    n, m = 60, 10
    xd = _rand(n, m, 24)
    xd[xd < 0.7] = 0.0
    y = _rand(n, m, 25)
    X, Y = H.var("X", n, m, 0.3), H.var("Y", n, m)
    plan, spoof, spec = _compile_single(H.sum_(X * Y))
    vals = {}
    for hid in spec.input_hids:
        nm = spec.input_hops[hid].name
        v = CSR.from_dense(xd) if nm == "X" else y
        vals[hid] = RowBlockMatrix.from_matrix(spark, v, block_rows=BS)
    out = execute_dist(spark, spoof, vals)
    assert out == pytest.approx((xd * y).sum())


# --------------------------------------------------------------- SparkEngine
@pytest.mark.parametrize("mode", ["base", "fused", "gen", "gen_fa", "gen_fnr"])
def test_engine_mmchain_all_modes(spark, mode):
    n, m = 70, 8
    x, v = _rand(n, m, 26), _rand(m, 1, 27)
    X, V = H.var("X", n, m), H.var("v", m, 1)
    expr = X.T @ (X @ V)
    eng = SparkEngine(spark, mode)
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    out = eng(expr, {"X": rb, "v": v})
    np.testing.assert_allclose(np.asarray(out), x.T @ (x @ v), atol=1e-10)


@pytest.mark.parametrize("mode", ["base", "gen"])
def test_engine_l2svm_iteration_dist(spark, mode):
    n, m = 80, 6
    x = _rand(n, m, 28)
    y = np.where(_rand(n, 1, 29) > 0.5, 1.0, -1.0)
    w = _rand(m, 1, 30)
    Xh, yh, wh = H.var("X", n, m), H.var("y", n, 1), H.var("w", m, 1)
    out_e = 1.0 - yh * (Xh @ wh)
    sv = out_e > 0.0
    g = 0.001 * wh - Xh.T @ (sv * out_e * yh)
    obj = 0.5 * H.sum_((sv * out_e) ** 2.0)
    eng = SparkEngine(spark, mode)
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    yb = RowBlockMatrix.from_matrix(spark, y, block_rows=BS)
    gv, objv = eng([g, obj], {"X": rb, "y": yb, "w": w})
    ref_g, ref_obj = execute_base(
        [g.hop, obj.hop], {"X": x, "y": y, "w": w}
    )
    np.testing.assert_allclose(np.asarray(gv), ref_g, atol=1e-10)
    assert float(objv) == pytest.approx(float(ref_obj))


@pytest.mark.parametrize("mode", ["base", "fused", "gen", "gen_fa", "gen_fnr"])
def test_l2svm_distributed_matches_local(spark, mode):
    from repro.algorithms import l2svm
    from repro.algorithms.engine import Engine

    n, m = 120, 6
    x = _rand(n, m, 33)
    y = np.where(_rand(n, 1, 34) > 0.5, 1.0, -1.0)
    cfg = l2svm.L2SVMConfig(max_iter=3)
    ref = l2svm.run(Engine("base"), x, y, cfg)["objs"]
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    yb = RowBlockMatrix.from_matrix(spark, y, block_rows=BS)
    got = l2svm.run(SparkEngine(spark, mode), rb, yb, cfg)["objs"]
    np.testing.assert_allclose(got, ref, rtol=1e-8)


@pytest.mark.parametrize("mode", ["base", "gen", "gen_fa"])
def test_kmeans_distributed_matches_local(spark, mode):
    from repro.algorithms import kmeans
    from repro.algorithms.engine import Engine

    n, m = 150, 5
    x = _rand(n, m, 35)
    cfg = kmeans.KMeansConfig(k=3, max_iter=3)
    init = x[:3].copy()
    ref = kmeans.run(Engine("base"), x, cfg, init_C=init)["objs"]
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    got = kmeans.run(SparkEngine(spark, mode), rb, cfg, init_C=init)["objs"]
    np.testing.assert_allclose(got, ref, rtol=1e-8)


@pytest.mark.parametrize("mode", ["base", "gen"])
def test_mlogreg_distributed_matches_local(spark, mode):
    from repro.algorithms import mlogreg
    from repro.algorithms.engine import Engine
    from repro.data import mldata

    n, m, k = 130, 5, 2
    x = _rand(n, m, 36)
    Y = mldata.onehot_labels(n, k, seed=37)[:, : k - 1]
    cfg = mlogreg.MLogregConfig(k=k, max_iter=2, max_inner=2)
    ref = mlogreg.run(Engine("base"), x, Y, cfg)["objs"]
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    yb = RowBlockMatrix.from_matrix(spark, Y, block_rows=BS)
    got = mlogreg.run(SparkEngine(spark, mode), rb, yb, cfg)["objs"]
    np.testing.assert_allclose(got, ref, rtol=1e-8)


@pytest.mark.parametrize("mode", ["base", "fused", "gen"])
def test_glm_distributed_matches_local(spark, mode):
    # 'fused' exercises the distributed mmchain* kernel with a
    # distributed weight vector (join on block id, not broadcast)
    from repro.algorithms import glm
    from repro.algorithms.engine import Engine
    from repro.data import mldata

    n, m = 140, 6
    x = _rand(n, m, 38)
    y01 = (mldata.binary_labels(x) > 0).astype(np.float64)
    cfg = glm.GLMConfig(max_iter=2, max_inner=2)
    ref = glm.run(Engine("base"), x, y01, cfg)["objs"]
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    yb = RowBlockMatrix.from_matrix(spark, y01, block_rows=BS)
    got = glm.run(SparkEngine(spark, mode), rb, yb, cfg)["objs"]
    np.testing.assert_allclose(got, ref, rtol=1e-8)


def test_engine_gen_fuses_distributed(spark):
    n, m = 64, 8
    x, v = _rand(n, m, 31), _rand(m, 1, 32)
    X, V = H.var("X", n, m), H.var("v", m, 1)
    eng = SparkEngine(spark, "gen")
    rb = RowBlockMatrix.from_matrix(spark, x, block_rows=BS)
    eng(X.T @ (X @ V), {"X": rb, "v": v})
    assert sum(p.n_fused for p in eng._plans.values()) >= 1
