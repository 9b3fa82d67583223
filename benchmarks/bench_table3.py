"""Table 3 benchmark: compilation overhead of the codegen pipeline
(explore → select → cplan → codegen) per algorithm-representative DAG.

The paper's claim: total codegen overhead stays sub-second per algorithm
despite thousands of explored plans; the plan cache makes repeated
compilation of equivalent DAGs nearly free.
"""
import numpy as np
import pytest

from repro.core import hop as H
from repro.core.pipeline import CodegenContext, compile_dag


def _l2svm_dag():
    n, m = 100_000, 784
    X, y, w = H.var("X", n, m, 0.25), H.var("y", n, 1), H.var("w", m, 1)
    out = 1.0 - y * (X @ w)
    sv = out > 0.0
    g = 1e-3 * w - X.T @ (sv * out * y)
    obj = 0.5 * H.sum_((sv * out) ** 2.0) + 5e-4 * H.sum_(w**2.0)
    return [g.hop, obj.hop, sv.hop]


def _mlogreg_dag():
    n, m, k = 100_000, 784, 4
    X, v, P = H.var("X", n, m, 0.25), H.var("v", m, k), H.var("P", n, k + 1)
    Pk = P.cols(0, k)
    Q = Pk * (X @ v)
    return [(X.T @ (Q - Pk * H.row_sums(Q))).hop]


def _als_dag():
    n, m, r = 100_000, 10_000, 20
    X = H.var("X", n, m, 0.01)
    U, V, rw = H.var("U", n, r), H.var("V", m, r), H.var("rw", n, 1)
    W = (X != 0) * (U @ V.T)
    return [(W @ V - X @ V + 1e-3 * U * rw).hop]


def _kmeans_dag():
    n, m, k = 100_000, 100, 5
    X, C, rx2 = H.var("X", n, m), H.var("C", k, m), H.var("rx2", n, 1)
    D = rx2 - 2.0 * (X @ C.T) + H.row_sums(C**2.0).T
    A = D == H.row_mins(D)
    return [(A.T @ X).hop, H.col_sums(A).hop, H.sum_(H.row_mins(D)).hop]


DAGS = {
    "l2svm": _l2svm_dag,
    "mlogreg": _mlogreg_dag,
    "als": _als_dag,
    "kmeans": _kmeans_dag,
}


@pytest.mark.parametrize("name", list(DAGS))
def test_codegen_compile_overhead(benchmark, name):
    mk = DAGS[name]

    def compile_fresh():
        return compile_dag(mk(), "cost", CodegenContext())

    plan = benchmark(compile_fresh)
    assert plan.n_fused >= 1


@pytest.mark.parametrize("name", ["l2svm", "mlogreg"])
def test_codegen_plan_cache_hit(benchmark, name):
    """Recompiling an equivalent DAG must hit the plan cache."""
    ctx = CodegenContext()
    compile_dag(DAGS[name](), "cost", ctx)
    misses = ctx.plan_cache.stats.misses

    def recompile():
        return compile_dag(DAGS[name](), "cost", ctx)

    benchmark(recompile)
    assert ctx.plan_cache.stats.misses == misses  # no new operator compiles
