"""ALS-CG: alternating least squares via conjugate gradient (rank-r
factorization X ≈ U Vᵀ with weighted-L2 regularization) — Table 2 row 5.

Every inner step evaluates the paper's Expression (1) shape
``((X ≠ 0) ⊙ (U Vᵀ)) V + λ ⊙ U ⊙ r`` and the loss
``sum(((X ≠ 0) ⊙ (U Vᵀ) − X)²)`` — the sparsity-exploiting Outer
template patterns whose absence makes Base/FA/FNR infeasible (Table 5).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import hop as H
from repro.lina.sparse import CSR


@dataclass
class ALSCGConfig:
    rank: int = 20
    lam: float = 1e-3
    eps: float = 1e-12
    max_iter: int = 6        # outer iterations (U and V each)
    max_inner: int = 3       # CG steps per factor update


def _factor_dags(n: int, m: int, r: int, sp: float, lam: float):
    """DAGs for one factor update (rows of the sparse X view)."""
    Xh = H.var("X", n, m, sp)
    Uh = H.var("U", n, r)
    Vh = H.var("V", m, r)
    Sh = H.var("S", n, r)
    rh = H.var("rw", n, 1)
    W = (Xh != 0) * (Uh @ Vh.T)
    grad = W @ Vh - Xh @ Vh + lam * Uh * rh
    hs = ((Xh != 0) * (Sh @ Vh.T)) @ Vh + lam * Sh * rh
    loss = H.sum_((W - Xh) ** 2.0)
    return grad, hs, loss


def run(engine, X: CSR, cfg: ALSCGConfig | None = None, seed: int = 8) -> dict:
    cfg = cfg or ALSCGConfig()
    assert isinstance(X, CSR), "ALS-CG expects a sparse rating matrix"
    n, m = X.shape
    r = cfg.rank
    g = np.random.default_rng(seed)
    U = 0.1 * g.standard_normal((n, r))
    V = 0.1 * g.standard_normal((m, r))
    Xt = X.transpose()
    rw_u = np.maximum(X.row_nnz(), 1.0).reshape(-1, 1)
    rw_v = np.maximum(Xt.row_nnz(), 1.0).reshape(-1, 1)

    gu, hu, loss_u = _factor_dags(n, m, r, X.sparsity, cfg.lam)
    gv, hv, _ = _factor_dags(m, n, r, X.sparsity, cfg.lam)

    def cg_update(A, B, Xside, rws, grad_e, hs_e):
        G = np.asarray(engine(grad_e, {"X": Xside, "U": A, "V": B, "rw": rws}))
        rr = -G
        p = rr.copy()
        dx = np.zeros_like(A)
        rs = float((rr * rr).sum())
        for _ in range(cfg.max_inner):
            Hp = np.asarray(engine(hs_e, {"X": Xside, "S": p, "V": B, "rw": rws}))
            alpha = rs / max(float((p * Hp).sum()), cfg.eps)
            dx += alpha * p
            rr -= alpha * Hp
            rs_new = float((rr * rr).sum())
            if rs_new < cfg.eps:
                break
            p = rr + (rs_new / rs) * p
            rs = rs_new
        return A + dx

    losses = []
    for _ in range(cfg.max_iter):
        U = cg_update(U, V, X, rw_u, gu, hu)
        V = cg_update(V, U, Xt, rw_v, gv, hv)
        losses.append(
            float(engine(loss_u, {"X": X, "U": U, "V": V, "rw": rw_u}))
        )
        if len(losses) > 1 and abs(losses[-2] - losses[-1]) < cfg.eps:
            break
    return {"U": U, "V": V, "losses": losses, "iters": len(losses)}
