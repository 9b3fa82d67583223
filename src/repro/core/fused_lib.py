"""Hand-coded fused operators — the paper's *Fused* baseline.

SystemML's default configuration replaces a fixed set of 2–3-operator
patterns with hand-written kernels (tak+*, mmchain, wdivmm, wsloss,
wcemm, ...). We reproduce that baseline: a structural pattern matcher
over the HOP DAG plus one hand-coded numpy kernel per pattern. Anything
not matching a fixed pattern runs as basic operators — which is exactly
why Fused trails Gen on longer chains and DAGs (paper §5.4).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np

from repro.core.executor import Value, eval_hop
from repro.core.hop import Hop, consumers, postorder
from repro.lina.compressed import CLAMatrix
from repro.lina.sparse import CSR

_BLOCK = 32768  # rows per block in blocked kernels


def _dense(x):
    if isinstance(x, CSR):
        return x.to_dense()
    if isinstance(x, CLAMatrix):
        return x.decompress()
    return x


@dataclass
class HandOp:
    root: Hop
    name: str
    fn: Callable[[dict[int, Value]], Value]  # env-by-hid -> value
    interior: set[int]  # covered non-root hops (skipped by the executor)


# ------------------------------------------------------------------ kernels
def _k_ta_mult_sum(x: Hop, y: Hop):
    """sum(X ⊙ Y) (and sum(X^2) when x is y) in one pass, no intermediate."""

    def run(env):
        a, b = env[x.hid], env[y.hid]
        if isinstance(a, CLAMatrix) and x.hid == y.hid:
            return a.agg_cellwise_distinct(lambda v: v * v)
        if isinstance(a, CSR):
            if x.hid == y.hid:
                return float(np.dot(a.values, a.values))
            bv = (
                b.gather(a.row_index(), a.indices)
                if isinstance(b, CSR)
                else _dense(b)[a.row_index(), a.indices]
            )
            return float(np.dot(a.values, bv))
        a, b = _dense(a), _dense(b)
        total = 0.0
        for lo in range(0, a.shape[0], _BLOCK):
            ab = a[lo : lo + _BLOCK]
            bb = b[lo : lo + _BLOCK] if b.shape[0] == a.shape[0] else b
            total += float(np.dot(ab.ravel(), np.broadcast_to(bb, ab.shape).ravel()))
        return total

    return run


def _k_mmchain(x: Hop, v: Hop, w: Hop | None):
    """t(X) %*% (X %*% v)  [optionally ⊙ w] in a single pass over X."""

    def run(env):
        X, vv = env[x.hid], _dense(env[v.hid])
        if isinstance(X, CSR):
            inner = X.spmm(vv)
            if w is not None:
                inner = inner * _dense(env[w.hid])
            return X.tspmm(inner)
        X = _dense(X)
        out = np.zeros((X.shape[1], vv.shape[1]))
        for lo in range(0, X.shape[0], _BLOCK):
            xb = X[lo : lo + _BLOCK]
            inner = xb @ vv
            if w is not None:
                inner = inner * _dense(env[w.hid])[lo : lo + _BLOCK]
            out += xb.T @ inner
        return out

    return run


def _nnz_coords(X):
    if not isinstance(X, CSR):
        X = CSR.from_dense(_dense(X))
    return X, X.row_index(), X.indices, X.values


def _k_wdivmm_right(x: Hop, u: Hop, vt: Hop, v: Hop):
    """((X != 0) ⊙ (U Vᵀ)) %*% V over non-zeros of X only."""

    def run(env):
        X, rix, cix, vals = _nnz_coords(env[x.hid])
        U = _dense(env[u.hid])
        V = np.ascontiguousarray(_dense(env[vt.hid]).T)
        R = _dense(env[v.hid])
        w = np.einsum("ij,ij->i", U[rix], V[cix]) * (vals != 0)
        out = np.zeros((X.shape[0], R.shape[1]))
        np.add.at(out, rix, w[:, None] * R[cix])
        return out

    return run


def _k_wsloss(x: Hop, u: Hop, vt: Hop):
    """sum(((X != 0) ⊙ (U Vᵀ) − X)^2) over non-zeros of X only."""

    def run(env):
        _, rix, cix, vals = _nnz_coords(env[x.hid])
        U = _dense(env[u.hid])
        V = np.ascontiguousarray(_dense(env[vt.hid]).T)
        d = np.einsum("ij,ij->i", U[rix], V[cix]) - vals
        return float(np.dot(d, d))

    return run


def _k_wcemm(x: Hop, u: Hop, vt: Hop, eps: float):
    """sum(X ⊙ log(U Vᵀ + eps)) over non-zeros of X only."""

    def run(env):
        _, rix, cix, vals = _nnz_coords(env[x.hid])
        U = _dense(env[u.hid])
        V = np.ascontiguousarray(_dense(env[vt.hid]).T)
        return float(np.dot(vals, np.log(np.einsum("ij,ij->i", U[rix], V[cix]) + eps)))

    return run


# ------------------------------------------------------------------ matching
def _is(h: Hop, op: str) -> bool:
    return h.op == op


def _lit(h: Hop) -> float | None:
    return h.value if h.op == "lit" else None


def _outer_mm(h: Hop) -> tuple[Hop, Hop] | None:
    """Match U %*% t(V)-shaped mm (narrow common dim): returns (U, Vᵀ-hop)."""
    if h.op != "ba(+*)" or h.inputs[0].ncols > 256:
        return None
    if not (h.nrows > h.inputs[0].ncols and h.ncols > h.inputs[0].ncols):
        return None
    return h.inputs[0], h.inputs[1]


def _match_one(h: Hop) -> tuple[str, Callable, set[int]] | None:
    """Try the fixed pattern catalogue at hop h (root of the pattern)."""
    # --- sum(X ⊙ Y) / sum(X^2) ------------------------------------------
    if _is(h, "ua(+)"):
        inner = h.inputs[0]
        if _is(inner, "b(*)") and inner.inputs[0].op == "leaf" and inner.inputs[1].op == "leaf":
            return "tak+*", _k_ta_mult_sum(inner.inputs[0], inner.inputs[1]), {inner.hid}
        if _is(inner, "b(^)") and _lit(inner.inputs[1]) == 2.0 and inner.inputs[0].op == "leaf":
            x = inner.inputs[0]
            return "tak^2", _k_ta_mult_sum(x, x), {inner.hid}
        # sum(X ⊙ log(UVᵀ + eps))
        if _is(inner, "b(*)"):
            x, lg = inner.inputs
            if _is(lg, "u(log)") and _is(lg.inputs[0], "b(+)"):
                mm, eps = lg.inputs[0].inputs
                ep = _lit(eps)
                om = _outer_mm(mm)
                if om and ep is not None and x.op == "leaf":
                    return (
                        "wcemm",
                        _k_wcemm(x, om[0], om[1], ep),
                        {inner.hid, lg.hid, lg.inputs[0].hid, mm.hid},
                    )
        # sum((W ⊙ UVᵀ − X)^2) with W = (X != 0)
        if _is(inner, "b(^)") and _lit(inner.inputs[1]) == 2.0:
            diff = inner.inputs[0]
            if _is(diff, "b(-)"):
                wuv, x2 = diff.inputs
                if _is(wuv, "b(*)"):
                    mask, mm = wuv.inputs
                    om = _outer_mm(mm)
                    if (
                        om
                        and _is(mask, "b(!=)")
                        and mask.inputs[0].hid == x2.hid
                        and _lit(mask.inputs[1]) == 0.0
                    ):
                        return (
                            "wsloss",
                            _k_wsloss(x2, om[0], om[1]),
                            {inner.hid, diff.hid, wuv.hid, mask.hid, mm.hid},
                        )
    # --- mmchain: t(X) %*% (w ⊙ (X %*% v)) ------------------------------
    if _is(h, "ba(+*)") and _is(h.inputs[0], "t"):
        X = h.inputs[0].inputs[0]
        rhs = h.inputs[1]
        if rhs.ncols == 1:  # hand-coded mmchain applies to m-v chains only
            if _is(rhs, "ba(+*)") and rhs.inputs[0].hid == X.hid:
                return (
                    "mmchain",
                    _k_mmchain(X, rhs.inputs[1], None),
                    {h.inputs[0].hid, rhs.hid},
                )
            if _is(rhs, "b(*)"):
                a, b = rhs.inputs
                for w, mv in ((a, b), (b, a)):
                    if _is(mv, "ba(+*)") and mv.inputs[0].hid == X.hid:
                        return (
                            "mmchain*",
                            _k_mmchain(X, mv.inputs[1], w),
                            {h.inputs[0].hid, rhs.hid, mv.hid},
                        )
    # --- wdivmm-right: ((X != 0) ⊙ UVᵀ) %*% V ---------------------------
    if _is(h, "ba(+*)"):
        lhs, v = h.inputs
        if _is(lhs, "b(*)"):
            mask, mm = lhs.inputs
            om = _outer_mm(mm)
            if (
                om
                and _is(mask, "b(!=)")
                and _lit(mask.inputs[1]) == 0.0
                and v.ncols <= 256
            ):
                return (
                    "wdivmm",
                    _k_wdivmm_right(mask.inputs[0], om[0], om[1], v),
                    {lhs.hid, mask.hid, mm.hid},
                )
    return None


def plan_hand_fused(roots: list[Hop]) -> dict[int, HandOp]:
    """Match the pattern catalogue top-down; interior nodes must not be
    consumed outside the pattern (hand-coded operators cannot export
    intermediates)."""
    cons = consumers(roots)
    root_hids = {r.hid for r in roots}
    chosen: dict[int, HandOp] = {}
    covered: set[int] = set()
    for h in reversed(postorder(roots)):
        if h.hid in covered or h.hid in chosen:
            continue
        m = _match_one(h)
        if m is None:
            continue
        name, fn, interior = m
        if any(i in root_hids for i in interior):
            continue
        ok = all(
            all(c.hid in interior or c.hid == h.hid for c in cons.get(i, []))
            for i in interior
        )
        if not ok:
            continue
        chosen[h.hid] = HandOp(h, name, fn, interior)
        covered |= interior
    return chosen


def execute_fused(roots: list[Hop], bindings: dict) -> list[Value]:
    """The *Fused* executor: basic operators + hand-coded fused kernels."""
    hand = plan_hand_fused(roots)
    skip = set().union(*(op.interior for op in hand.values())) if hand else set()
    env: dict[int, Value] = {}
    for h in postorder(roots):
        if h.hid in skip:
            continue
        if h.hid in hand:
            env[h.hid] = hand[h.hid].fn(env)
        else:
            env[h.hid] = eval_hop(h, env, bindings)
    return [env[r.hid] for r in roots]
