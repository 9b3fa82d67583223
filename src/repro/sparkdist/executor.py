"""Hybrid local/distributed execution engine (paper §5.5's regime).

``SparkEngine`` mirrors ``repro.algorithms.engine.Engine`` but bindings
may contain :class:`RowBlockMatrix` values. Dispatch is type-driven:
an operator touching a distributed operand runs as a distributed
instruction (one materialized Spark job), everything else runs locally
at the driver — SystemML's hybrid runtime plans.

Gen modes compile with a cost model whose ``local_mem_budget`` reflects
the driver budget, so plan selection reasons about distributed reads,
broadcasts, and the Row template's block-size constraint exactly as
§4.3/§4.4 describe.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.algorithms.engine import _POLICY, dag_signature
from repro.core import executor as local_ex
from repro.core.cost import CostModel
from repro.core.fused_lib import plan_hand_fused
from repro.core.hop import Expr, Hop, postorder
from repro.core.pipeline import CodegenContext, CompiledPlan, compile_dag
from repro.lina.sparse import CSR
from repro.sparkdist import ops
from repro.sparkdist.blocked import RowBlockMatrix, zip_reduce
from repro.sparkdist.fusedexec import execute_dist
from repro.sparkdist.ops import TransposedRBM, is_dist

MODES = ("base", "fused", "gen", "gen_fa", "gen_fnr")


def eval_hop_hybrid(spark, h: Hop, env: dict, bindings: dict):
    """One operator, dispatched local vs distributed by operand types."""
    if h.op == "leaf":
        return bindings[h.name]
    if h.op == "lit":
        return float(h.value)
    ins = [env[i.hid] for i in h.inputs]
    if not any(is_dist(v) for v in ins):
        return local_ex.eval_hop(h, env, bindings)
    if h.op == "t":
        (v,) = ins
        return TransposedRBM(v) if isinstance(v, RowBlockMatrix) else v.base
    if h.op == "ba(+*)":
        return ops.matmult(spark, ins[0], ins[1])
    if h.op in local_ex._BINARY_FN:
        return ops.elementwise(spark, h.op, ins[0], ins[1])
    if h.op in local_ex._UNARY_FN:
        return ops.unary(spark, h.op, ins[0])
    if h.op.startswith("ua("):
        return ops.aggregate(spark, h.op, ins[0])
    if h.op == "rix":
        return ops.rix(spark, ins[0], h.meta["c1"], h.meta["c2"])
    raise ValueError(f"unsupported distributed op {h.op}")


def _hand_kernel_dist(spark, op_name: str, hand, env):
    """Distributed variants of the hand-coded kernels that SystemML ships
    as Spark instructions (mmchain, tak)."""
    root = hand.root
    if op_name in ("mmchain", "mmchain*"):
        X_hop = root.inputs[0].inputs[0]
        X = env[X_hop.hid]
        if not isinstance(X, RowBlockMatrix):
            return None  # local pattern: fall back to the local hand kernel
        rhs = root.inputs[1]
        if op_name == "mmchain":
            v_hop = rhs.inputs[1]
            w_hop = None
        else:
            a, b = rhs.inputs
            mv = a if a.op == "ba(+*)" else b
            w_hop = b if mv is a else a
            v_hop = mv.inputs[1]
        bcv = spark.sparkContext.broadcast(np.asarray(env[v_hop.hid]))
        w_val = env[w_hop.hid] if w_hop is not None else None
        if isinstance(w_val, RowBlockMatrix):
            # distributed weight vector: single-pass join on block id
            def partw(x, w):
                wd = w.to_dense() if isinstance(w, CSR) else w
                inner = (
                    x.spmm(bcv.value) if isinstance(x, CSR) else x @ bcv.value
                ) * wd
                return x.tspmm(inner) if isinstance(x, CSR) else x.T @ inner

            return zip_reduce(X, [w_val], partw, lambda p, q: p + q)
        bcw = spark.sparkContext.broadcast(w_val) if w_val is not None else None
        bs = X.block_rows

        def part(x, bid_lo):
            inner = x.spmm(bcv.value) if isinstance(x, CSR) else x @ bcv.value
            if bcw is not None:
                inner = inner * bcw.value[bid_lo : bid_lo + inner.shape[0]]
            return x.tspmm(inner) if isinstance(x, CSR) else x.T @ inner

        # reduce with block offsets: reuse zip_reduce via bid-aware mapping
        import pickle

        import pandas as pd

        def gen(it):
            for pdf in it:
                acc = None
                for bid, blk in zip(pdf["bid"], pdf["block"]):
                    x = pickle.loads(bytes(blk))
                    p = part(x, int(bid) * bs)
                    acc = p if acc is None else acc + p
                if acc is not None:
                    yield pd.DataFrame({"part": [pickle.dumps(acc)]})

        parts = X.df.mapInPandas(gen, schema="part BINARY").collect()
        acc = None
        for r in parts:
            p = pickle.loads(bytes(r["part"]))
            acc = p if acc is None else acc + p
        return acc
    if op_name in ("tak+*", "tak^2"):
        inner = root.inputs[0]
        x_hop = inner.inputs[0]
        X = env[x_hop.hid]
        if not isinstance(X, RowBlockMatrix):
            return None  # local pattern: fall back to the local hand kernel
        if op_name == "tak^2" or inner.inputs[1].hid == x_hop.hid:
            return float(
                X.reduce_blocks(
                    lambda x: (
                        float(np.dot(x.values, x.values))
                        if isinstance(x, CSR)
                        else float(np.dot(x.ravel(), x.ravel()))
                    ),
                    lambda p, q: p + q,
                )
            )
        y_hop = inner.inputs[1]
        Y = env[y_hop.hid]
        if isinstance(Y, RowBlockMatrix):
            return float(
                zip_reduce(
                    X,
                    [Y],
                    lambda x, y: float(
                        np.dot(
                            (x.to_dense() if isinstance(x, CSR) else x).ravel(),
                            (y.to_dense() if isinstance(y, CSR) else y).ravel(),
                        )
                    ),
                    lambda p, q: p + q,
                )
            )
    return None  # no distributed kernel: caller falls back to basic ops


@dataclass
class SparkEngine:
    spark: object
    mode: str = "gen"
    cm: CostModel = field(default_factory=lambda: CostModel(local_mem_budget=48e6))
    ctx: CodegenContext = None  # type: ignore[assignment]
    _plans: dict[str, CompiledPlan] = field(default_factory=dict)

    def __post_init__(self) -> None:
        assert self.mode in MODES, self.mode
        if self.ctx is None:
            self.ctx = CodegenContext(cost_model=self.cm)

    # ------------------------------------------------------------- dispatch
    def __call__(self, exprs, bindings: dict):
        single = isinstance(exprs, (Expr, Hop))
        lst = [exprs] if single else list(exprs)
        roots = [e.hop if isinstance(e, Expr) else e for e in lst]
        if self.mode == "base":
            out = self._execute_basic(roots, bindings)
        elif self.mode == "fused":
            out = self._execute_fused(roots, bindings)
        else:
            key = dag_signature(roots)
            plan = self._plans.get(key)
            if plan is None:
                plan = compile_dag(roots, _POLICY[self.mode], self.ctx)
                self._plans[key] = plan
            out = self._execute_plan(plan, bindings)
        return out[0] if single else out

    def _execute_basic(self, roots, bindings, skip=(), hand=None):
        env: dict[int, object] = {}
        inters: list[RowBlockMatrix] = []
        for h in postorder(roots):
            if h.hid in skip:
                continue
            if hand and h.hid in hand:
                v = _hand_kernel_dist(self.spark, hand[h.hid].name, hand[h.hid], env)
                if v is None:
                    try:  # purely local operands: the local hand-coded kernel
                        v = hand[h.hid].fn(env)
                    except (AttributeError, TypeError):
                        for hh in postorder([h]):
                            if hh.hid not in env:
                                env[hh.hid] = eval_hop_hybrid(
                                    self.spark, hh, env, bindings
                                )
                        v = env[h.hid]
                env[h.hid] = v
            else:
                env[h.hid] = eval_hop_hybrid(self.spark, h, env, bindings)
            if isinstance(env[h.hid], RowBlockMatrix) and h not in roots:
                inters.append(env[h.hid])
        out = [env[r.hid] for r in roots]
        for rb in inters:
            if not any(rb is o for o in out):
                rb.unpersist()
        return out

    def _execute_fused(self, roots, bindings):
        hand = plan_hand_fused(roots)
        # only skip interiors of patterns that have a distributed kernel
        # when their input is distributed; local patterns always apply
        skip: set[int] = set()
        usable: dict[int, object] = {}
        for hid, op in hand.items():
            usable[hid] = op
            skip |= op.interior
        return self._execute_basic(roots, bindings, skip=skip, hand=usable)

    def _execute_plan(self, plan: CompiledPlan, bindings):
        order = {h.hid: i for i, h in enumerate(postorder(plan.roots))}
        env: dict[int, object] = {}
        for h in postorder(plan.roots):
            if h.op == "leaf":
                env[h.hid] = bindings[h.name]
            elif h.op == "lit":
                env[h.hid] = float(h.value)
        specs = sorted(plan.specs, key=lambda s: order.get(s.root.hid, 1 << 30))
        inters: list[RowBlockMatrix] = []
        for spec in specs:
            spoof = plan.spoofs.get(spec.root.hid)
            if spoof is not None and spec.template is not None:
                ins = {h: env[h] for h in spec.input_hids}
                if any(is_dist(v) for v in ins.values()):
                    if isinstance(
                        ins.get(spoof.cplan.main_hid), RowBlockMatrix
                    ) and not any(
                        isinstance(v, TransposedRBM) for v in ins.values()
                    ):
                        out = execute_dist(self.spark, spoof, ins)
                    else:
                        # fused op whose main binding is local but a side is
                        # distributed: fall back to basic ops over the
                        # covered subgraph (correctness over fusion)
                        for hh in postorder([spec.root] + spec.magg_roots):
                            if hh.hid not in env:
                                env[hh.hid] = eval_hop_hybrid(
                                    self.spark, hh, env, bindings
                                )
                        continue
                else:
                    out = spoof.execute([ins[h] for h in spec.input_hids])
                if spec.magg_roots:
                    env[spec.root.hid] = out[0]
                    for r, v in zip(spec.magg_roots, out[1:]):
                        env[r.hid] = v
                else:
                    env[spec.root.hid] = out
            else:
                env[spec.root.hid] = eval_hop_hybrid(
                    self.spark, spec.root, env, bindings
                )
            v = env[spec.root.hid]
            if isinstance(v, RowBlockMatrix) and spec.root not in plan.roots:
                inters.append(v)
        out = [env[r.hid] for r in plan.roots]
        for rb in inters:
            if not any(rb is o for o in out):
                rb.unpersist()
        return out
