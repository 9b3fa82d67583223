"""End-to-end codegen pipeline (paper §2.1's five compilation steps):

1. candidate exploration  → memo table         (``explore``)
2. candidate selection    → materialization cut (``select_plans``)
3. CPlan construction     → per-operator CPlans (``build_cplan``)
4. code generation + compile, with plan cache  (``compile_spoof``)
5. plan execution — fused operators replace the covered DAG parts
   (we execute the operator list directly instead of rewriting the DAG;
   semantically identical and simpler to instrument).

``CodegenContext`` carries the plan cache and statistics across DAGs —
one context per "script run", which is what Table 3's per-algorithm
compile statistics aggregate over.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from repro.core import executor as ex
from repro.core.codegen import PlanCache
from repro.core.cost import CostModel, OpSpec
from repro.core.cplan import build_cplan
from repro.core.explore import explore
from repro.core.hop import Hop, postorder
from repro.core.runtime import SpoofOp, compile_spoof
from repro.core.select import SelectionResult, select_plans
from repro.core.stats import CodegenStats


@dataclass
class CodegenContext:
    plan_cache: PlanCache = field(default_factory=PlanCache)
    stats: CodegenStats = field(default_factory=CodegenStats)
    cost_model: CostModel = field(default_factory=CostModel)


@dataclass
class CompiledPlan:
    roots: list[Hop]
    specs: list[OpSpec]
    spoofs: dict[int, SpoofOp]  # root hid -> compiled fused operator
    selection: SelectionResult | None = None

    @property
    def n_fused(self) -> int:
        return len(self.spoofs)


def compile_dag(
    roots: list[Hop],
    policy: str = "cost",
    ctx: CodegenContext | None = None,
) -> CompiledPlan:
    """Run exploration, selection, CPlan construction and code generation
    for one HOP DAG under the given selection policy."""
    ctx = ctx or CodegenContext()
    t0 = time.perf_counter()
    memo = explore(roots, prune_dominated=(policy != "cost"))
    sel = select_plans(memo, roots, policy=policy, cm=ctx.cost_model)
    spoofs: dict[int, SpoofOp] = {}
    final_specs: list[OpSpec] = []
    pre_compile_ms = ctx.plan_cache.stats.compile_ms
    pre_hits = ctx.plan_cache.stats.hits
    pre_miss = ctx.plan_cache.stats.misses
    for spec in sel.specs:
        if spec.template is None or spec.n_covered <= 1:
            final_specs.append(spec)
            continue
        try:
            cplan = build_cplan(spec)
            ctx.stats.n_cplans += 1
            spoofs[spec.root.hid] = compile_spoof(
                cplan, list(spec.input_hids), ctx.plan_cache
            )
            final_specs.append(spec)
        except (ValueError, KeyError):
            # defensive fallback: execute the covered part as basic ops
            final_specs.extend(_basic_specs(spec))
    dt = (time.perf_counter() - t0) * 1e3
    ctx.stats.n_dags += 1
    ctx.stats.codegen_ms += dt
    ctx.stats.compile_ms += ctx.plan_cache.stats.compile_ms - pre_compile_ms
    ctx.stats.cache_hits += ctx.plan_cache.stats.hits - pre_hits
    ctx.stats.n_compiled += ctx.plan_cache.stats.misses - pre_miss
    ctx.stats.plans_evaluated += sel.enum_stats.evaluated
    ctx.stats.plans_skipped += sel.enum_stats.skipped
    ctx.stats.search_space += sel.enum_stats.total_space
    return CompiledPlan(roots=roots, specs=final_specs, spoofs=spoofs, selection=sel)


def _basic_specs(spec: OpSpec) -> list[OpSpec]:
    """Decompose a failed fused spec into per-hop basic operators."""
    out = []
    for h in spec.covered.values():
        inputs = []
        for i in h.inputs:
            if i.op != "lit" and all(x.hid != i.hid for x in inputs):
                inputs.append(i)
        out.append(
            OpSpec(
                root=h,
                template=None,
                covered={h.hid: h},
                entries={},
                input_hids=[i.hid for i in inputs],
                input_hops={i.hid: i for i in inputs},
            )
        )
    return out


def execute_plan(plan: CompiledPlan, bindings: dict) -> list:
    """Execute the compiled operator list; returns one value per DAG root."""
    order = {h.hid: i for i, h in enumerate(postorder(plan.roots))}
    env: dict[int, object] = {}
    for h in postorder(plan.roots):
        if h.op == "leaf":
            if h.name not in bindings:
                raise KeyError(f"unbound leaf {h.name!r}")
            env[h.hid] = bindings[h.name]
        elif h.op == "lit":
            env[h.hid] = float(h.value)
    needed = {h.hid for h in postorder(plan.roots)}
    specs = sorted(
        (s for s in plan.specs if s.root.hid in needed or True),
        key=lambda s: order.get(s.root.hid, 1 << 30),
    )
    for spec in specs:
        spoof = plan.spoofs.get(spec.root.hid)
        if spoof is not None and spec.template is not None:
            ins = [env[h] for h in spec.input_hids]
            out = spoof.execute(ins)
            if spec.magg_roots:
                env[spec.root.hid] = out[0]
                for r, v in zip(spec.magg_roots, out[1:]):
                    env[r.hid] = v
            else:
                env[spec.root.hid] = out
        else:
            env[spec.root.hid] = ex.eval_hop(spec.root, env, bindings)
    return [env[r.hid] for r in plan.roots]


def compile_and_execute(
    roots: list[Hop],
    bindings: dict,
    policy: str = "cost",
    ctx: CodegenContext | None = None,
) -> list:
    return execute_plan(compile_dag(roots, policy, ctx), bindings)
