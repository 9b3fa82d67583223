"""Codegen statistics counters (feed Table 3 and the plan-cache story)."""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class CodegenStats:
    n_dags: int = 0          # optimized HOP DAGs (compile_dag calls)
    n_cplans: int = 0        # constructed CPlans
    n_compiled: int = 0      # compiled operator classes (plan-cache misses)
    cache_hits: int = 0
    codegen_ms: float = 0.0  # total code generation time (explore+select+cplan)
    compile_ms: float = 0.0  # operator compilation time only
    plans_evaluated: int = 0
    plans_skipped: int = 0
    search_space: int = 0
    extra: dict = field(default_factory=dict)

    def row(self) -> dict:
        return {
            "dags": self.n_dags,
            "cplans": self.n_cplans,
            "compiled": self.n_compiled,
            "cache_hits": self.cache_hits,
            "codegen_ms": round(self.codegen_ms, 1),
            "compile_ms": round(self.compile_ms, 1),
            "plans_evaluated": self.plans_evaluated,
            "plans_skipped": self.plans_skipped,
        }
