"""Code-generation plans (CPlans): backend-independent fused-operator
descriptions constructed from selected plans (paper §2.2).

A CPlan fixes the template type and variant (Table 1), the data binding
(main input, side inputs, scalars), and the DAG of basic operations
(covered hops in topological order) from which ``codegen`` renders the
``genexec`` source.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.cost import SPARSE_SAFE_CELL, OpSpec
from repro.core.hop import Hop
from repro.core.templates import CONFIG

FULL_AGG_FN = {"ua(+)": "sum", "ua(max)": "max", "ua(min)": "min"}
ROW_AGG_FN = {
    "ua(R+)": "row_sums",
    "ua(Rmax)": "row_maxs",
    "ua(Rmin)": "row_mins",
    "ua(Rimin)": "row_imins",
    "ua(Rimax)": "row_imaxs",
}


@dataclass
class CPlan:
    template: str                 # 'C' | 'R' | 'M' | 'O'
    variant: str                  # no_agg/row_agg/col_agg/full_agg/col_agg_t/right_mm
    root: Hop
    order: list[Hop]              # covered hops, topological (inputs first)
    main_hid: int                 # -1 when no main binding applies
    side_hids: list[int]          # remaining inputs, stable order
    input_hops: dict[int, Hop]
    sparse_safe: bool
    agg_fn: str | None            # 'sum'/'max'/'min' for (multi-)aggregates
    magg_roots: list[Hop] = field(default_factory=list)
    magg_agg_fns: list[str] = field(default_factory=list)
    meta: dict = field(default_factory=dict)

    @property
    def n_outputs(self) -> int:
        return 1 + len(self.magg_roots)


def _topo_covered(spec: OpSpec) -> list[Hop]:
    """Topological order over covered hops (inputs before consumers)."""
    order: list[Hop] = []
    seen: set[int] = set()

    def visit(h: Hop) -> None:
        if h.hid in seen or h.hid not in spec.covered:
            return
        seen.add(h.hid)
        for i in h.inputs:
            visit(i)
        order.append(h)

    for r in [spec.root] + spec.magg_roots:
        visit(r)
    return order


def _sparse_safe_chain(spec: OpSpec, skip_roots: bool) -> bool:
    """True when every covered non-aggregate op is sparse-safe, so the
    skeleton may iterate non-zero values only."""
    for h in spec.covered.values():
        if h.op.startswith("ua("):
            if h.op != "ua(+)":
                return False
            continue
        if h.op not in SPARSE_SAFE_CELL:
            return False
    return True


def _opening_outer_mm(spec: OpSpec) -> Hop | None:
    for h in spec.covered.values():
        if h.op != "ba(+*)":
            continue
        lhs, rhs = h.inputs
        if (
            lhs.hid not in spec.covered
            and rhs.hid not in spec.covered
            and lhs.ncols <= CONFIG.outer_rank_max
        ):
            return h
    return None


def build_cplan(spec: OpSpec) -> CPlan:
    """Construct the CPlan (template variant + bindings + op order) for a
    selected fused-operator spec."""
    assert spec.template is not None
    order = _topo_covered(spec)
    root = spec.root
    t = spec.template

    variant, agg_fn = "no_agg", None
    main_hid = -1
    meta: dict = {}

    if t in ("C", "M"):
        if root.op in FULL_AGG_FN:
            variant, agg_fn = "full_agg", FULL_AGG_FN[root.op]
        elif root.op == "ua(R+)":
            variant, agg_fn = "row_agg", "sum"
        elif root.op == "ua(C+)":
            variant, agg_fn = "col_agg", "sum"
        # main: sparse driver if present, else largest matrix input
        mats = [h for h in spec.input_hops.values() if h.is_matrix or h.is_vector]
        sparse = [h for h in mats if h.sparsity <= CONFIG.sparse_threshold and h.is_matrix]
        if sparse and _sparse_safe_chain(spec, True):
            main_hid = min(sparse, key=lambda h: h.sparsity).hid
        elif mats:
            main_hid = max(mats, key=lambda h: h.memory_bytes()).hid

    elif t == "R":
        tx_child = None
        if root.op == "ba(+*)" and root.inputs[0].hid in spec.covered and root.inputs[0].op == "t":
            variant = "col_agg_t"
            tx_child = root.inputs[0].inputs[0]
        elif root.op == "ua(C+)":
            variant, agg_fn = "col_agg", "sum"
        elif root.op in FULL_AGG_FN:
            variant, agg_fn = "full_agg", FULL_AGG_FN[root.op]
        elif root.op in ROW_AGG_FN:
            variant = "row_agg"
        elif root.op == "t":
            meta["root_is_t"] = True  # chain computed row-wise, transposed at the end
        # the row dimension N the template binds to
        if tx_child is not None:
            n = tx_child.nrows
        else:
            cand = [
                h
                for h in spec.covered.values()
                if not h.op.startswith("ua(") and h.op != "t"
            ]
            n = max((h.nrows for h in cand), default=root.nrows)
        # semantic side classification: an input consumed exclusively as a
        # matmult right-hand side is a *whole* side (SystemML's B1 sides),
        # even if its row count coincides with the template's row
        # dimension (square-matrix aliasing); only cell-wise-consumed
        # inputs are row-aligned.
        whole: set[int] = set()

        def _is_whole_rhs(c: Hop, hid_in: int) -> bool:
            # mm rhs is a whole (B1) side — EXCEPT in the tmm_acc pattern
            # t(A) %*% B over a row-aligned A, where B is row-sliced too
            if c.op != "ba(+*)" or c.inputs[1].hid != hid_in:
                return False
            lhs = c.inputs[0]
            tmm = (
                lhs.op == "t"
                and lhs.hid in spec.covered
                and lhs.inputs[0].nrows == n
            )
            return not tmm

        for hid_in, hop_in in spec.input_hops.items():
            cons = [
                c
                for c in spec.covered.values()
                if any(i.hid == hid_in for i in c.inputs)
            ]
            whole_rhs = [c for c in cons if _is_whole_rhs(c, hid_in)]
            if (whole_rhs and len(whole_rhs) == len(cons)) or hop_in.nrows != n:
                whole.add(hid_in)
            elif whole_rhs:
                raise ValueError(
                    "side input consumed both row-aligned and as mm rhs"
                )
        aligned = [
            h
            for h in spec.input_hops.values()
            if h.nrows == n and not h.is_scalar and h.hid not in whole
        ]
        if aligned:
            main_hid = max(aligned, key=lambda h: h.memory_bytes()).hid
        meta["row_n"] = n
        meta["whole_sides"] = whole - {main_hid}
        # correctness gate: a covered transpose of a row-aligned chain is
        # only executable as the tmm_acc pattern (blockwise transpose of
        # an aligned operand is not block-decomposable otherwise)
        for h in spec.covered.values():
            if h.op != "t" or h.inputs[0].nrows != n or n <= 1:
                continue
            consumers_in = [
                c for c in spec.covered.values() if any(i is h for i in c.inputs)
            ]
            ok = all(
                c.op == "ba(+*)" and c.inputs[0] is h for c in consumers_in
            ) and (consumers_in or h is root)
            if not (ok or h is root):
                raise ValueError("row-aligned transpose outside tmm_acc pattern")

    elif t == "O":
        mm = _opening_outer_mm(spec)
        if mm is None:
            raise ValueError("Outer CPlan without opening outer-product mm")
        meta["outer_mm_hid"] = mm.hid
        meta["u_hid"] = mm.inputs[0].hid
        meta["vt_hid"] = mm.inputs[1].hid  # holds Vᵀ (r×m); runtime transposes
        # sparse driver = sparsest matrix input of covered multiply ops
        drivers = [
            i
            for h in spec.covered.values()
            if h.op in ("b(*)", "b(!=)")
            for i in h.inputs
            if i.is_matrix and i.sparsity <= CONFIG.sparse_threshold
            and i.hid in spec.input_hops
        ]
        if not drivers:
            raise ValueError("Outer CPlan without sparse driver input")
        main_hid = min(drivers, key=lambda h: h.sparsity).hid
        # correctness gate: the skeleton iterates non-zeros of the driver,
        # so non-sparse-safe binaries must only see scalars, the driver
        # itself, or other covered (nnz-evaluated) chains
        for h in spec.covered.values():
            if h.op in ("b(+)", "b(-)", "b(min)", "b(max)"):
                for o in h.inputs:
                    if not (
                        o.is_scalar
                        or o.hid == main_hid
                        or o.hid in spec.covered
                    ):
                        raise ValueError(
                            f"unsafe operand {o} under Outer nnz-iteration"
                        )
        if root.op == "ba(+*)":
            variant = "right_mm"
            meta["right_hid"] = root.inputs[1].hid
        elif root.op in FULL_AGG_FN:
            variant, agg_fn = "full_agg", FULL_AGG_FN[root.op]

    side_hids = [h for h in spec.input_hids if h != main_hid]
    sparse_safe = (
        t in ("C", "M")
        and _sparse_safe_chain(spec, True)
        and variant in ("full_agg", "no_agg", "row_agg")
        and agg_fn in (None, "sum")
    ) or t == "O"

    magg_fns = []
    for r in spec.magg_roots:
        magg_fns.append(FULL_AGG_FN.get(r.op, "sum"))

    return CPlan(
        template=t,
        variant=variant,
        root=root,
        order=order,
        main_hid=main_hid,
        side_hids=side_hids,
        input_hops=dict(spec.input_hops),
        sparse_safe=sparse_safe,
        agg_fn=agg_fn,
        magg_roots=list(spec.magg_roots),
        magg_agg_fns=magg_fns,
        meta=meta,
    )
