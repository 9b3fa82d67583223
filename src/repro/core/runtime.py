"""Template skeletons and the SpoofOp runtime operator (paper §2.2, Fig. 4).

Design decision carried over from the paper: data access is *not*
generated. Hand-coded skeletons own the dense / sparse / compressed
access paths, cache blocking, and aggregation variants; generated
operators only provide ``genexec``. Here:

* dense inputs are processed in row blocks sized to stay cache-resident
  (the JVM skeletons' cache blocking);
* sparse-safe operators iterate the non-zero values of the sparse main
  input only, with side inputs gathered via ``CSR.gather``/fancy
  indexing (the ``getValue`` abstraction);
* compressed (CLA) main inputs of single-input sparse-safe aggregates
  execute ``genexec`` per distinct dictionary value ×count (Fig. 9);
* a ``SpoofOp`` pickles its *source*, not its compiled function —
  executors recompile on first use (ship-class-and-JIT, per-process
  operator cache), which is what the distributed backend relies on.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.codegen import PlanCache, compile_source, render_source
from repro.core.cplan import CPlan
from repro.lina.compressed import CLAMatrix
from repro.lina.sparse import CSR

BLOCK_BYTES = 2 << 20  # ~2 MB dense row blocks (L2-resident working set)

_AGG_COMBINE = {"sum": np.add, "max": np.maximum, "min": np.minimum}


def _rows_per_block(ncols: int) -> int:
    return max(1, BLOCK_BYTES // (8 * max(1, ncols)))


def _as_value(x):
    """Normalize scalars: 1x1 arrays -> float."""
    if isinstance(x, np.ndarray) and x.size == 1:
        return float(x.reshape(-1)[0])
    return x


def _to_dense(x):
    if isinstance(x, CSR):
        return x.to_dense()
    if isinstance(x, CLAMatrix):
        return x.decompress()
    return x


def _slice_side(s, lo: int, hi: int, n: int):
    """Row-align a side input for a dense block [lo, hi)."""
    if isinstance(s, (float, int)):
        return s
    if isinstance(s, CSR):
        return s.row_slice(lo, hi) if s.shape[0] == n else s
    if isinstance(s, CLAMatrix):
        s = s.decompress()
    if isinstance(s, np.ndarray) and s.ndim == 2 and s.shape[0] == n:
        return s[lo:hi]
    return s


def _gather_side(s, rixv, cixv, n: int, m: int):
    """Align a side input to the non-zero cells of the sparse main input."""
    if isinstance(s, (float, int)):
        return s
    if isinstance(s, CSR):
        if s.shape == (n, m):
            return s.gather(rixv, cixv)
        s = s.to_dense()
    if isinstance(s, CLAMatrix):
        s = s.decompress()
    if s.shape == (n, m):
        return s[rixv, cixv]
    if s.shape == (n, 1):
        return s[rixv, 0]
    if s.shape == (1, m):
        return s[0, cixv]
    if s.shape == (1, 1):
        return float(s[0, 0])
    raise ValueError(f"side shape {s.shape} not alignable to ({n},{m})")


@dataclass
class SpoofOp:
    """A compiled fused operator: CPlan + generated source + genexec."""

    cplan: CPlan
    src: str
    input_hids: list[int]
    _fn: object | None = field(default=None, repr=False)

    # -- pickling ships the source; executors recompile on first use ------
    def __getstate__(self):
        d = dict(self.__dict__)
        d["_fn"] = None
        return d

    @property
    def fn(self):
        if self._fn is None:
            self._fn = compile_source(self.src)
        return self._fn

    def execute(self, input_values: list):
        """Run the skeleton for this operator's template over positional
        input values (aligned with ``input_hids``)."""
        vals = {hid: _as_value(v) for hid, v in zip(self.input_hids, input_values)}
        t = self.cplan.template
        if t in ("C", "M"):
            return _exec_cellwise(self, vals)
        if t == "R":
            return _exec_rowwise(self, vals)
        if t == "O":
            return _exec_outer(self, vals)
        raise ValueError(t)


def compile_spoof(cplan: CPlan, input_hids: list[int], cache: PlanCache) -> SpoofOp:
    src = render_source(cplan)
    fn = cache.get_or_compile(src)
    op = SpoofOp(cplan=cplan, src=src, input_hids=input_hids)
    op._fn = fn
    return op


# --------------------------------------------------------------- Cell/MAgg
def _exec_cellwise(op: SpoofOp, vals: dict):
    cp = op.cplan
    main = vals[cp.main_hid]
    sides = [vals[h] for h in cp.side_hids]
    n_out = cp.n_outputs

    # ---- compressed fast path: single input, sparse-safe aggregate ------
    if (
        isinstance(main, CLAMatrix)
        and cp.sparse_safe
        and not sides
        and cp.variant in ("full_agg", "col_agg")
    ):
        outs = []
        for k in range(n_out):
            f = lambda d, k=k: _nth(op.fn(d, []), k, n_out)
            if cp.variant == "full_agg":
                outs.append(main.agg_cellwise_distinct(f))
            else:
                outs.append(main.col_agg_cellwise_distinct(f).reshape(1, -1))
        return outs[0] if n_out == 1 else outs
    if isinstance(main, CLAMatrix):
        main = main.decompress()

    # ---- sparse-safe path: iterate non-zeros of the sparse main ---------
    if isinstance(main, CSR) and cp.sparse_safe:
        n, m = main.shape
        rixv, cixv = main.row_index(), main.indices
        b = [_gather_side(s, rixv, cixv, n, m) for s in sides]
        res = op.fn(main.values, b)
        results = res if n_out > 1 else (res,)
        outs = []
        for w in results:
            if cp.variant == "full_agg":
                outs.append(float(np.sum(w)))
            elif cp.variant == "row_agg":
                acc = np.zeros(n)
                np.add.at(acc, rixv, w)
                outs.append(acc.reshape(-1, 1))
            else:  # no_agg keeps the sparse pattern
                outs.append(CSR(main.indptr, main.indices, np.asarray(w, dtype=np.float64), main.shape))
        return outs[0] if n_out == 1 else outs
    if isinstance(main, CSR):
        main = main.to_dense()

    # ---- dense path with cache-blocked row iteration --------------------
    n, m = main.shape
    bs = _rows_per_block(m)
    accs: list = [None] * n_out
    parts: list[list] = [[] for _ in range(n_out)]
    agg_fns = [cp.agg_fn] + cp.magg_agg_fns if cp.agg_fn else [None] * n_out
    for lo in range(0, n, bs):
        hi = min(n, lo + bs)
        b = [_slice_side(s, lo, hi, n) for s in sides]
        res = op.fn(main[lo:hi], b)
        results = res if n_out > 1 else (res,)
        for k, w in enumerate(results):
            if cp.variant == "full_agg":
                v = {"sum": np.sum, "max": np.max, "min": np.min}[agg_fns[k] or "sum"](w)
                accs[k] = v if accs[k] is None else _AGG_COMBINE[agg_fns[k] or "sum"](accs[k], v)
            elif cp.variant == "row_agg":
                parts[k].append(np.sum(w, axis=1).reshape(-1, 1))
            elif cp.variant == "col_agg":
                v = np.sum(w, axis=0, keepdims=True)
                accs[k] = v if accs[k] is None else accs[k] + v
            else:
                parts[k].append(np.asarray(w))
    outs = []
    for k in range(n_out):
        if cp.variant in ("full_agg", "col_agg"):
            outs.append(float(accs[k]) if cp.variant == "full_agg" else accs[k])
        else:
            outs.append(np.vstack(parts[k]))
    return outs[0] if n_out == 1 else outs


def _nth(res, k: int, n_out: int):
    return res[k] if n_out > 1 else res


# ------------------------------------------------------------------- Row
def _exec_rowwise(op: SpoofOp, vals: dict):
    cp = op.cplan
    sides = [vals[h] for h in cp.side_hids]
    whole = cp.meta.get("whole", False) or cp.main_hid < 0
    if whole:
        b = [_to_dense(s) if isinstance(s, (CSR, CLAMatrix)) else s for s in sides]
        a = vals[cp.main_hid] if cp.main_hid >= 0 else None
        out = op.fn(_to_dense(a) if not isinstance(a, CSR) else a, b)
        return _finalize_row(cp, out)
    main = vals[cp.main_hid]
    if isinstance(main, CLAMatrix):
        main = main.decompress()
    n = main.shape[0]
    m = main.shape[1]
    bs = _rows_per_block(m)
    whole_sides = cp.meta.get("whole_sides", set())
    acc = None
    parts: list = []
    for lo in range(0, n, bs):
        hi = min(n, lo + bs)
        a = main.row_slice(lo, hi) if isinstance(main, CSR) else main[lo:hi]
        b = [
            s if hid in whole_sides else _slice_side(s, lo, hi, n)
            for hid, s in zip(cp.side_hids, sides)
        ]
        w = op.fn(a, b)
        if isinstance(w, CSR):
            w = w.to_dense()
        if cp.variant in ("col_agg", "col_agg_t"):
            acc = w if acc is None else acc + w
        elif cp.variant == "full_agg":
            fn = _AGG_COMBINE[cp.agg_fn or "sum"]
            acc = w if acc is None else fn(acc, w)
        else:
            parts.append(np.asarray(w))
    out = acc if acc is not None else np.vstack(parts)
    return _finalize_row(cp, out)


def _finalize_row(cp: CPlan, out):
    if cp.variant == "full_agg":
        return float(out)
    if cp.meta.get("root_is_t"):
        return np.ascontiguousarray(np.asarray(out).T)
    if isinstance(out, CSR):
        return out
    out = np.asarray(out)
    return out if out.ndim == 2 else out.reshape(1, -1)


# ----------------------------------------------------------------- Outer
def _exec_outer(op: SpoofOp, vals: dict):
    cp = op.cplan
    main = vals[cp.main_hid]
    if not isinstance(main, CSR):
        main = CSR.from_dense(_to_dense(main))
    n, m = main.shape
    rixv, cixv = main.row_index(), main.indices
    u = _to_dense(vals[cp.meta["u_hid"]])
    vt = _to_dense(vals[cp.meta["vt_hid"]])
    vmat = np.ascontiguousarray(vt.T)  # rows of V
    special = {cp.meta["u_hid"], cp.meta["vt_hid"], cp.meta.get("right_hid")}
    gather_hids = [h for h in cp.side_hids if h not in special]
    b = [_gather_side(_as_value(vals[h]), rixv, cixv, n, m) for h in gather_hids]
    w = op.fn(main.values, u[rixv], vmat[cixv], b)
    if cp.variant == "right_mm":
        rmat = _to_dense(vals[cp.meta["right_hid"]])
        k = rmat.shape[1]
        out = np.zeros((n, k), dtype=np.float64)
        np.add.at(out, rixv, np.asarray(w)[:, None] * rmat[cixv])
        return out
    if cp.variant == "full_agg":
        return float(np.sum(w))
    return CSR(main.indptr, main.indices, np.asarray(w, dtype=np.float64), main.shape)
