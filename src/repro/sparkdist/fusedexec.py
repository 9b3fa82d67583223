"""Distributed execution of generated fused operators (paper §2.2, §5.5).

A ``SpoofOp`` is broadcast to executors as *source + metadata* (its
compiled function is stripped on pickling); each executor process
compiles it once on first use — the ship-class-and-JIT runtime
integration. Execution is one ``mapInPandas`` pass over the main
input's row blocks:

* distributed row-aligned side inputs are joined on ``bid``;
* local side inputs are broadcast and sliced per block — every broadcast
  is a real, measurable cost (the Gen-FA distributed slowdown story);
* no_agg/row_agg variants yield a new distributed matrix; col/full
  aggregates combine per-partition partials on the driver.
"""
from __future__ import annotations

import pickle

import numpy as np

from repro.core.runtime import SpoofOp
from repro.lina.sparse import CSR
from repro.sparkdist.blocked import BLOCK_SCHEMA, RowBlockMatrix

_COMBINE = {"sum": np.add, "max": np.maximum, "min": np.minimum}


def _is_row_aligned(v, n: int, hid: int, whole_sides) -> bool:
    return (
        isinstance(v, (np.ndarray, CSR))
        and v.shape[0] == n
        and n > 1
        and hid not in whole_sides
    )


def execute_dist(spark, spoof: SpoofOp, values: dict[int, object]):
    """Execute a fused operator whose main input is distributed."""
    cp = spoof.cplan
    if cp.template == "O":
        raise NotImplementedError(
            "distributed Outer execution is out of scope (Table 6 has no "
            "ALS workload); the cost model prevents such plans"
        )
    main = values[cp.main_hid]
    assert isinstance(main, RowBlockMatrix), "main input must be distributed"
    n, bs = main.nrows, main.block_rows

    dist_hids = [
        h for h in cp.side_hids if isinstance(values[h], RowBlockMatrix)
    ]
    local_vals = {
        h: values[h] for h in cp.side_hids if h not in dist_hids
    }
    bc_op = spark.sparkContext.broadcast(spoof)
    bc_sides = spark.sparkContext.broadcast(local_vals)

    df = main.df
    names = []
    for i, h in enumerate(dist_hids):
        nm = f"side_{i}"
        names.append(nm)
        df = df.join(values[h].df.withColumnRenamed("block", nm), "bid")

    variant, agg_fn = cp.variant, cp.agg_fn or "sum"
    n_out = cp.n_outputs
    input_hids = list(spoof.input_hids)
    main_hid = cp.main_hid
    dist_pos = {h: nm for h, nm in zip(dist_hids, names)}

    whole_sides = cp.meta.get("whole_sides", set())

    def block_exec(row) -> object:
        op = bc_op.value
        sides = bc_sides.value
        bid = int(row["bid"])
        lo = bid * bs
        blk = pickle.loads(bytes(row["block"]))
        rows_b = blk.shape[0]
        vals: dict[int, object] = {main_hid: blk}
        for h, nm in dist_pos.items():
            vals[h] = pickle.loads(bytes(row[nm]))
        for h, v in sides.items():
            if _is_row_aligned(v, n, h, whole_sides):
                v = (
                    v.row_slice(lo, lo + rows_b)
                    if isinstance(v, CSR)
                    else v[lo : lo + rows_b]
                )
            vals[h] = v
        return op.execute([vals[h] for h in input_hids])

    if variant in ("no_agg", "row_agg"):
        out_cols = 1 if variant == "row_agg" else cp.root.ncols

        def gen(it):
            import pandas as pd

            for pdf in it:
                out_bid, out_blk = [], []
                for _, row in pdf.iterrows():
                    r = block_exec(row)
                    if isinstance(r, CSR):
                        pass
                    else:
                        r = np.atleast_2d(np.asarray(r))
                    out_bid.append(row["bid"])
                    out_blk.append(pickle.dumps(r))
                yield pd.DataFrame({"bid": out_bid, "block": out_blk})

        out_df = df.mapInPandas(gen, schema=BLOCK_SCHEMA)
        return RowBlockMatrix(out_df, n, out_cols, bs).materialize()

    # aggregate variants: partial per partition, combined on the driver
    fns = [agg_fn] + cp.magg_agg_fns if cp.magg_roots else [agg_fn]

    def combine(a, b):
        if n_out > 1:
            return tuple(_COMBINE[f](x, y) for f, x, y in zip(fns, a, b))
        return _COMBINE[fns[0]](a, b)

    def gen_agg(it):
        import pandas as pd

        for pdf in it:
            acc = None
            for _, row in pdf.iterrows():
                r = block_exec(row)
                acc = r if acc is None else combine(acc, r)
            if acc is not None:
                yield pd.DataFrame({"part": [pickle.dumps(acc)]})

    parts = df.mapInPandas(gen_agg, schema="part BINARY").collect()
    acc = None
    for r in parts:
        p = pickle.loads(bytes(r["part"]))
        acc = p if acc is None else combine(acc, p)
    if n_out > 1:
        return list(acc)
    if variant == "full_agg":
        return float(acc)
    return np.asarray(acc)
