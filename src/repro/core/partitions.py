"""Plan partitions and interesting materialization points (paper §4.2).

A *partition* is a connected component of the maximal DAG of fusion
references; partitions are optimized and costed independently.
*Interesting points* define the per-partition search space: boolean
materialization decisions on data dependencies, of two kinds —
materialization-point consumers and template switches.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.hop import Hop, consumers
from repro.core.memo import MemoTable


@dataclass(frozen=True)
class InterestingPoint:
    """A boolean fusion decision on the data dependency consumer→target.
    ``True`` = materialize: every memo entry of the consumer that
    references the target becomes invalid."""

    consumer: int  # hop id g_i
    target: int  # hop id g_j
    kind: str  # 'mat' | 'switch'

    def __repr__(self) -> str:
        return f"({self.consumer}->{self.target}:{self.kind[0]})"


@dataclass
class Partition:
    nodes: set[int] = field(default_factory=set)
    roots: set[int] = field(default_factory=set)  # outputs of the partition
    inputs: set[int] = field(default_factory=set)  # read by partition nodes
    mat_points: set[int] = field(default_factory=set)  # multi-consumer nodes
    points: list[InterestingPoint] = field(default_factory=list)


def _ref_edges(memo: MemoTable) -> set[tuple[int, int]]:
    """(consumer, target) pairs connected by at least one fusion reference."""
    edges = set()
    for hid, group in memo.groups.items():
        for e in group:
            for r in e.refs:
                if r >= 0:
                    edges.add((hid, r))
    return edges


def analyze_partitions(memo: MemoTable, dag_roots: list[Hop]) -> list[Partition]:
    """Split the set of partial fusion plans into independent partitions
    and collect per-partition roots, inputs, and interesting points."""
    edges = _ref_edges(memo)
    nodes = set(memo.groups.keys())
    # union-find over fusion references
    parent = {n: n for n in nodes}

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in edges:
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[ra] = rb

    comps: dict[int, Partition] = {}
    for n in nodes:
        comps.setdefault(find(n), Partition()).nodes.add(n)

    cons = consumers(dag_roots)
    for part in comps.values():
        referenced_here = {
            t for c, t in edges if c in part.nodes and t in part.nodes
        }
        # roots: nodes never referenced from v in P_i (paper §4.2)
        part.roots = part.nodes - referenced_here
        for n in part.nodes:
            h = memo.hops[n]
            for inp in h.inputs:
                if inp.hid not in part.nodes and inp.op not in ("lit",):
                    part.inputs.add(inp.hid)
            # materialization points: multiple consumers, not a root
            if len(cons.get(n, [])) > 1 and n in referenced_here:
                part.mat_points.add(n)
        # interesting points
        seen: set[InterestingPoint] = set()
        for c, t in sorted(edges):
            if c not in part.nodes or t not in part.nodes:
                continue
            if t in part.mat_points:
                p = InterestingPoint(c, t, "mat")
            else:
                # template switch: consumer lacks some type the target has
                t_types = memo.distinct_types(t)
                c_types = memo.distinct_types(c)
                if not (t_types - c_types):
                    continue
                p = InterestingPoint(c, t, "switch")
            if p not in seen:
                seen.add(p)
                part.points.append(p)
    return list(comps.values())


def invalid_edges(points: list[InterestingPoint], q: list[bool]) -> set[tuple[int, int]]:
    """Materialized (cut) dependencies for an assignment q."""
    return {(p.consumer, p.target) for p, b in zip(points, q) if b}


# ---------------------------------------------------------------- reachability
def reachability(memo: MemoTable, part: Partition) -> dict[int, set[int]]:
    """target-hid -> set of partition nodes reachable downstream via fusion
    reference edges (transitive closure, small graphs)."""
    edges = _ref_edges(memo)
    down: dict[int, set[int]] = {n: set() for n in part.nodes}
    # consumer -> target edges point upstream; invert: target reaches consumer
    adj: dict[int, set[int]] = {n: set() for n in part.nodes}
    for c, t in edges:
        if c in part.nodes and t in part.nodes:
            adj[t].add(c)

    def dfs(n: int, acc: set[int]) -> None:
        for m in adj[n]:
            if m not in acc:
                acc.add(m)
                dfs(m, acc)

    for n in part.nodes:
        dfs(n, down[n])
    return down


@dataclass
class CutSet:
    """A candidate structural cut: a set of interesting-point indices whose
    joint materialization splits the remaining points into independent
    sub-problems S1 (upstream) and S2 (downstream)."""

    point_idx: tuple[int, ...]
    s1_idx: tuple[int, ...]
    s2_idx: tuple[int, ...]
    score: float


def find_cut_sets(memo: MemoTable, part: Partition) -> list[CutSet]:
    """Enumerate valid cut sets (composite points of equivalent targets),
    scored by Eq. (5); ascending score = better."""
    pts = part.points
    if len(pts) < 3:
        return []
    down = reachability(memo, part)
    # composite candidates: group point indices by target
    by_target: dict[int, list[int]] = {}
    for i, p in enumerate(pts):
        by_target.setdefault(p.target, []).append(i)
    m = len(pts)
    out: list[CutSet] = []
    for target, idxs in by_target.items():
        rest = [i for i in range(m) if i not in idxs]
        if not rest:
            continue
        reach_t = down[target]  # nodes downstream of the cut target
        s1, s2, parallel = [], [], []
        for i in rest:
            pt = pts[i]
            if pt.target in reach_t or pt.consumer in reach_t:
                s2.append(i)  # downstream of the cut
            elif target in down.get(pt.target, set()):
                s1.append(i)  # upstream: cut reachable from it
            else:
                parallel.append(i)
        if parallel or not s1 or not s2:
            continue  # not a clean separator
        cs = len(idxs)
        score = (2**cs - 1) / 2**cs * 2**m + (2**len(s1) + 2**len(s2)) / 2**cs
        out.append(CutSet(tuple(idxs), tuple(s1), tuple(s2), score))
    out.sort(key=lambda c: c.score)
    return out
