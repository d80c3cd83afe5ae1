"""Verification of undetermined edges (§5, Algorithm 3).

Phase 3 of EVE. Inputs are the *upper-bound graph* SPG^u (empirically tiny —
Table 3 shows <0.05% redundancy vs. the answer, whose size is bounded by the
query neighborhood), so SPG^u is collected and broadcast, and the per-edge
DFS — whose state is a shared vertex stack, not expressible as a Catalyst
aggregation — runs as a ``mapInPandas`` physical operator over the
partitioned set of undetermined edges (driver-side for tiny inputs). See
DESIGN.md "Layering".

Components:

- :func:`departures_arrivals` — Definitions 5.1–5.4 over SPG^u, with the
  Theorem 5.8 cap of ``k-2`` stored valid neighbors.
- :func:`search_orders` — §5.3: out-neighbors sorted by distance to the
  nearest arrival (arrivals first, larger ``|Out_A|`` first), in-neighbors
  by distance from the nearest departure (departures first, larger
  ``|In_D|`` first).
- :func:`verify_kernel` — Algorithm 3 verbatim (Forward / Backward /
  TryAddEdges): for an undetermined edge e(u,v), find a ≤(k-4)-hop simple
  path departure→arrival through e(u,v) whose endpoints admit distinct valid
  neighbors outside the path (Theorem 5.6). Every edge of a successful
  witness path is added to the result (Algorithm 3 line 27), and already
  confirmed undetermined edges are skipped.
"""
from __future__ import annotations

import math
from collections import deque
from typing import Dict, Iterable, List, Sequence, Set, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

Edge = Tuple[int, int]


def _multi_source_bfs(
    adj: Dict[int, List[int]], sources: Iterable[int]
) -> Dict[int, int]:
    dist = {int(v): 0 for v in sources}
    dq = deque(dist)
    while dq:
        u = dq.popleft()
        for v in adj.get(u, ()):  # noqa: E203
            if v not in dist:
                dist[v] = dist[u] + 1
                dq.append(v)
    return dist


def build_adjacency(
    spgu_edges: Sequence[Edge],
) -> Tuple[Dict[int, List[int]], Dict[int, List[int]]]:
    """Out- and in-adjacency of the upper-bound graph."""
    out_adj: Dict[int, List[int]] = {}
    in_adj: Dict[int, List[int]] = {}
    for u, v in spgu_edges:
        out_adj.setdefault(u, []).append(v)
        in_adj.setdefault(v, []).append(u)
    return out_adj, in_adj


def departures_arrivals(
    spgu_edges: Sequence[Edge], s: int, t: int, k: int
) -> Tuple[Set[int], Set[int], Dict[int, List[int]], Dict[int, List[int]]]:
    """(D, A, In_D, Out_A) per Definitions 5.1–5.4 with the k-2 cap (Thm 5.8)."""
    es = set(spgu_edges)
    out_adj, in_adj = build_adjacency(spgu_edges)
    in_d: Dict[int, List[int]] = {}
    for x in out_adj.get(s, ()):  # e(s, x) in SPG^u
        if x in (s, t):
            continue
        for v in out_adj.get(x, ()):  # e(x, v) in SPG^u
            if v in (s, t, x):
                continue
            in_d.setdefault(v, []).append(x)
    out_a: Dict[int, List[int]] = {}
    for y in in_adj.get(t, ()):  # e(y, t) in SPG^u
        if y in (s, t):
            continue
        for v in in_adj.get(y, ()):  # e(v, y) in SPG^u
            if v in (s, t, y):
                continue
            out_a.setdefault(v, []).append(y)
    cap = max(0, k - 2)
    in_d = {v: sorted(set(xs))[:cap] for v, xs in in_d.items()}
    out_a = {v: sorted(set(ys))[:cap] for v, ys in out_a.items()}
    assert all((s, x) in es and (x, v) in es for v, xs in in_d.items() for x in xs)
    return set(in_d), set(out_a), in_d, out_a


def search_orders(
    out_adj: Dict[int, List[int]],
    in_adj: Dict[int, List[int]],
    D: Set[int],
    A: Set[int],
    in_d: Dict[int, List[int]],
    out_a: Dict[int, List[int]],
) -> Tuple[Dict[int, List[int]], Dict[int, List[int]]]:
    """§5.3 neighbor orderings; returns (ordered out_adj, ordered in_adj)."""
    # Distance from v to the closest arrival following out-edges = BFS over
    # the reversed SPG^u from the arrival set; symmetric for departures.
    dist_to_arr = _multi_source_bfs(in_adj, A)
    dist_from_dep = _multi_source_bfs(out_adj, D)
    inf = math.inf

    def okey(n: int):
        d = dist_to_arr.get(n, inf)
        tie = -len(out_a.get(n, ())) if d == 0 else 0
        return (d, tie, n)

    def ikey(n: int):
        d = dist_from_dep.get(n, inf)
        tie = -len(in_d.get(n, ())) if d == 0 else 0
        return (d, tie, n)

    out_sorted = {v: sorted(ns, key=okey) for v, ns in out_adj.items()}
    in_sorted = {v: sorted(ns, key=ikey) for v, ns in in_adj.items()}
    return out_sorted, in_sorted


def verify_kernel(
    out_adj: Dict[int, List[int]],
    in_adj: Dict[int, List[int]],
    undetermined: Sequence[Edge],
    D: Set[int],
    A: Set[int],
    in_d: Dict[int, List[int]],
    out_a: Dict[int, List[int]],
    k: int,
    s: int,
    t: int,
) -> Set[Edge]:
    """Algorithm 3: returns the set of SPG^u edges confirmed via witnesses.

    The returned set contains every edge pushed on a successful witness
    stack (undetermined or definite); the caller unions it with the
    definite edges and intersects with the undetermined set as needed.
    """
    confirmed: Set[Edge] = set()
    if k < 5:
        return confirmed
    budget = k - 4

    for u0, v0 in undetermined:
        if (u0, v0) in confirmed:
            continue
        assert u0 not in (s, t) and v0 not in (s, t), "undetermined edge touches s/t"
        stk_v: Set[int] = {u0, v0, s, t}
        stk_e: List[Edge] = [(u0, v0)]

        def try_add(departure: int, arrival: int) -> bool:
            in_c = [x for x in in_d.get(departure, ()) if x not in stk_v]
            out_c = [y for y in out_a.get(arrival, ()) if y not in stk_v]
            if not in_c or not out_c:
                return False
            if len(in_c) == 1 and len(out_c) == 1 and in_c[0] == out_c[0]:
                return False
            confirmed.update(stk_e)
            return True

        def backward(cur: int, l: int, arrival: int) -> bool:
            if cur in D and try_add(cur, arrival):
                return True
            if l < budget:
                for nxt in in_adj.get(cur, ()):  # noqa: E203
                    if nxt in stk_v:
                        continue
                    stk_v.add(nxt)
                    stk_e.append((nxt, cur))
                    if backward(nxt, l + 1, arrival):
                        return True
                    stk_v.remove(nxt)
                    stk_e.pop()
            return False

        def forward(cur: int, l: int, u: int) -> bool:
            if cur in A and backward(u, l, cur):
                return True
            if l < budget:
                for nxt in out_adj.get(cur, ()):  # noqa: E203
                    if nxt in stk_v:
                        continue
                    stk_v.add(nxt)
                    stk_e.append((cur, nxt))
                    if forward(nxt, l + 1, u):
                        return True
                    stk_v.remove(nxt)
                    stk_e.pop()
            return False

        forward(v0, 1, u0)
    return confirmed


def _prepare_structures(
    spgu_edges: Sequence[Edge], s: int, t: int, k: int, order: bool
):
    """(out_adj, in_adj, D, A, In_D, Out_A) ready for the kernel."""
    D, A, in_d, out_a = departures_arrivals(spgu_edges, s, t, k)
    out_adj, in_adj = build_adjacency(spgu_edges)
    if order:
        out_adj, in_adj = search_orders(out_adj, in_adj, D, A, in_d, out_a)
    return out_adj, in_adj, D, A, in_d, out_a


def batch_verify(
    spark: SparkSession,
    per_query: Dict[int, Tuple[Sequence[Edge], Sequence[Edge], int, int]],
    k: int,
    *,
    order: bool = True,
    distributed: bool | None = None,
    min_distributed: int = 256,
    n_partitions: int = 16,
) -> Dict[int, Set[Edge]]:
    """Confirm undetermined edges for a batch of queries.

    ``per_query`` maps ``qid → (spgu_edges, undetermined, s, t)``. Returns
    ``qid → confirmed undetermined edges``. ``distributed=None``
    auto-selects: driver-side kernel when the total undetermined count is
    small, otherwise a ``mapInPandas`` over ``(qid, src, dst)`` rows with all
    per-query search structures broadcast — parallelism comes from both the
    queries and the partitioning of each query's undetermined set. Both
    paths run the identical kernel.
    """
    work = {
        qid: (spgu, und, s, t)
        for qid, (spgu, und, s, t) in per_query.items()
        if und
    }
    if k < 5 or not work:
        return {qid: set() for qid in per_query}
    total_undet = sum(len(und) for _, und, _, _ in work.values())
    if distributed is None:
        distributed = total_undet >= min_distributed

    structures = {
        qid: _prepare_structures(spgu, s, t, k, order)
        for qid, (spgu, und, s, t) in work.items()
    }
    out: Dict[int, Set[Edge]] = {qid: set() for qid in per_query}

    if not distributed:
        for qid, (spgu, und, s, t) in work.items():
            o_adj, i_adj, D, A, in_d, out_a = structures[qid]
            found = verify_kernel(o_adj, i_adj, und, D, A, in_d, out_a, k, s, t)
            out[qid] = found & set(und)
        return out

    bc = spark.sparkContext.broadcast(
        (structures, {qid: (s, t) for qid, (_, _, s, t) in work.items()}, k)
    )

    def run(batches: Iterable[pd.DataFrame]):
        struct, st_map, kk = bc.value
        for pdf in batches:
            frames = []
            for qid, grp in pdf.groupby("qid"):
                o_adj, i_adj, D, A, in_d, out_a = struct[int(qid)]
                ss, tt = st_map[int(qid)]
                und = list(zip(grp["src"].astype(int), grp["dst"].astype(int)))
                got = verify_kernel(
                    o_adj, i_adj, und, D, A, in_d, out_a, kk, ss, tt
                )
                got &= set(und)
                if got:
                    frames.append(
                        pd.DataFrame(
                            [(qid, u, v) for u, v in sorted(got)],
                            columns=["qid", "src", "dst"],
                        )
                    )
            if frames:
                yield pd.concat(frames)

    rows = [
        (qid, u, v)
        for qid, (_, und, _, _) in sorted(work.items())
        for u, v in und
    ]
    und_df = spark.createDataFrame(
        pd.DataFrame(rows, columns=["qid", "src", "dst"]),
        schema="qid long, src long, dst long",
    ).repartition(min(n_partitions, max(1, len(rows))))
    res = und_df.mapInPandas(run, schema="qid long, src long, dst long").distinct()
    for r in res.collect():
        out[int(r["qid"])].add((int(r["src"]), int(r["dst"])))
    return out


def verify_undetermined(
    spark: SparkSession,
    spgu_edges: Sequence[Edge],
    undetermined: Sequence[Edge],
    s: int,
    t: int,
    k: int,
    *,
    order: bool = True,
    distributed: bool | None = None,
) -> Set[Edge]:
    """Single-query verification (batch of one); see :func:`batch_verify`."""
    return batch_verify(
        spark,
        {0: (spgu_edges, undetermined, s, t)},
        k,
        order=order,
        distributed=distributed,
    )[0]
