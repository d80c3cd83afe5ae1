"""Pure-Python reference implementation of EVE (driver-side).

A faithful, dictionary-based mirror of the Spark dataflow in
:mod:`repro.core.essential` / :mod:`repro.core.labeling`, reusing the very
same verification kernel (:func:`repro.core.verify.verify_kernel`). Used as
a middle oracle: hypothesis/property tests hammer this implementation
against the brute-force Definition 2.1 enumerator on hundreds of random
graphs (cheap, no Spark), and the Spark tests then assert the dataflow
produces identical EV tables / labels / answers.
"""
from __future__ import annotations

import math
from collections import deque
from typing import Dict, FrozenSet, List, Optional, Set, Tuple

from repro.baselines.bruteforce import Adj, reverse_adj
from repro.core.verify import (
    build_adjacency,
    departures_arrivals,
    search_orders,
    verify_kernel,
)

Edge = Tuple[int, int]


def bfs_dist(adj: Adj, source: int, max_depth: int) -> Dict[int, int]:
    """Bounded BFS distances (driver-side)."""
    dist = {source: 0}
    dq = deque([source])
    while dq:
        u = dq.popleft()
        if dist[u] >= max_depth:
            continue
        for v in adj.get(u, ()):  # noqa: E203
            if v not in dist:
                dist[v] = dist[u] + 1
                dq.append(v)
    return dist


def ev_tables(
    adj: Adj,
    source: int,
    excluded: int,
    k: int,
    dist_prune: Optional[Dict[int, int]] = None,
) -> Dict[int, Dict[int, FrozenSet[int]]]:
    """EV_l(source, ·) for l = 0..k-1 via the closure form of Eq. (4).

    Returns ``{l: {v: frozenset}}``; the source row is present at every
    layer. ``dist_prune`` maps each vertex to its distance to the opposite
    endpoint (forward-looking pruning: keep ``(v, l)`` iff
    ``l + dist(v) ≤ k``).
    """
    ev: Dict[int, Dict[int, FrozenSet[int]]] = {0: {source: frozenset({source})}}
    for l in range(1, k):
        acc: Dict[int, List[FrozenSet[int]]] = {}
        for x, sx in ev[l - 1].items():
            for y in adj.get(x, ()):  # noqa: E203
                if y == source or y == excluded:
                    continue
                if dist_prune is not None and l + dist_prune.get(y, math.inf) > k:
                    continue
                acc.setdefault(y, []).append(sx | {y})
        layer = {y: frozenset.intersection(*sets) for y, sets in acc.items()}
        layer[source] = frozenset({source})
        ev[l] = layer
    return ev


def label_edge(
    u: int,
    v: int,
    evf: Dict[int, Dict[int, FrozenSet[int]]],
    evb: Dict[int, Dict[int, FrozenSet[int]]],
    s: int,
    t: int,
    k: int,
) -> int:
    """Algorithm 2 verbatim: label 0 / 1 / 2 for edge e(u, v)."""
    if (u == s and v in evb[k - 1]) or (v == t and u in evf[k - 1]):
        return 2
    if k >= 2:
        if u in evf[1] and v in evb[k - 2] and u not in evb[k - 2][v]:
            return 2
        if v in evb[1] and u in evf[k - 2] and v not in evf[k - 2][u]:
            return 2
    for kf in range(2, k - 2):
        kb = k - kf - 1
        if u in evf[kf] and v in evb[kb]:
            if not (evf[kf][u] & evb[kb][v]):
                return 1
    return 0


def reference_eve(
    adj: Adj,
    s: int,
    t: int,
    k: int,
    *,
    prune: bool = True,
    order: bool = True,
):
    """Full EVE on the driver. Returns ``(spg, upper, definite, undetermined)``."""
    radj = reverse_adj(adj)
    dist_s = bfs_dist(adj, s, k) if prune else None
    dist_t = bfs_dist(radj, t, k) if prune else None
    evf = ev_tables(adj, s, t, k, dist_prune=dist_t)
    evb = ev_tables(radj, t, s, k, dist_prune=dist_s)

    edges = [(u, v) for u, vs in adj.items() for v in vs]
    definite: Set[Edge] = set()
    undetermined: Set[Edge] = set()
    for u, v in edges:
        lab = label_edge(u, v, evf, evb, s, t, k)
        if lab == 2:
            definite.add((u, v))
        elif lab == 1:
            undetermined.add((u, v))
    upper = definite | undetermined

    if k <= 4:
        return set(upper), upper, definite, undetermined

    spgu = sorted(upper)
    D, A, in_d, out_a = departures_arrivals(spgu, s, t, k)
    out_adj, in_adj = build_adjacency(spgu)
    if order:
        out_adj, in_adj = search_orders(out_adj, in_adj, D, A, in_d, out_a)
    found = verify_kernel(
        out_adj, in_adj, sorted(undetermined), D, A, in_d, out_a, k, s, t
    )
    spg = definite | (found & undetermined)
    return spg, upper, definite, undetermined
