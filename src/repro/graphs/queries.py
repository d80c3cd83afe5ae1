"""Query workload generation (§6.1).

The paper draws random (s,t) pairs such that s reaches t within k hops
(non-reachable pairs are assumed filtered by a k-hop reachability index).
Queries here are generated on the driver from the collected edge list —
query generation is test harness, not a measured system — with a seeded RNG
so every run sees the same workload.
"""
from __future__ import annotations

from collections import deque
from typing import List, Tuple

import numpy as np
import pandas as pd

from repro.graphs.model import adjacency


def k_hop_reachable(adj: dict[int, list[int]], s: int, k: int) -> dict[int, int]:
    """BFS distances from ``s`` truncated at depth ``k`` (driver-side)."""
    dist = {s: 0}
    dq = deque([s])
    while dq:
        u = dq.popleft()
        if dist[u] == k:
            continue
        for v in adj.get(u, ()):  # noqa: E203
            if v not in dist:
                dist[v] = dist[u] + 1
                dq.append(v)
    return dist


def random_queries(
    edges_pdf: pd.DataFrame,
    k: int,
    n_queries: int,
    *,
    seed: int = 0,
    max_tries: int = 4000,
) -> List[Tuple[int, int]]:
    """Seeded random (s,t) pairs with ``t`` k-hop-reachable from ``s``, s≠t."""
    g = np.random.default_rng(seed)
    adj = adjacency(edges_pdf)
    sources = sorted(adj.keys())
    out: List[Tuple[int, int]] = []
    tries = 0
    while len(out) < n_queries and tries < max_tries:
        tries += 1
        s = int(sources[g.integers(0, len(sources))])
        reach = [v for v in k_hop_reachable(adj, s, k) if v != s]
        if not reach:
            continue
        t = int(reach[g.integers(0, len(reach))])
        out.append((s, t))
    if len(out) < n_queries:
        raise RuntimeError(
            f"could only generate {len(out)}/{n_queries} k-hop-reachable queries"
        )
    return out
