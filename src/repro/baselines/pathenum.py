"""PathEnum-lite [35]: index-pruned enumeration with a cost-based mode choice.

PathEnum's three credited ideas, reproduced here (the original is
closed-source C++ — see DESIGN.md §3):

1. a *lightweight online index*: bounded BFS distance maps from ``s`` and to
   ``t``, which both prune the candidate edge set to
   ``Δ(s,u)+1+Δ(v,t) ≤ k`` and drive per-step expansion pruning;
2. a DFS-style enumeration mode (pruned expansion over the candidate
   subgraph);
3. a join-based mode (meet-in-the-middle over the candidate subgraph) with a
   cost-based optimiser choosing between the two.

Candidate restriction is enforced through the per-query distance maps: a
vertex outside a query's ``k``-ball has no distance entry for that query,
so every expansion step's prune join removes it — identical semantics to
materialising per-query candidate subgraphs, in one shared dataflow.

The cost model is deliberately simple (documented substitution): estimate
the candidate graph's mean out-degree ``d``; DFS explores ~``d^(k-1)``
prefixes while the join materialises two ~``d^(k/2)`` halves, so the join
mode wins once ``k`` and ``d`` are large.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.baselines.enumeration import batch_enumerate_paths, batch_join_paths
from repro.graphs.bfs import batch_distance_maps
from repro.spark_util import no_pin


@dataclass
class PathEnumIndex:
    """The lightweight online index: per-query distance maps + candidates."""

    dist_s: DataFrame
    dist_t: DataFrame
    candidate_edges: DataFrame  # (qid, src, dst)
    avg_out_degree: float


def build_index(
    spark: SparkSession,
    edges: DataFrame,
    queries: DataFrame,
    k: int,
    pin=no_pin,
) -> PathEnumIndex:
    """Bounded BFS both ways + candidate-edge pruning (the PathEnum index)."""
    dist_s, dist_t = batch_distance_maps(
        spark, edges, queries, k, mode="single", pin=pin
    )
    ds = dist_s.select(
        F.col("qid").alias("sqid"), F.col("v").alias("ssrc"), F.col("dist").alias("ds")
    )
    dt = dist_t.select(
        F.col("qid").alias("tqid"), F.col("v").alias("tdst"), F.col("dist").alias("dt")
    )
    per_query = "qid" in edges.columns
    left = edges.join(
        F.broadcast(ds),
        (edges["src"] == ds["ssrc"])
        & ((edges["qid"] == ds["sqid"]) if per_query else F.lit(True)),
    )
    cand = pin(
        left.join(
            F.broadcast(dt),
            (F.col("sqid") == F.col("tqid")) & (edges["dst"] == dt["tdst"]),
        )
        .where(F.col("ds") + 1 + F.col("dt") <= k)
        .select(
            F.col("sqid").alias("qid"),
            edges["src"].alias("src"),
            edges["dst"].alias("dst"),
        )
    )
    stats = cand.groupBy("qid", "src").count().groupBy().avg("count").collect()
    avg_deg = float(stats[0][0] or 0.0) if stats and stats[0][0] is not None else 0.0
    return PathEnumIndex(dist_s, dist_t, cand, avg_deg)


def choose_mode(avg_out_degree: float, k: int) -> str:
    """Cost-based optimiser: ``dfs`` or ``join`` (see module docstring)."""
    if avg_out_degree <= 1.0:
        return "dfs"
    h1 = (k + 1) // 2
    dfs_cost = avg_out_degree ** max(0, k - 1)
    join_cost = 4.0 * (avg_out_degree ** h1)
    return "join" if dfs_cost > join_cost else "dfs"


def batch_pathenum(
    spark: SparkSession,
    edges: DataFrame,
    queries: DataFrame,
    k: int,
    *,
    mode: str = "auto",
    pin=no_pin,
    max_rows: Optional[int] = None,
) -> DataFrame:
    """PathEnum: all k-hop-constrained s-t simple paths ``(qid, verts)``.

    ``mode`` ∈ {auto, dfs, join}. Running "PathEnum on SPG_k / G^k_st"
    (Tables 4–5) just passes the reduced graph as ``edges`` — the index,
    candidate set and every expansion step shrink with it.
    """
    idx = build_index(spark, edges, queries, k, pin=pin)
    if mode == "auto":
        mode = choose_mode(idx.avg_out_degree, k)
    # Per-query candidate edges: the expansion joins match on qid, so each
    # query only ever walks its own candidate subgraph.
    cand_edges = idx.candidate_edges
    if mode == "dfs":
        return batch_enumerate_paths(
            spark, cand_edges, queries, k,
            mode="pruned", dist_t=idx.dist_t, pin=pin, max_rows=max_rows,
        )
    if mode == "join":
        return batch_join_paths(
            spark, cand_edges, queries, k,
            dist_s=idx.dist_s, dist_t=idx.dist_t, pin=pin, max_rows=max_rows,
        )
    raise ValueError(f"unknown mode {mode!r}")
