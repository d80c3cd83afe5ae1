"""KHSQ / KHSQ⁺ — hop-constrained s-t subgraph ``G^k_st`` ([25], §6.7).

``G^k_st`` contains every edge on *some* (not necessarily simple) s-t path
of length ≤ k, i.e. edges ``e(u,v)`` with ``Δ(s,u) + 1 + Δ(v,t) ≤ k``.
KHSQ computes the two distance maps with single-directional BFS from each
side; KHSQ⁺ — the paper's §6.7 optimisation — swaps in the adaptive
bi-directional search of §3.3. Both are query-batched.

``G^k_st ⊇ SPG_k``: it is the coarser (cycle-containing) search-space
reduction that Tables 4–5 compare against.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.bfs import batch_distance_maps
from repro.spark_util import no_pin


def batch_gkst(
    spark: SparkSession,
    edges: DataFrame,
    queries: DataFrame,
    k: int,
    *,
    adaptive: bool = False,
    pin=no_pin,
) -> DataFrame:
    """``G^k_st`` per query: ``(qid, src, dst)``.

    ``adaptive=False`` → KHSQ (plain bounded BFS each side);
    ``adaptive=True`` → KHSQ⁺ (adaptive bi-directional search).
    """
    mode = "adaptive" if adaptive else "single"
    dist_s, dist_t = batch_distance_maps(spark, edges, queries, k, mode=mode, pin=pin)
    ds = dist_s.select("qid", F.col("v").alias("src"), F.col("dist").alias("ds"))
    dt = dist_t.select(
        F.col("qid").alias("tqid"), F.col("v").alias("dst"), F.col("dist").alias("dt")
    )
    return (
        edges.join(F.broadcast(ds), "src")
        .join(
            F.broadcast(dt),
            (F.col("qid") == F.col("tqid")) & (edges["dst"] == dt["dst"]),
        )
        .where(F.col("ds") + 1 + F.col("dt") <= k)
        .select("qid", "src", edges["dst"].alias("dst"))
    )
