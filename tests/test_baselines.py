"""Path-enumeration baselines and KHSQ vs brute force + DuckDB oracle."""
import pytest

from repro import oracle
from repro.baselines import bruteforce as bf
from repro.baselines.enumeration import (
    EnumerationBudgetExceeded,
    batch_enumerate_paths,
    batch_join_paths,
    path_strings,
    paths_to_spg,
)
from repro.baselines.khsq import batch_gkst
from repro.baselines.pathenum import batch_pathenum, build_index, choose_mode
from repro.core.reference import bfs_dist
from repro.graphs.bfs import batch_distance_maps, queries_df
from repro.graphs.generators import random_digraph, to_spark
from repro.graphs.model import adjacency
from repro.graphs.queries import random_queries
from repro.spark_util import DFPin

K = 5
N_QUERIES = 6


@pytest.fixture(scope="module")
def bsetup(gspark):
    pdf = random_digraph("er", 90, 3.5, seed=77)
    edges = to_spark(gspark, pdf).repartition(1).cache()
    edges.count()
    qs = random_queries(pdf, K, N_QUERIES, seed=5)
    q = queries_df(gspark, qs)
    pin = DFPin()
    ds, dt = batch_distance_maps(gspark, edges, q, K, pin=pin)
    return pdf, adjacency(pdf), edges, qs, q, ds, dt, pin


def _pathset(df):
    return {
        (int(r["qid"]), tuple(int(x) for x in r["verts"])) for r in df.collect()
    }


def _truth_paths(adj, qs):
    return {
        (i, p)
        for i, (s, t) in enumerate(qs)
        for p in bf.simple_paths(adj, s, t, K)
    }


@pytest.fixture(scope="module")
def enumerated(gspark, bsetup):
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    return {
        "naive": _pathset(
            batch_enumerate_paths(gspark, edges, q, K, mode="naive", pin=pin)
        ),
        "pruned": _pathset(
            batch_enumerate_paths(
                gspark, edges, q, K, mode="pruned", dist_t=dt, pin=pin
            )
        ),
        "join": _pathset(batch_join_paths(gspark, edges, q, K, pin=pin)),
        "pathenum": _pathset(batch_pathenum(gspark, edges, q, K, pin=pin)),
        "pathenum-join": _pathset(
            batch_pathenum(gspark, edges, q, K, mode="join", pin=pin)
        ),
    }


@pytest.mark.parametrize(
    "algo", ["naive", "pruned", "join", "pathenum", "pathenum-join"]
)
def test_enumeration_matches_bruteforce(bsetup, enumerated, algo):
    pdf, adj, edges, qs, *_ = bsetup
    assert enumerated[algo] == _truth_paths(adj, qs), algo


def test_paths_match_duckdb_oracle(gspark, bsetup):
    """Path sets equal DuckDB's recursive-CTE enumeration, per query."""
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    paths = batch_enumerate_paths(
        gspark, edges, q, K, mode="pruned", dist_t=dt, pin=pin
    )
    for qid, (s, t) in list(enumerate(qs))[:3]:
        got = path_strings(paths.where(f"qid = {qid}")).select("path")
        oracle.assert_equivalent(got, oracle.paths_sql(s, t, K), edges=pdf)


def test_paths_to_spg_matches_oracle(gspark, bsetup):
    """Baseline SPG (union of path edges) == DuckDB Definition 2.1."""
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    spg = paths_to_spg(
        batch_enumerate_paths(gspark, edges, q, K, mode="pruned", dist_t=dt, pin=pin)
    )
    for qid, (s, t) in list(enumerate(qs))[:3]:
        got = spg.where(f"qid = {qid}").select("src", "dst")
        oracle.assert_equivalent(got, oracle.spg_sql(s, t, K), edges=pdf)


def test_paths_to_spg_matches_bruteforce(gspark, bsetup):
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    spg = paths_to_spg(batch_join_paths(gspark, edges, q, K, pin=pin)).collect()
    per = {i: set() for i in range(len(qs))}
    for r in spg:
        per[int(r["qid"])].add((int(r["src"]), int(r["dst"])))
    for i, (s, t) in enumerate(qs):
        assert per[i] == bf.spg_edges(adj, s, t, K)


def test_gkst_properties(gspark, bsetup):
    """G^k_st: distance-characterised, superset of SPG, KHSQ == KHSQ⁺."""
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    radj = bf.reverse_adj(adj)
    plain = batch_gkst(gspark, edges, q, K, pin=pin).collect()
    per = {i: set() for i in range(len(qs))}
    for r in plain:
        per[int(r["qid"])].add((int(r["src"]), int(r["dst"])))
    all_edges = set(zip(pdf["src"], pdf["dst"]))
    for i, (s, t) in enumerate(qs):
        d_s = bfs_dist(adj, s, K)
        d_t = bfs_dist(radj, t, K)
        want = {
            (u, v)
            for (u, v) in all_edges
            if d_s.get(u, 99) + 1 + d_t.get(v, 99) <= K
        }
        assert per[i] == want
        assert per[i] >= bf.spg_edges(adj, s, t, K)
    adaptive = batch_gkst(gspark, edges, q, K, adaptive=True, pin=pin).collect()
    per2 = {i: set() for i in range(len(qs))}
    for r in adaptive:
        per2[int(r["qid"])].add((int(r["src"]), int(r["dst"])))
    assert per == per2


def test_pathenum_index_and_cost_model(gspark, bsetup):
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    idx = build_index(gspark, edges, q, K, pin=pin)
    assert idx.avg_out_degree > 0
    assert choose_mode(0.5, 8) == "dfs"
    assert choose_mode(4.0, 8) == "join"
    assert choose_mode(4.0, 3) == "dfs"


def test_budget_guard_raises(gspark, bsetup):
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    with pytest.raises(EnumerationBudgetExceeded):
        batch_enumerate_paths(
            gspark, edges, q, K, mode="naive", pin=pin, max_rows=1
        )


def test_unknown_mode_rejected(gspark, bsetup):
    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    with pytest.raises(ValueError):
        batch_enumerate_paths(gspark, edges, q, K, mode="bogus")
    with pytest.raises(ValueError):
        batch_pathenum(gspark, edges, q, K, mode="bogus")


def test_per_query_reduced_graph_enumeration(gspark, bsetup):
    """Enumeration on per-query (qid,src,dst) SPG graphs == full-graph runs
    (the Table-4 'PathEnum on SPG_k' path)."""
    import pandas as pd

    pdf, adj, edges, qs, q, ds, dt, pin = bsetup
    rows = []
    for i, (s, t) in enumerate(qs):
        for (u, v) in sorted(bf.spg_edges(adj, s, t, K)):
            rows.append((i, u, v))
    per_q = gspark.createDataFrame(
        pd.DataFrame(rows, columns=["qid", "src", "dst"]),
        schema="qid long, src long, dst long",
    )
    got = _pathset(batch_pathenum(gspark, per_q, q, K, pin=pin))
    assert got == _truth_paths(adj, qs)
