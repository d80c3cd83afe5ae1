"""Experiment harness: workloads, runners, table formatting."""
import pytest

from repro import bench_harness as H
from repro.baselines import bruteforce as bf
from repro.graphs.model import adjacency


@pytest.fixture(scope="module")
def workload(gspark):
    return H.make_workload(gspark, "tw", 4, scale="test", n_queries=4, seed=1)


def test_make_workload(workload):
    assert workload.k == 4
    assert len(workload.queries) == 4
    assert workload.edges.count() == len(workload.edges_pdf)


def test_run_eve_matches_truth(gspark, workload):
    results, secs = H.run_eve(gspark, workload)
    assert secs > 0
    adj = adjacency(workload.edges_pdf)
    for (s, t), res in zip(workload.queries, results):
        assert res.spg == bf.spg_edges(adj, s, t, workload.k)


def test_run_spg_via_enumeration_matches_eve(gspark, workload):
    results, _ = H.run_eve(gspark, workload)
    spg, secs = H.run_spg_via_enumeration(gspark, workload, "pathenum")
    for i, res in enumerate(results):
        assert spg[i] == res.spg


def test_run_path_enumeration_counts(gspark, workload):
    n, secs = H.run_path_enumeration(gspark, workload, "join")
    adj = adjacency(workload.edges_pdf)
    want = sum(
        len(bf.simple_paths(adj, s, t, workload.k)) for s, t in workload.queries
    )
    assert n == want


def test_budget_exceeded_returns_none(gspark, workload):
    n, secs = H.run_path_enumeration(gspark, workload, "naive", max_rows=1)
    assert n is None


def test_run_gkst_superset(gspark, workload):
    sets, _ = H.run_gkst(gspark, workload, adaptive=True)
    adj = adjacency(workload.edges_pdf)
    for i, (s, t) in enumerate(workload.queries):
        assert sets[i] >= bf.spg_edges(adj, s, t, workload.k)


def test_qid_edges_roundtrip(gspark):
    mapping = {0: {(1, 2), (2, 3)}, 1: set(), 2: {(5, 6)}}
    df = H.qid_edges_df(gspark, mapping)
    back = H.edge_sets_from_df(df, 3)
    assert back == mapping


def test_fmt_markdown_table():
    out = H.fmt_markdown_table(["a", "b"], [[1, 2.5], [None, "x"]])
    assert out.splitlines()[0] == "| a | b |"
    assert "| 1 | 2.50 |" in out
    assert "| INF | x |" in out
