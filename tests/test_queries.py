"""Query workload generation (§6.1 protocol)."""
import pytest

from repro.graphs.generators import chain, random_digraph
from repro.graphs.model import adjacency
from repro.graphs.queries import k_hop_reachable, random_queries


def test_k_hop_reachable_chain():
    adj = adjacency(chain(10))
    assert k_hop_reachable(adj, 0, 3) == {0: 0, 1: 1, 2: 2, 3: 3}


@pytest.mark.parametrize("k", [2, 4, 6])
def test_queries_are_k_hop_reachable(k):
    pdf = random_digraph("er", 150, 4, seed=21)
    adj = adjacency(pdf)
    qs = random_queries(pdf, k, 20, seed=2)
    assert len(qs) == 20
    for s, t in qs:
        assert s != t
        assert t in k_hop_reachable(adj, s, k)


def test_deterministic_in_seed():
    pdf = random_digraph("er", 150, 4, seed=21)
    assert random_queries(pdf, 4, 10, seed=3) == random_queries(pdf, 4, 10, seed=3)
    assert random_queries(pdf, 4, 10, seed=3) != random_queries(pdf, 4, 10, seed=4)


def test_raises_when_impossible():
    import pandas as pd

    pdf = pd.DataFrame({"src": [0], "dst": [1]})
    with pytest.raises(RuntimeError):
        # only one reachable pair exists; asking for many distinct draws is
        # fine (they repeat), but an isolated graph with no reachable pair
        # must fail:
        random_queries(
            pd.DataFrame({"src": [5], "dst": [5]}), 2, 3, max_tries=10
        )
