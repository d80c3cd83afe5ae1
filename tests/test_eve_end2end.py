"""End-to-end EVE correctness on random graphs, against three oracles:

1. brute-force enumeration of Definition 2.1 (``repro.baselines.bruteforce``),
2. the pure-Python reference EVE (``repro.core.reference``),
3. DuckDB recursive-CTE SQL via ``repro.oracle.assert_equivalent``.

The heavy Spark batches are computed once per (graph, k) combo in the
session-scoped ``eve_cases`` fixture; the tests here fan out per query.
"""
import pytest

from repro import oracle
from repro.core.eve import eve_spg_batch
from repro.core.reference import reference_eve
from repro.graphs.generators import random_digraph, to_spark
from repro.graphs.model import adjacency
from repro.graphs.queries import random_queries

from tests.conftest import COMBO_IDS, EVE_COMBOS


def _cases(eve_cases, name):
    return eve_cases[name]


@pytest.mark.parametrize("name", COMBO_IDS)
def test_spg_matches_bruteforce(eve_cases, name):
    """EVE == exhaustive enumeration for every query of the combo."""
    for c in _cases(eve_cases, name):
        assert c.result.spg == c.truth, (c.s, c.t, c.k)


@pytest.mark.parametrize("name", COMBO_IDS)
def test_upper_bound_superset(eve_cases, name):
    """SPG^u ⊇ SPG always (Definition 4.1 soundness)."""
    for c in _cases(eve_cases, name):
        assert c.result.upper >= c.truth, (c.s, c.t, c.k)


@pytest.mark.parametrize("name", COMBO_IDS)
def test_definite_edges_subset(eve_cases, name):
    """Label-2 edges are provably in SPG (Lemmas 4.4/4.6 soundness)."""
    for c in _cases(eve_cases, name):
        assert c.result.definite <= c.truth, (c.s, c.t, c.k)


@pytest.mark.parametrize("name", COMBO_IDS)
def test_upper_equals_exact_for_k_le_4(eve_cases, name):
    """Theorem 4.8: SPG^u = SPG when k ≤ 4 (and undetermined set is empty)."""
    for c in _cases(eve_cases, name):
        if c.k <= 4:
            assert c.result.upper == c.truth
            assert not c.result.undetermined


@pytest.mark.parametrize("name", COMBO_IDS)
def test_matches_reference_implementation(eve_cases, name):
    """Spark dataflow ≡ pure-Python reference EVE (labels and answer)."""
    for c in _cases(eve_cases, name):
        adj = adjacency(c.pdf)
        spg, upper, definite, undet = reference_eve(adj, c.s, c.t, c.k)
        assert c.result.spg == spg
        assert c.result.upper == upper
        assert c.result.definite == definite
        assert c.result.undetermined == undet


@pytest.mark.parametrize("name", COMBO_IDS)
def test_spg_matches_duckdb_oracle(gspark, eve_cases, name):
    """Every query's SPG equals DuckDB evaluating Definition 2.1 directly."""
    for c in _cases(eve_cases, name)[:3]:  # CTE enumeration is exponential
        oracle.assert_equivalent(
            c.result.spg_df(gspark),
            oracle.spg_sql(c.s, c.t, c.k),
            edges=c.pdf,
        )


@pytest.mark.parametrize("name", COMBO_IDS)
def test_edges_of_spg_are_graph_edges(eve_cases, name):
    for c in _cases(eve_cases, name):
        all_edges = set(zip(c.pdf["src"], c.pdf["dst"]))
        assert c.result.spg <= all_edges
        assert c.result.upper <= all_edges


# ---------------------------------------------------------------------------
# Option ablations (Fig. 11 knobs) must not change answers.
# ---------------------------------------------------------------------------

ABLATIONS = [
    dict(prune=False),
    dict(distance_mode="single"),
    dict(distance_mode="adaptive"),
    dict(impl="pandas"),
    dict(order=False),
    dict(distributed=True),
]


@pytest.fixture(scope="module")
def ablation_setup(gspark):
    gkw = dict(kind="community", n=80, avg_deg=5, seed=23)
    pdf = random_digraph(**gkw)
    edges = to_spark(gspark, pdf).repartition(1).cache()
    edges.count()
    k = 6
    qs = random_queries(pdf, k, 6, seed=3)
    base = eve_spg_batch(gspark, edges, qs, k)
    return pdf, edges, k, qs, base


@pytest.mark.parametrize(
    "opts", ABLATIONS, ids=[str(sorted(a.items())) for a in ABLATIONS]
)
def test_ablations_do_not_change_answers(gspark, ablation_setup, opts):
    """Pruning/distance-mode/impl/ordering/distribution are pure optimisations."""
    pdf, edges, k, qs, base = ablation_setup
    got = eve_spg_batch(gspark, edges, qs, k, **opts)
    for b, g in zip(base, got):
        assert g.spg == b.spg
        assert g.upper == b.upper
        assert g.definite == b.definite


def test_ablation_base_matches_truth(ablation_setup):
    from repro.baselines import bruteforce as bf

    pdf, edges, k, qs, base = ablation_setup
    adj = adjacency(pdf)
    for (s, t), res in zip(qs, base):
        assert res.spg == bf.spg_edges(adj, s, t, k)


def test_rejects_s_equals_t(gspark, fig1_edges):
    with pytest.raises(ValueError):
        eve_spg_batch(gspark, fig1_edges, [(0, 0)], 4)
