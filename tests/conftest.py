"""Shared fixtures for the reproduction test suite.

``ensure_session_env`` runs at import — after the root conftest has set
``PYSPARK_SUBMIT_ARGS`` but before the JVM launches — to point shuffle
directories at tmpfs and silence the console progress bar (see
``repro.spark_util``). Heavy Spark results (EVE batches per graph/k combo,
Figure-1 runs) are computed once in session-scoped fixtures and shared by
many parametrized tests.
"""
from repro.spark_util import ensure_session_env

ensure_session_env()

from dataclasses import dataclass  # noqa: E402
from typing import Dict, List, Set, Tuple  # noqa: E402

import pytest  # noqa: E402

from repro.baselines import bruteforce as bf  # noqa: E402
from repro.core.eve import EveResult, eve_spg_batch  # noqa: E402
from repro.graphs.generators import (  # noqa: E402
    FIG1_IDS,
    community,
    erdos_renyi,
    figure1_graph,
    grid,
    power_law,
    random_digraph,
    to_spark,
)
from repro.graphs.model import adjacency  # noqa: E402
from repro.graphs.queries import random_queries  # noqa: E402
from repro.spark_util import tune_runtime  # noqa: E402

Edge = Tuple[int, int]


@pytest.fixture(scope="session")
def gspark(spark):
    """The session SparkSession, tuned for per-query graph dataflow."""
    tune_runtime(spark, 4)
    return spark


# ---------------------------------------------------------------------------
# Graphs.
# ---------------------------------------------------------------------------

@dataclass
class GraphCase:
    name: str
    pdf: object  # pandas edge list
    adj: dict


def _case(name, pdf) -> GraphCase:
    return GraphCase(name=name, pdf=pdf, adj=adjacency(pdf))


@pytest.fixture(scope="session")
def fig1() -> GraphCase:
    """The paper's Figure-1 running example."""
    return _case("fig1", figure1_graph())


@pytest.fixture(scope="session")
def fig1_edges(gspark, fig1):
    e = to_spark(gspark, fig1.pdf).repartition(1).cache()
    e.count()
    return e


#: (combo name, generator kwargs, k, #queries) — the Spark end-to-end grid.
EVE_COMBOS = [
    ("er120-k4", dict(kind="er", n=120, avg_deg=4, seed=11), 4, 8),
    ("er120-k6", dict(kind="er", n=120, avg_deg=4, seed=11), 6, 8),
    ("comm100-k5", dict(kind="community", n=100, avg_deg=5, seed=5), 5, 8),
    ("comm100-k7", dict(kind="community", n=100, avg_deg=5, seed=5), 7, 6),
    ("pl150-k6", dict(kind="power_law", n=150, avg_deg=4, seed=9), 6, 8),
    ("dense40-k6", dict(kind="er", n=40, avg_deg=6, seed=2), 6, 6),
]

COMBO_IDS = [c[0] for c in EVE_COMBOS]


@dataclass
class EveCase:
    """One query's worth of shared end-to-end results."""

    name: str
    k: int
    s: int
    t: int
    pdf: object
    result: EveResult
    truth: Set[Edge]  # brute-force E(SPG_k)


@pytest.fixture(scope="session")
def eve_cases(gspark) -> Dict[str, List[EveCase]]:
    """EVE batches + brute-force truth for every combo (computed once)."""
    out: Dict[str, List[EveCase]] = {}
    for name, gkw, k, nq in EVE_COMBOS:
        pdf = random_digraph(**gkw)
        adj = adjacency(pdf)
        edges = to_spark(gspark, pdf).repartition(1).cache()
        edges.count()
        qs = random_queries(pdf, k, nq, seed=17)
        results = eve_spg_batch(gspark, edges, qs, k)
        cases = []
        for (s, t), res in zip(qs, results):
            cases.append(
                EveCase(
                    name=name, k=k, s=s, t=t, pdf=pdf,
                    result=res, truth=bf.spg_edges(adj, s, t, k),
                )
            )
        out[name] = cases
        edges.unpersist()
    return out


@pytest.fixture(scope="session")
def fig1_eve(gspark, fig1, fig1_edges) -> Dict[int, EveResult]:
    """Fig-1 EVE results for the k values the paper's examples use."""
    s, t = FIG1_IDS["s"], FIG1_IDS["t"]
    return {
        k: eve_spg_batch(gspark, fig1_edges, [(s, t)], k)[0]
        for k in (4, 5, 7)
    }


@pytest.fixture(scope="session")
def small_graphs() -> List[GraphCase]:
    """A zoo of small deterministic+random graphs for pure-Python tests."""
    return [
        _case("fig1", figure1_graph()),
        _case("grid44", grid(4, 4)),
        _case("er30", erdos_renyi(30, 3, seed=1)),
        _case("pl40", power_law(40, 3, seed=2)),
        _case("comm36", community(36, 4, n_comm=3, seed=3)),
    ]
