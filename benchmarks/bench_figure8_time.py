"""Figure 8 benchmark: total SPG-generation time, EVE vs JOIN vs PathEnum,
on a dense and a sparse stand-in (full sweep: ``jobs/figure8_time_comparison.py``).
"""
import pytest

from repro.bench_harness import make_workload, run_eve, run_spg_via_enumeration

CELLS = [("ye", 4), ("ye", 5), ("tw", 6)]
_state = {}
MAX_ROWS = 300_000


def _wl(gspark, name, k):
    key = (name, k)
    if key not in _state:
        _state[key] = make_workload(
            gspark, name, k, scale="test", n_queries=4, seed=0
        )
    return _state[key]


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_eve(benchmark, gspark, name, k):
    w = _wl(gspark, name, k)
    results, secs = benchmark.pedantic(
        lambda: run_eve(gspark, w), rounds=1, iterations=1
    )
    benchmark.extra_info["avg_spg_edges"] = round(
        sum(len(r.spg) for r in results) / len(results), 1
    )


@pytest.mark.parametrize("algo", ["join", "pathenum"])
@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_baseline(benchmark, gspark, algo, name, k):
    w = _wl(gspark, name, k)
    spg, secs = benchmark.pedantic(
        lambda: run_spg_via_enumeration(gspark, w, algo, max_rows=MAX_ROWS),
        rounds=1, iterations=1,
    )
    benchmark.extra_info["hit_INF_budget"] = spg is None
