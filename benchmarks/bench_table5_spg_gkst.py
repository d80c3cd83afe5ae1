"""Table 5 benchmark: SPG generation via JOIN/PathEnum, naive-on-G vs
boosted with KHSQ⁺'s G^k_st (k=6) — plus EVE for §6.8's conclusion.

Full sweep: ``jobs/table5_spg_via_gkst.py``.
"""
import pytest

from repro.bench_harness import (
    make_workload,
    qid_edges_df,
    run_eve,
    run_gkst,
    run_spg_via_enumeration,
)

CELLS = [("tw", 6), ("bk", 6)]
_state = {}


def _setup(gspark, name, k):
    key = (name, k)
    if key not in _state:
        w = make_workload(gspark, name, k, scale="test", n_queries=4, seed=0)
        gkst, t_gk = run_gkst(gspark, w, adaptive=True)
        _state[key] = dict(
            w=w, gkst=qid_edges_df(gspark, gkst), t_gk=t_gk, base={}
        )
    return _state[key]


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
@pytest.mark.parametrize("algo", ["join", "pathenum"])
def test_spg_on_G(benchmark, gspark, algo, name, k):
    st = _setup(gspark, name, k)
    spg, secs = benchmark.pedantic(
        lambda: run_spg_via_enumeration(gspark, st["w"], algo),
        rounds=1, iterations=1,
    )
    st["base"][algo] = secs


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
@pytest.mark.parametrize("algo", ["join", "pathenum"])
def test_spg_on_gkst(benchmark, gspark, algo, name, k):
    st = _setup(gspark, name, k)
    spg, secs = benchmark.pedantic(
        lambda: run_spg_via_enumeration(
            gspark, st["w"], algo, edges=st["gkst"]
        ),
        rounds=1, iterations=1,
    )
    base = st["base"].get(algo)
    if base:
        benchmark.extra_info["table5_speedup"] = round(
            base / (st["t_gk"] + secs), 2
        )


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_spg_via_eve(benchmark, gspark, name, k):
    st = _setup(gspark, name, k)
    results, secs = benchmark.pedantic(
        lambda: run_eve(gspark, st["w"]), rounds=1, iterations=1
    )
    for algo, base in st["base"].items():
        if base:
            benchmark.extra_info[f"eve_speedup_vs_{algo}"] = round(base / secs, 2)
