"""Table 4 benchmark: PathEnum on G vs on EVE's SPG_k vs on KHSQ⁺'s G^k_st.

Each benchmark times PathEnum on one search space; the recorded
``speedup_vs_G`` extra-info reproduces the table cells (full sweep:
``jobs/table4_enum_speedups.py``).
"""
import pytest

from repro.bench_harness import (
    make_workload,
    qid_edges_df,
    run_eve,
    run_gkst,
    run_path_enumeration,
)

CELLS = [("bk", 5), ("tw", 6)]
_state = {}


def _setup(gspark, name, k):
    key = (name, k)
    if key not in _state:
        w = make_workload(gspark, name, k, scale="test", n_queries=4, seed=0)
        eve_res, t_eve = run_eve(gspark, w)
        gkst, t_gk = run_gkst(gspark, w, adaptive=True)
        _state[key] = dict(
            w=w,
            spg=qid_edges_df(gspark, {i: r.spg for i, r in enumerate(eve_res)}),
            gkst=qid_edges_df(gspark, gkst),
            t_eve=t_eve,
            t_gk=t_gk,
            base=None,
        )
    return _state[key]


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_pathenum_on_G(benchmark, gspark, name, k):
    st = _setup(gspark, name, k)
    n, secs = benchmark.pedantic(
        lambda: run_path_enumeration(gspark, st["w"], "pathenum"),
        rounds=1, iterations=1,
    )
    st["base"] = secs
    benchmark.extra_info["n_paths"] = n


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_pathenum_on_spg(benchmark, gspark, name, k):
    st = _setup(gspark, name, k)
    n, secs = benchmark.pedantic(
        lambda: run_path_enumeration(gspark, st["w"], "pathenum", edges=st["spg"]),
        rounds=1, iterations=1,
    )
    if st["base"]:
        benchmark.extra_info["speedup_vs_G_excl_prep"] = round(st["base"] / secs, 2)
        benchmark.extra_info["speedup_vs_G_incl_prep"] = round(
            st["base"] / (st["t_eve"] + secs), 2
        )
    benchmark.extra_info["n_paths"] = n


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_pathenum_on_gkst(benchmark, gspark, name, k):
    st = _setup(gspark, name, k)
    n, secs = benchmark.pedantic(
        lambda: run_path_enumeration(gspark, st["w"], "pathenum", edges=st["gkst"]),
        rounds=1, iterations=1,
    )
    if st["base"]:
        benchmark.extra_info["speedup_vs_G_excl_prep"] = round(st["base"] / secs, 2)
        benchmark.extra_info["speedup_vs_G_incl_prep"] = round(
            st["base"] / (st["t_gk"] + secs), 2
        )
    benchmark.extra_info["n_paths"] = n
