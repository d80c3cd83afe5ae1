"""Table 3 benchmark: EVE batches on representative stand-ins; the measured
quantity is the EVE batch wall time and the recorded ``r_D`` redundancy.

The full 15-dataset × k∈{5..8} sweep lives in
``jobs/table3_redundant_ratio.py``; benchmarks keep a fast subset so
``pytest benchmarks/`` stays minutes, not hours.
"""
import pytest

from repro.bench_harness import make_workload, run_eve
from repro.core.stats import coverage_ratio, redundant_ratio

CELLS = [("ps", 5), ("ps", 6), ("bk", 6), ("tw", 6), ("bs", 5)]


@pytest.mark.parametrize("name,k", CELLS, ids=[f"{n}-k{k}" for n, k in CELLS])
def test_eve_redundant_ratio(benchmark, gspark, name, k):
    w = make_workload(gspark, name, k, scale="test", n_queries=4, seed=0)
    results, _ = benchmark.pedantic(
        lambda: run_eve(gspark, w), rounds=1, iterations=1
    )
    n_edges = len(w.edges_pdf)
    rd = [redundant_ratio(r) for r in results]
    rc = [coverage_ratio(r, n_edges) for r in results]
    benchmark.extra_info["avg_r_D_percent"] = round(100 * sum(rd) / len(rd), 4)
    benchmark.extra_info["avg_r_C"] = round(sum(rc) / len(rc), 4)
    benchmark.extra_info["queries"] = len(w.queries)
    w.edges.unpersist()
