"""Table 2 benchmark: dataset stand-in generation cost + recorded stats."""
import pytest

from repro.graphs.datasets import SPECS, dataset_edges_pdf

NAMES = [s.name for s in SPECS]


@pytest.mark.parametrize("name", NAMES)
def test_generate_dataset(benchmark, name):
    pdf = benchmark.pedantic(
        lambda: dataset_edges_pdf(name, "test"), rounds=1, iterations=1
    )
    n_v = len(set(pdf["src"]) | set(pdf["dst"]))
    benchmark.extra_info["n_vertices"] = n_v
    benchmark.extra_info["n_edges"] = len(pdf)
    benchmark.extra_info["d_avg"] = round(len(pdf) / n_v, 2)
