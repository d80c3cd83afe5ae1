"""Graph substrate: edge-DataFrame model, generators, BFS, query workloads.

The paper's input is a directed graph ``G=(V,E)``; here a graph is a Spark
DataFrame with long columns ``src`` and ``dst`` (deduplicated edges). All
algorithms in :mod:`repro.core` and :mod:`repro.baselines` consume this
representation.
"""
from repro.graphs.model import (  # noqa: F401
    EDGE_SCHEMA,
    degrees,
    edges_from_pairs,
    edges_to_pandas,
    normalize_edges,
    num_edges,
    num_vertices,
    reverse_edges,
)
