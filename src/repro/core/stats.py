"""Coverage and redundancy metrics (§6.6)."""
from __future__ import annotations

from repro.core.eve import EveResult


def coverage_ratio(result: EveResult, n_edges: int) -> float:
    """r_C = |E(SPG_k)| / |E| (≤ 1)."""
    return len(result.spg) / n_edges if n_edges else 0.0


def redundant_ratio(result: EveResult) -> float:
    """r_D = (|E(SPG^u)| − |E(SPG)|) / |E(SPG)|; 0 when SPG is empty."""
    if not result.spg:
        return 0.0
    return (len(result.upper) - len(result.spg)) / len(result.spg)
