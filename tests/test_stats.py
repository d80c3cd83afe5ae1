"""Coverage/redundancy metrics (§6.6)."""
from repro.core.eve import EveResult
from repro.core.stats import coverage_ratio, redundant_ratio


def _res(spg, upper):
    return EveResult(
        s=0, t=1, k=5, spg=set(spg), upper=set(upper),
        definite=set(), undetermined=set(),
    )


def test_coverage_ratio():
    r = _res({(0, 1), (1, 2)}, {(0, 1), (1, 2)})
    assert coverage_ratio(r, 10) == 0.2
    assert coverage_ratio(r, 0) == 0.0


def test_redundant_ratio():
    r = _res({(0, 1), (1, 2)}, {(0, 1), (1, 2), (2, 3)})
    assert redundant_ratio(r) == 0.5
    assert redundant_ratio(_res(set(), set())) == 0.0
    assert redundant_ratio(_res({(0, 1)}, {(0, 1)})) == 0.0
