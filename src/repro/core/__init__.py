"""EVE — the paper's primary contribution.

- :mod:`repro.core.essential` — §3: propagation for essential vertices.
- :mod:`repro.core.labeling` — §4: edge labeling / upper-bound graph.
- :mod:`repro.core.verify` — §5: departures/arrivals + DFS verification.
- :mod:`repro.core.eve` — end-to-end EVE pipeline with per-phase timings.
- :mod:`repro.core.stats` — §6.6 coverage/redundant ratios.
"""
