"""Cardinality estimation for sub-queries: |R(q')| (Algorithm 1 line 4/6).

The paper cites [46, 51, 58] for estimating the number of matches of a
sub-query. We use the standard configuration-model (Chung–Lu) estimate
computed from the data graph's *actual* degree moments:

    |R(q')| ~= prod_{v in V(q')} M_{deg_{q'}(v)} / (2|E|)^{|E(q')|}

where ``M_p = sum_u deg_G(u)^p``. For a star this reduces to the exact
(ordered) star count up to falling-factorial corrections; for cyclic
sub-queries it captures the hub-driven blow-up that makes plan choice
matter on power-law graphs. Estimates only steer the optimiser — result
correctness never depends on them.
"""
from __future__ import annotations

from repro.graphs.queries import SubQuery
from repro.graphs.storage import GraphStats


def estimate(sub: SubQuery, stats: GraphStats) -> float:
    """Estimated number of (symmetry-unbroken) matches of ``sub``."""
    two_m = max(1.0, stats.moments.get(1, 2.0 * stats.n_edges))
    est = 1.0
    for v in sub.vertices:
        d = sub.degree(v)
        est *= _moment(stats, d)
    est /= two_m ** len(sub.edges)
    return max(1.0, est)


def _moment(stats: GraphStats, p: int) -> float:
    """M_p, extrapolated geometrically beyond the precomputed order."""
    if p in stats.moments:
        return stats.moments[p]
    pmax = max(stats.moments)
    ratio = stats.moments[pmax] / max(1.0, stats.moments[pmax - 1])
    return stats.moments[pmax] * ratio ** (p - pmax)
