"""Proportion fair biclique enumeration: FairBCEMPro++ and BFairBCEMPro++.

The Pro models (Definitions 5-6) add a per-attribute ratio constraint
``|S_a| / |S| >= theta``. FairBCEMPro++ is Algorithm 6 with the fairness
inspection replaced by the proportion inspection and ``Combination``
replaced by ``CombinationPro`` (Sec. III-D); both specialisations are
handled inside :mod:`repro.core.ssfbc` via the ``theta`` parameter.
BFairBCEMPro++ additionally applies ``CombinationPro`` on the upper side
and a ratio-aware ``MFSCheck`` (Sec. IV-C).

theta is meaningful in (0, 0.5] for two attribute values (and at most
1/|A| in general).
"""
from __future__ import annotations

from repro.core.ssfbc import Biclique, Ordering, search_ssfbc
from repro.graph.bipartite import BipartiteGraph


def search_pssfbc(
    g_pruned: BipartiteGraph,
    alpha: int,
    beta: int,
    delta: int,
    theta: float,
    *,
    ordering: Ordering = "deg",
) -> list[Biclique]:
    """FairBCEMPro++: all proportion single-side fair bicliques of a pruned graph."""
    return search_ssfbc(
        g_pruned, alpha, beta, delta,
        algorithm="bcem_pp", ordering=ordering, theta=theta,
    )


def search_pbsfbc(
    g_pruned: BipartiteGraph,
    alpha: int,
    beta: int,
    delta: int,
    theta: float,
    *,
    ordering: Ordering = "deg",
) -> list[Biclique]:
    """BFairBCEMPro++: all proportion bi-side fair bicliques of a pruned graph."""
    from repro.core.bsfbc import expand_to_bsfbc

    ssfbcs = search_pssfbc(g_pruned, alpha, beta, delta, theta, ordering=ordering)
    return expand_to_bsfbc(g_pruned, ssfbcs, alpha, beta, delta, theta)


def fair_bcem_pro(
    g: BipartiteGraph,
    alpha: int,
    beta: int,
    delta: int,
    theta: float,
    *,
    ordering: Ordering = "deg",
) -> list[Biclique]:
    """CFCore pruning + PSSFBC search (pruning stays valid: Pro adds constraints)."""
    from repro.core.cfcore import cfcore

    return search_pssfbc(
        cfcore(g, alpha, beta), alpha, beta, delta, theta, ordering=ordering
    )


def bfair_bcem_pro(
    g: BipartiteGraph,
    alpha: int,
    beta: int,
    delta: int,
    theta: float,
    *,
    ordering: Ordering = "deg",
) -> list[Biclique]:
    """BCFCore pruning + PBSFBC search."""
    from repro.core.cfcore import bcfcore

    return search_pbsfbc(
        bcfcore(g, alpha, beta), alpha, beta, delta, theta, ordering=ordering
    )
