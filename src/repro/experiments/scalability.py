"""Exp-5 (paper Fig. 7, tabulated): scalability in graph size.

Subsamples 20%-100% of a dataset's edges uniformly at random (the paper's
protocol) and times the SSFBC and BSFBC algorithm pairs on each subgraph.
Claim to reproduce: the ++ algorithms' runtime grows more smoothly with
graph size than the base algorithms'.
"""
from __future__ import annotations

import numpy as np

from repro.core.bsfbc import search_bsfbc
from repro.core.cfcore import bcfcore, cfcore
from repro.core.ssfbc import search_ssfbc
from repro.experiments.datasets import DATASETS, load
from repro.experiments.runner import timed
from repro.graph.bipartite import BipartiteGraph

FRACTIONS = [0.2, 0.4, 0.6, 0.8, 1.0]


def edge_sample(g: BipartiteGraph, fraction: float, seed: int = 0) -> BipartiteGraph:
    """Keep a uniform random ``fraction`` of the edges (vertex sets preserved)."""
    rng = np.random.default_rng(seed)
    edges = sorted((u, v) for u, nbrs in g.adj_u.items() for v in nbrs)
    keep = rng.random(len(edges)) < fraction
    kept = [e for e, k in zip(edges, keep) if k]
    return BipartiteGraph.from_edges(
        kept, g.u_val, g.v_val, attrs_u=g.attrs_u, attrs_v=g.attrs_v
    )


def sweep(dataset: str = "dblp-lite", seed: int = 0) -> list[dict]:
    d = DATASETS[dataset]
    g = load(dataset)
    rows = []
    for frac in FRACTIONS:
        sub = g if frac >= 1.0 else edge_sample(g, frac, seed)
        gp_s, tp_s = timed(lambda: cfcore(sub, d.alpha_s, d.beta_s))
        _, t_pp = timed(lambda: search_ssfbc(gp_s, d.alpha_s, d.beta_s, d.delta, algorithm="bcem_pp"))
        _, t_b = timed(lambda: search_ssfbc(gp_s, d.alpha_s, d.beta_s, d.delta, algorithm="bcem"))
        gp_b, tp_b = timed(lambda: bcfcore(sub, d.alpha_b, d.beta_b))
        _, tb_pp = timed(lambda: search_bsfbc(gp_b, d.alpha_b, d.beta_b, d.delta, algorithm="bcem_pp"))
        _, tb_b = timed(lambda: search_bsfbc(gp_b, d.alpha_b, d.beta_b, d.delta, algorithm="bcem"))
        rows.append(
            {
                "dataset": dataset,
                "fraction": frac,
                "n_edges": sub.n_edges,
                "FairBCEM_s": round(tp_s + t_b, 3),
                "FairBCEMpp_s": round(tp_s + t_pp, 3),
                "BFairBCEM_s": round(tp_b + tb_b, 3),
                "BFairBCEMpp_s": round(tp_b + tb_pp, 3),
            }
        )
    return rows
