"""Exp-4 (paper Fig. 6, tabulated): result counts vs maximal bicliques.

On one dataset, counts maximal bicliques, SSFBCs and BSFBCs while varying
alpha, beta, delta. Matching the paper's protocol, the maximal-biclique
comparison uses |L| >= alpha, |R| >= 2*beta for the single-side comparison
and |L| >= 2*alpha, |R| >= 2*beta for the bi-side comparison (with two
attribute values a fair side needs at least 2x the per-attribute minimum).
"""
from __future__ import annotations

from repro.core.bsfbc import search_bsfbc
from repro.core.cfcore import bcfcore, cfcore
from repro.core.ssfbc import enumerate_maximal_bicliques, search_ssfbc
from repro.experiments.datasets import DATASETS, load


def count_row(dataset: str, alpha: int, beta: int, delta: int, varied: str) -> dict:
    g = load(dataset)
    n_av = len(g.attrs_v)
    n_au = len(g.attrs_u)
    ssfbc = search_ssfbc(cfcore(g, alpha, beta), alpha, beta, delta)
    bsfbc = search_bsfbc(bcfcore(g, alpha, beta), alpha, beta, delta)
    mb_s = enumerate_maximal_bicliques(g, min_l=alpha, min_r=n_av * beta)
    mb_b = enumerate_maximal_bicliques(g, min_l=n_au * alpha, min_r=n_av * beta)
    return {
        "dataset": dataset,
        "varied": varied,
        "alpha": alpha,
        "beta": beta,
        "delta": delta,
        "n_maximal_biclique_s": len(mb_s),
        "n_ssfbc": len(ssfbc),
        "n_maximal_biclique_b": len(mb_b),
        "n_bsfbc": len(bsfbc),
    }


def sweep(dataset: str = "wikicat-lite") -> list[dict]:
    d = DATASETS[dataset]
    a0, b0, d0 = d.alpha_b, d.beta_b, d.delta
    rows = []
    for a in [a0 - 1, a0, a0 + 1]:
        rows.append(count_row(dataset, a, b0, d0, "alpha"))
    for b in [b0 - 1, b0, b0 + 1]:
        rows.append(count_row(dataset, a0, b, d0, "beta"))
    for dd in [d0 - 1, d0, d0 + 1]:
        rows.append(count_row(dataset, a0, b0, dd, "delta"))
    return rows
