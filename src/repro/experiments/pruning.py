"""Exp-1 (paper Figs. 3-4, tabulated): pruning power and cost.

Compares remaining vertices and wall time of FCore vs CFCore (single-side)
and BFCore vs BCFCore (bi-side) on one dataset while varying alpha and
beta, reproducing the claims: (a) both prune drastically; (b) CFCore prunes
strictly more than FCore at extra cost; (c) remaining size shrinks as
alpha/beta grow.
"""
from __future__ import annotations

from repro.core.cfcore import bcfcore, cfcore
from repro.core.fcore import bfcore, fcore
from repro.experiments.datasets import DATASETS, load
from repro.experiments.runner import timed


def sweep(
    dataset: str,
    *,
    bi: bool = False,
    alphas: list[int] | None = None,
    betas: list[int] | None = None,
) -> list[dict]:
    """Vary alpha at default beta, and beta at default alpha."""
    d = DATASETS[dataset]
    g = load(dataset)
    a0 = d.alpha_b if bi else d.alpha_s
    b0 = d.beta_b if bi else d.beta_s
    alphas = alphas or [max(1, a0 - 2), a0 - 1, a0, a0 + 1, a0 + 2]
    betas = betas or [max(1, b0 - 2), b0 - 1, b0, b0 + 1, b0 + 2]
    basic, colorful = (bfcore, bcfcore) if bi else (fcore, cfcore)
    rows = []
    grid = [("alpha", a, b0) for a in sorted(set(alphas))] + [
        ("beta", a0, b) for b in sorted(set(betas))
    ]
    for varied, a, b in grid:
        g1, t1 = timed(lambda: basic(g, a, b))
        g2, t2 = timed(lambda: colorful(g, a, b))
        rows.append(
            {
                "dataset": dataset,
                "side": "bi" if bi else "single",
                "varied": varied,
                "alpha": a,
                "beta": b,
                "n_original": g.n_u + g.n_v,
                "n_fcore": g1.n_u + g1.n_v,
                "n_cfcore": g2.n_u + g2.n_v,
                "t_fcore_s": round(t1, 3),
                "t_cfcore_s": round(t2, 3),
            }
        )
    return rows
