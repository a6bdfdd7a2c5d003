"""Exp-2/Exp-3 (paper Figs. 2 and 5, tabulated): runtime vs alpha/beta/delta.

Runs the SSFBC algorithms (NSF, FairBCEM, FairBCEM++) and BSFBC algorithms
(BNSF, BFairBCEM, BFairBCEM++) while varying one parameter around the
defaults. NSF/BNSF only run on the datasets listed in ``NSF_DATASETS``
(the paper likewise only reports NSF on DBLP because it times out
elsewhere); a per-run time cap marks slower cells as INF.
"""
from __future__ import annotations

from repro.core.bsfbc import search_bsfbc
from repro.core.cfcore import bcfcore, cfcore
from repro.core.ssfbc import SearchTimeout, search_ssfbc
from repro.experiments.datasets import DATASETS, load
from repro.experiments.runner import timed

NSF_DATASETS = ("dblp-lite", "youtube-lite")
TIME_CAP_S = 60.0


def _run(model: str, g, alpha: int, beta: int, delta: int, engine: str, cap: float):
    if model == "ssfbc":
        gp = cfcore(g, alpha, beta)
        return search_ssfbc(gp, alpha, beta, delta, algorithm=engine, time_budget_s=cap)
    gp = bcfcore(g, alpha, beta)
    return search_bsfbc(gp, alpha, beta, delta, algorithm=engine, time_budget_s=cap)


def sweep(
    dataset: str,
    model: str = "ssfbc",
    *,
    include_nsf: bool | None = None,
    time_cap_s: float = TIME_CAP_S,
) -> list[dict]:
    """Vary alpha, beta, delta one at a time around the defaults."""
    d = DATASETS[dataset]
    g = load(dataset)
    a0 = d.alpha_s if model == "ssfbc" else d.alpha_b
    b0 = d.beta_s if model == "ssfbc" else d.beta_b
    d0 = d.delta
    if include_nsf is None:
        include_nsf = dataset in NSF_DATASETS
    engines = [("NSF", "nsf")] if include_nsf else []
    engines += [("FairBCEM", "bcem"), ("FairBCEM++", "bcem_pp")]
    if model == "bsfbc":
        engines = [("B" + n if not n.startswith("B") else n, e) for n, e in engines]

    grid = (
        [("alpha", a, b0, d0) for a in [a0 - 1, a0, a0 + 1]]
        + [("beta", a0, b, d0) for b in [b0 - 1, b0, b0 + 1]]
        + [("delta", a0, b0, dd) for dd in [d0 - 1, d0, d0 + 1]]
    )
    rows = []
    capped: set[str] = set()
    for varied, a, b, dd in grid:
        for display, engine in engines:
            row = dict(dataset=dataset, model=model, algorithm=display,
                       varied=varied, alpha=a, beta=b, delta=dd)
            if display in capped:
                # Once an engine blows the budget, skip its remaining cells —
                # the paper's 24h INF convention, scaled.
                rows.append({**row, "time_s": "INF", "n_results": None})
                continue
            try:
                res, t = timed(lambda: _run(model, g, a, b, dd, engine, time_cap_s))
                rows.append({**row, "time_s": round(t, 3), "n_results": len(res)})
            except SearchTimeout:
                capped.add(display)
                rows.append(
                    {**row, "time_s": f"INF(>{time_cap_s:.0f}s)", "n_results": None}
                )
    return rows
