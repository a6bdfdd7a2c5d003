"""Fair α-β core (Algorithm 1, ``FCore``) and bi-fair α-β core (``BFCore``).

Exact O(E) queue-based peeling on the local graph representation. The fair
α-β core (Definition 8) keeps upper vertices whose *attribute degree* to
every V-attribute is >= beta and lower vertices whose degree is >= alpha;
the bi-fair core (Definition 13) uses attribute degrees on both sides. Any
SSFBC / BSFBC survives the respective peel (Lemmas 1 and 3), which is what
the tests assert.

The distributed DataFrame formulation lives in :mod:`repro.core.fcore_df`.
"""
from __future__ import annotations

from collections import deque

from repro.graph.bipartite import BipartiteGraph


def fcore(g: BipartiteGraph, alpha: int, beta: int) -> BipartiteGraph:
    """Fair α-β core of ``g`` (Algorithm 1).

    Returns the induced subgraph on the surviving vertices (attribute
    domains preserved). With ``beta >= 1`` an attribute value absent from
    ``g`` empties the core, matching Definition 8.
    """
    if alpha < 1 or beta < 1:
        raise ValueError("fcore requires alpha >= 1 and beta >= 1")
    # Attribute degrees of U vertices over the full A(V) domain.
    attdeg = {
        u: {a: 0 for a in g.attrs_v} for u in g.adj_u
    }
    for u, nbrs in g.adj_u.items():
        for v in nbrs:
            attdeg[u][g.v_val[v]] += 1
    deg = {v: len(nbrs) for v, nbrs in g.adj_v.items()}

    removed_u: set[int] = set()
    removed_v: set[int] = set()
    q: deque[tuple[str, int]] = deque()
    for u in g.adj_u:
        if min(attdeg[u].values()) < beta:
            removed_u.add(u)
            q.append(("u", u))
    for v in g.adj_v:
        if deg[v] < alpha:
            removed_v.add(v)
            q.append(("v", v))

    while q:
        side, x = q.popleft()
        if side == "u":
            for v in g.adj_u[x]:
                if v in removed_v:
                    continue
                deg[v] -= 1
                if deg[v] < alpha:
                    removed_v.add(v)
                    q.append(("v", v))
        else:
            a = g.v_val[x]
            for u in g.adj_v[x]:
                if u in removed_u:
                    continue
                attdeg[u][a] -= 1
                if attdeg[u][a] < beta:
                    removed_u.add(u)
                    q.append(("u", u))

    return g.induced(
        (u for u in g.adj_u if u not in removed_u),
        (v for v in g.adj_v if v not in removed_v),
    )


def bfcore(g: BipartiteGraph, alpha: int, beta: int) -> BipartiteGraph:
    """Bi-fair α-β core of ``g`` (Definition 13, the ``BFCore`` peel).

    Upper vertices need attribute degree >= beta for every value of A(V);
    lower vertices need attribute degree >= alpha for every value of A(U).
    """
    if alpha < 1 or beta < 1:
        raise ValueError("bfcore requires alpha >= 1 and beta >= 1")
    attdeg_u = {u: {a: 0 for a in g.attrs_v} for u in g.adj_u}
    for u, nbrs in g.adj_u.items():
        for v in nbrs:
            attdeg_u[u][g.v_val[v]] += 1
    attdeg_v = {v: {a: 0 for a in g.attrs_u} for v in g.adj_v}
    for v, nbrs in g.adj_v.items():
        for u in nbrs:
            attdeg_v[v][g.u_val[u]] += 1

    removed_u: set[int] = set()
    removed_v: set[int] = set()
    q: deque[tuple[str, int]] = deque()
    for u in g.adj_u:
        if min(attdeg_u[u].values()) < beta:
            removed_u.add(u)
            q.append(("u", u))
    for v in g.adj_v:
        if min(attdeg_v[v].values()) < alpha:
            removed_v.add(v)
            q.append(("v", v))

    while q:
        side, x = q.popleft()
        if side == "u":
            a = g.u_val[x]
            for v in g.adj_u[x]:
                if v in removed_v:
                    continue
                attdeg_v[v][a] -= 1
                if attdeg_v[v][a] < alpha:
                    removed_v.add(v)
                    q.append(("v", v))
        else:
            a = g.v_val[x]
            for u in g.adj_v[x]:
                if u in removed_u:
                    continue
                attdeg_u[u][a] -= 1
                if attdeg_u[u][a] < beta:
                    removed_u.add(u)
                    q.append(("u", u))

    return g.induced(
        (u for u in g.adj_u if u not in removed_u),
        (v for v in g.adj_v if v not in removed_v),
    )
