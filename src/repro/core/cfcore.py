"""Colorful fair α-β core pruning: ``CFCore`` (Algorithm 2) and ``BCFCore``.

Pipeline (single-side): FCore → 2-hop graph on the fair side → drop
vertices with 2-hop degree < ``A_n^V * beta - 1`` → greedy colouring → ego
colourful β-core peel (Definitions 9/10) → remove pruned fair-side vertices
→ FCore again. The bi-side variant applies the bi-2-hop construction and an
ego colourful core on *both* sides before re-running BFCore.

Two drivers are provided: a fully local pipeline (used by the enumeration
micro-benchmarks, mirroring the paper's single-machine setup) and a hybrid
Spark pipeline in which the peeling and the Σd² 2-hop construction — the
expensive, data-parallel parts — run as DataFrame dataflow, while the
inherently sequential greedy colouring and queue peel run on the collected
(already small) 2-hop graph.
"""
from __future__ import annotations

from collections import Counter
from typing import Mapping, Sequence

from pyspark.sql import SparkSession

from repro.core.coloring import greedy_color
from repro.core.fcore import bfcore, fcore
from repro.core.fcore_df import bfcore_edges, fcore_edges
from repro.core.twohop import (
    Adjacency,
    adjacency_from_pairs,
    bi_two_hop,
    bi_two_hop_edges_df,
    two_hop,
    two_hop_edges_df,
)
from repro.graph.bipartite import BipartiteGraph


def ego_colorful_core(
    adj: Adjacency,
    val: Mapping[int, int],
    domain: Sequence[int],
    color: Mapping[int, int],
    k: int,
) -> set[int]:
    """Vertices of the ego colourful k-core (Definition 10) of ``adj``.

    ``ED_a(u)`` counts distinct colours among ``{u} ∪ N(u)`` restricted to
    attribute value ``a``; a vertex survives iff its minimum ED over the
    full attribute domain is >= k. Queue peel as in Algorithm 2 lines 6-24.
    """
    # M[u][(val, color)] = multiplicity in u's closed neighbourhood.
    m: dict[int, Counter] = {}
    ed: dict[int, dict[int, int]] = {}
    for u in adj:
        cnt: Counter = Counter()
        for w in adj[u] | {u}:
            cnt[(val[w], color[w])] += 1
        m[u] = cnt
        per_attr = {a: 0 for a in domain}
        for (a, _c) in cnt:
            per_attr[a] += 1
        ed[u] = per_attr

    removed: set[int] = set()
    queue = [u for u in adj if min(ed[u].values(), default=0) < k]
    removed.update(queue)
    while queue:
        u = queue.pop()
        key = (val[u], color[u])
        for w in adj[u]:
            if w in removed:
                continue
            m[w][key] -= 1
            if m[w][key] <= 0:
                ed[w][val[u]] -= 1
                if ed[w][val[u]] < k:
                    removed.add(w)
                    queue.append(w)
    return set(adj) - removed


def _prune_two_hop_side(
    adj: Adjacency,
    val: Mapping[int, int],
    domain: Sequence[int],
    k: int,
) -> set[int]:
    """Degree filter (< |A| * k - 1) then ego colourful k-core; surviving vertices."""
    thresh = len(domain) * k - 1
    keep = {v for v in adj if len(adj[v]) >= thresh}
    sub = {v: adj[v] & keep for v in keep}
    color = greedy_color(sub)
    return ego_colorful_core(sub, val, domain, color, k)


def cfcore(g: BipartiteGraph, alpha: int, beta: int) -> BipartiteGraph:
    """Algorithm 2, fully local. Contains every SSFBC of ``g`` (Lemmas 1-2)."""
    g1 = fcore(g, alpha, beta)
    if g1.n_edges == 0:
        return g1
    keep_v = _prune_two_hop_side(two_hop(g1, alpha), g1.v_val, g.attrs_v, beta)
    g2 = g1.induced(g1.adj_u.keys(), keep_v)
    return fcore(g2, alpha, beta) if g2.n_edges else g2


def bcfcore(g: BipartiteGraph, alpha: int, beta: int) -> BipartiteGraph:
    """Bi-side colorful pruning. Contains every BSFBC of ``g`` (Lemma 3 + Sec. IV-A)."""
    g1 = bfcore(g, alpha, beta)
    if g1.n_edges == 0:
        return g1
    keep_v = _prune_two_hop_side(bi_two_hop(g1, alpha), g1.v_val, g.attrs_v, beta)
    keep_u = _prune_two_hop_side(
        bi_two_hop(g1.mirror(), beta), g1.u_val, g.attrs_u, alpha
    )
    g2 = g1.induced(keep_u, keep_v)
    return bfcore(g2, alpha, beta) if g2.n_edges else g2


# --------------------------------------------------------------------------
# Hybrid Spark pipelines
# --------------------------------------------------------------------------

def _induce_from_edge_pandas(g: BipartiteGraph, edges_pdf) -> BipartiteGraph:
    us = set(edges_pdf["u"].tolist())
    vs = set(edges_pdf["v"].tolist())
    return g.induced(us, vs)


def fcore_spark(
    spark: SparkSession, g: BipartiteGraph, alpha: int, beta: int
) -> BipartiteGraph:
    """Distributed FCore; returns the pruned graph collected locally."""
    edges, _u_attrs, v_attrs = g.to_spark(spark)
    core = fcore_edges(edges, v_attrs, alpha, beta, len(g.attrs_v))
    return _induce_from_edge_pandas(g, core.toPandas())


def bfcore_spark(
    spark: SparkSession, g: BipartiteGraph, alpha: int, beta: int
) -> BipartiteGraph:
    """Distributed BFCore; returns the pruned graph collected locally."""
    edges, u_attrs, v_attrs = g.to_spark(spark)
    core = bfcore_edges(
        edges, u_attrs, v_attrs, alpha, beta, len(g.attrs_u), len(g.attrs_v)
    )
    return _induce_from_edge_pandas(g, core.toPandas())


def cfcore_spark(
    spark: SparkSession, g: BipartiteGraph, alpha: int, beta: int
) -> BipartiteGraph:
    """Hybrid Algorithm 2: DF peel + DF 2-hop, local colouring/ego peel, DF re-peel."""
    edges, _u_attrs, v_attrs = g.to_spark(spark)
    n_av = len(g.attrs_v)
    core = fcore_edges(edges, v_attrs, alpha, beta, n_av)
    core_pdf = core.toPandas()
    if core_pdf.empty:
        return _induce_from_edge_pandas(g, core_pdf)
    g1 = _induce_from_edge_pandas(g, core_pdf)
    pairs_pdf = two_hop_edges_df(core, alpha).toPandas()
    h = adjacency_from_pairs(
        list(zip(pairs_pdf["v1"].tolist(), pairs_pdf["v2"].tolist())),
        sorted(g1.adj_v),
    )
    keep_v = _prune_two_hop_side(h, g1.v_val, g.attrs_v, beta)
    g2 = g1.induced(g1.adj_u.keys(), keep_v)
    if g2.n_edges == 0:
        return g2
    edges2, _u2, v_attrs2 = g2.to_spark(spark)
    core2 = fcore_edges(edges2, v_attrs2, alpha, beta, n_av)
    return _induce_from_edge_pandas(g2, core2.toPandas())


def bcfcore_spark(
    spark: SparkSession, g: BipartiteGraph, alpha: int, beta: int
) -> BipartiteGraph:
    """Hybrid BCFCore: DF bi-peel + DF bi-2-hop on both sides, local ego peels."""
    edges, u_attrs, v_attrs = g.to_spark(spark)
    n_au, n_av = len(g.attrs_u), len(g.attrs_v)
    core = bfcore_edges(edges, u_attrs, v_attrs, alpha, beta, n_au, n_av)
    core_pdf = core.toPandas()
    if core_pdf.empty:
        return _induce_from_edge_pandas(g, core_pdf)
    g1 = _induce_from_edge_pandas(g, core_pdf)

    pairs_v = bi_two_hop_edges_df(core, u_attrs, alpha, n_au).toPandas()
    h_v = adjacency_from_pairs(
        list(zip(pairs_v["v1"].tolist(), pairs_v["v2"].tolist())), sorted(g1.adj_v)
    )
    keep_v = _prune_two_hop_side(h_v, g1.v_val, g.attrs_v, beta)

    mirrored = core.select(
        core["v"].alias("u"), core["u"].alias("v")
    )
    pairs_u = bi_two_hop_edges_df(
        mirrored, v_attrs.withColumnRenamed("v", "u"), beta, n_av
    ).toPandas()
    h_u = adjacency_from_pairs(
        list(zip(pairs_u["v1"].tolist(), pairs_u["v2"].tolist())), sorted(g1.adj_u)
    )
    keep_u = _prune_two_hop_side(h_u, g1.u_val, g.attrs_u, alpha)

    g2 = g1.induced(keep_u, keep_v)
    if g2.n_edges == 0:
        return g2
    edges2, u2, v2 = g2.to_spark(spark)
    core2 = bfcore_edges(edges2, u2, v2, alpha, beta, n_au, n_av)
    return _induce_from_edge_pandas(g2, core2.toPandas())
