"""2-hop graphs on the fair side (Algorithm 3 and Algorithm 8).

``Construct2HopGraph`` connects two fair-side vertices iff they share at
least ``alpha`` common neighbours; the bi-side variant
(``BiConstruct2HopGraph``) requires at least ``alpha`` common neighbours *of
every upper-side attribute value*. Both a local Σd² implementation and the
distributed self-join DataFrame formulation are provided; the DataFrame
versions are row-for-row checked against DuckDB SQL in the tests.

The local functions take the fair side as the lower side ``V``; to build
the upper-side 2-hop graph used by BCFCore, pass ``g.mirror()``.
"""
from __future__ import annotations

import itertools
from collections import Counter, defaultdict

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.bipartite import BipartiteGraph

Adjacency = dict[int, set[int]]


def two_hop(g: BipartiteGraph, alpha: int) -> Adjacency:
    """Algorithm 3: undirected 2-hop adjacency over ``V`` (common neighbours >= alpha)."""
    common: Counter[tuple[int, int]] = Counter()
    for nbrs in g.adj_u.values():
        for a, b in itertools.combinations(sorted(nbrs), 2):
            common[(a, b)] += 1
    adj: Adjacency = {v: set() for v in g.adj_v}
    for (a, b), c in common.items():
        if c >= alpha:
            adj[a].add(b)
            adj[b].add(a)
    return adj


def bi_two_hop(g: BipartiteGraph, alpha: int) -> Adjacency:
    """Algorithm 8: 2-hop adjacency requiring >= alpha common neighbours per A(U) value."""
    common: dict[tuple[int, int], Counter] = defaultdict(Counter)
    for u, nbrs in g.adj_u.items():
        a_u = g.u_val[u]
        for a, b in itertools.combinations(sorted(nbrs), 2):
            common[(a, b)][a_u] += 1
    adj: Adjacency = {v: set() for v in g.adj_v}
    for (a, b), cnt in common.items():
        if all(cnt.get(x, 0) >= alpha for x in g.attrs_u):
            adj[a].add(b)
            adj[b].add(a)
    return adj


def two_hop_edges_df(edges: DataFrame, alpha: int) -> DataFrame:
    """Distributed Algorithm 3: returns ``(v1, v2)`` with ``v1 < v2``.

    A self-join of the edge list on the shared upper endpoint counts common
    neighbours of every lower-side pair; the ``v1 < v2`` predicate emits each
    undirected 2-hop edge once.
    """
    e1 = edges.select(F.col("u"), F.col("v").alias("v1"))
    e2 = edges.select(F.col("u"), F.col("v").alias("v2"))
    return (
        e1.join(e2, "u")
        .where(F.col("v1") < F.col("v2"))
        .groupBy("v1", "v2")
        .agg(F.count("*").alias("cn"))
        .where(F.col("cn") >= alpha)
        .select("v1", "v2")
    )


def bi_two_hop_edges_df(
    edges: DataFrame, u_attrs: DataFrame, alpha: int, n_attrs_u: int
) -> DataFrame:
    """Distributed Algorithm 8: pairs with >= alpha common neighbours per A(U) value."""
    ea = edges.join(u_attrs, "u")
    e1 = ea.select("u", F.col("val"), F.col("v").alias("v1"))
    e2 = ea.select("u", F.col("v").alias("v2"))
    return (
        e1.join(e2, "u")
        .where(F.col("v1") < F.col("v2"))
        .groupBy("v1", "v2", "val")
        .agg(F.count("*").alias("cn"))
        .where(F.col("cn") >= alpha)
        .groupBy("v1", "v2")
        .agg(F.count("*").alias("nvals"))
        .where(F.col("nvals") >= n_attrs_u)
        .select("v1", "v2")
    )


def adjacency_from_pairs(
    pairs: list[tuple[int, int]], vertices: list[int]
) -> Adjacency:
    """Build an undirected adjacency dict from (v1, v2) pairs over ``vertices``."""
    adj: Adjacency = {v: set() for v in vertices}
    for a, b in pairs:
        adj[a].add(b)
        adj[b].add(a)
    return adj
