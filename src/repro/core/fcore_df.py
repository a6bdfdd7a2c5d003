"""Distributed fair α-β core / bi-fair α-β core as DataFrame dataflow.

Synchronous iterate-to-fixpoint peeling: each round recomputes (attribute)
degrees with ``groupBy`` aggregations and keeps only edges whose endpoints
still qualify (``left_semi`` joins). Fair cores are confluent closures — the
maximal subgraph satisfying the degree constraints is unique and any removal
order reaches it — so the synchronous rounds converge to exactly the
sequential peel of :mod:`repro.core.fcore` (asserted by tests).

``localCheckpoint`` truncates the lineage every round; without it the plan
doubles per iteration and Catalyst analysis time dominates.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _u_ok(edges: DataFrame, v_attrs: DataFrame, beta: int, n_attrs_v: int) -> DataFrame:
    """Upper vertices whose attribute degree is >= beta for all ``n_attrs_v`` values.

    An attribute value with zero neighbours never appears in the groupBy, so
    "all values qualify" is expressed as "the number of qualifying values
    equals the domain size".
    """
    return (
        edges.join(v_attrs, "v")
        .groupBy("u", "val")
        .agg(F.count("*").alias("ad"))
        .where(F.col("ad") >= beta)
        .groupBy("u")
        .agg(F.count("*").alias("nvals"))
        .where(F.col("nvals") >= n_attrs_v)
        .select("u")
    )


def _v_ok_degree(edges: DataFrame, alpha: int) -> DataFrame:
    """Lower vertices with plain degree >= alpha (FCore's V-side rule)."""
    return (
        edges.groupBy("v")
        .agg(F.count("*").alias("d"))
        .where(F.col("d") >= alpha)
        .select("v")
    )


def _v_ok_attr(edges: DataFrame, u_attrs: DataFrame, alpha: int, n_attrs_u: int) -> DataFrame:
    """Lower vertices with attribute degree >= alpha for all A(U) values (BFCore)."""
    return (
        edges.join(u_attrs, "u")
        .groupBy("v", "val")
        .agg(F.count("*").alias("ad"))
        .where(F.col("ad") >= alpha)
        .groupBy("v")
        .agg(F.count("*").alias("nvals"))
        .where(F.col("nvals") >= n_attrs_u)
        .select("v")
    )


def _iterate(edges: DataFrame, step) -> DataFrame:
    """Apply ``step`` to the edge set until the edge count stops shrinking."""
    edges = edges.localCheckpoint()
    prev = -1
    while True:
        n = edges.count()
        if n == prev or n == 0:
            return edges
        prev = n
        edges = step(edges).localCheckpoint()


def fcore_edges(
    edges: DataFrame,
    v_attrs: DataFrame,
    alpha: int,
    beta: int,
    n_attrs_v: int,
) -> DataFrame:
    """Edges of the fair α-β core (Definition 8), distributed.

    Vertices of the core are exactly the endpoints of the returned edges
    (every core vertex has degree >= 1 because alpha, beta >= 1).
    """
    if alpha < 1 or beta < 1:
        raise ValueError("fcore_edges requires alpha >= 1 and beta >= 1")

    def step(e: DataFrame) -> DataFrame:
        return e.join(_u_ok(e, v_attrs, beta, n_attrs_v), "u", "left_semi").join(
            _v_ok_degree(e, alpha), "v", "left_semi"
        )

    return _iterate(edges, step)


def bfcore_edges(
    edges: DataFrame,
    u_attrs: DataFrame,
    v_attrs: DataFrame,
    alpha: int,
    beta: int,
    n_attrs_u: int,
    n_attrs_v: int,
) -> DataFrame:
    """Edges of the bi-fair α-β core (Definition 13), distributed."""
    if alpha < 1 or beta < 1:
        raise ValueError("bfcore_edges requires alpha >= 1 and beta >= 1")

    def step(e: DataFrame) -> DataFrame:
        return e.join(_u_ok(e, v_attrs, beta, n_attrs_v), "u", "left_semi").join(
            _v_ok_attr(e, u_attrs, alpha, n_attrs_u), "v", "left_semi"
        )

    return _iterate(edges, step)
