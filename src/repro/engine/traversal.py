"""Traversal primitives over edge DataFrames.

All variable-length path semantics in this engine are *reachability*
(distinct endpoint pairs), matching how the paper's workload consumes
matches (every query groups or sets over the matched endpoints, and
connector rewritings preserve reachability, not path multiplicity).

Each k-step expansion is a shuffle join (broadcast joins are disabled by
the session fixture); intermediates are persisted per step and lineage
is cut with ``localCheckpoint`` so a 10-hop expansion does not build a
10-deep join plan.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _pairs(edges: DataFrame) -> DataFrame:
    return edges.select("src", "dst").distinct()


def _step(frontier: DataFrame, edges: DataFrame) -> DataFrame:
    """One expansion step: pairs (src, dst) ⋈ edges (dst → next)."""
    e = edges.select(F.col("src").alias("_m"), F.col("dst").alias("_d"))
    return (
        frontier.join(e, frontier.dst == e._m)
        .select(frontier.src, F.col("_d").alias("dst"))
        .distinct()
    )


def khop_pairs(edges: DataFrame, k: int) -> DataFrame:
    """Distinct vertex pairs connected by a walk of *exactly* k edges."""
    if k < 1:
        raise ValueError("k must be >= 1")
    frontier = _pairs(edges)
    for _ in range(k - 1):
        frontier = _step(frontier, edges).localCheckpoint(eager=False)
    return frontier


def var_length_pairs(
    edges: DataFrame,
    lower: int,
    upper: int,
    zero_vertices: DataFrame | None = None,
) -> DataFrame:
    """Distinct pairs connected by a walk of length in ``[lower, upper]``.

    ``lower == 0`` adds identity pairs for ``zero_vertices`` (a DataFrame
    with an ``id`` column — the vertices a zero-length path may anchor).
    """
    if lower == 0 and zero_vertices is None:
        raise ValueError("lower=0 requires zero_vertices")
    acc: DataFrame | None = None
    if lower == 0:
        acc = zero_vertices.select(
            F.col("id").alias("src"), F.col("id").alias("dst")
        ).distinct()
    frontier = _pairs(edges)
    for k in range(1, upper + 1):
        if k > 1:
            frontier = _step(frontier, edges)
        frontier = frontier.localCheckpoint(eager=False)
        if k >= max(lower, 1):
            acc = frontier if acc is None else acc.union(frontier)
    if acc is None:  # upper == 0
        return (
            zero_vertices.select(F.col("id").alias("src"), F.col("id").alias("dst"))
            .distinct()
        )
    return acc.distinct()


def khop_walk_count(edges: DataFrame, k: int, exclude_loops: bool = True) -> int:
    """Number of k-edge walks; with ``exclude_loops``, walks whose
    endpoints coincide are dropped (for k ≤ 2 on a loop-free graph this
    equals the number of k-length *simple* paths — the quantity Fig. 5
    compares the estimator against for 2-hop connectors)."""
    if k < 1:
        raise ValueError("k must be >= 1")
    walks = edges.select("src", "dst").withColumn("n", F.lit(1).cast("long"))
    for _ in range(k - 1):
        nxt = edges.select(F.col("src").alias("_m"), F.col("dst").alias("_d"))
        walks = (
            walks.join(nxt, walks.dst == nxt._m)
            .groupBy(walks.src, F.col("_d").alias("dst"))
            .agg(F.sum("n").alias("n"))
            .localCheckpoint(eager=False)
        )
    if exclude_loops:
        walks = walks.where(F.col("src") != F.col("dst"))
    row = walks.agg(F.sum("n").alias("total")).collect()[0]
    return int(row["total"] or 0)


def khop_pairs_with_max(
    edges: DataFrame, lower: int, upper: int, prop: str = "ts"
) -> DataFrame:
    """Distinct pairs within ``[lower, upper]`` hops, with the maximum of
    edge property ``prop`` over *all* edges of *all* connecting walks.

    Max is associative and commutative, so this composes exactly across
    path contraction: running it over a connector whose edges carry the
    per-contracted-path max yields the same result as over the raw graph
    (the Q4 equivalence).
    """
    if lower < 1:
        raise ValueError("lower must be >= 1 (zero-length paths carry no edges)")
    base = edges.select("src", "dst", F.col(prop).alias("m"))
    frontier = base.groupBy("src", "dst").agg(F.max("m").alias("m"))
    acc = frontier if lower <= 1 else None
    for k in range(2, upper + 1):
        nxt = edges.select(
            F.col("src").alias("_m"), F.col("dst").alias("_d"), F.col(prop).alias("_p")
        )
        frontier = (
            frontier.join(nxt, frontier.dst == nxt._m)
            .select(
                frontier.src,
                F.col("_d").alias("dst"),
                F.greatest(frontier.m, F.col("_p")).alias("m"),
            )
            .groupBy("src", "dst")
            .agg(F.max("m").alias("m"))
            .localCheckpoint(eager=False)
        )
        if k >= lower:
            acc = frontier if acc is None else acc.union(frontier)
    if acc is None:
        raise ValueError("empty hop range")
    return acc.groupBy("src", "dst").agg(F.max("m").alias("m"))


def restrict_endpoints(
    pairs: DataFrame,
    vertices: DataFrame,
    src_type: str | None = None,
    dst_type: str | None = None,
) -> DataFrame:
    """Filter a pair table to endpoints of the given vertex types."""
    out = pairs
    if src_type is not None:
        keep = vertices.where(F.col("vtype") == src_type).select(
            F.col("id").alias("src")
        )
        out = out.join(keep, "src")
    if dst_type is not None:
        keep = vertices.where(F.col("vtype") == dst_type).select(
            F.col("id").alias("dst")
        )
        out = out.join(keep, "dst")
    return out
