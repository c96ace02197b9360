"""Triangle listing over an undirected edge DataFrame.

Used twice by IUAD: (i) the stable-triangle rule during SCN construction is
a *per-name* local check (handled in ``core.scn``); (ii) the co-author
clique coincidence ratio γ₂ needs, for every SCN vertex, the set of
triangles it participates in. This module lists triangles globally with the
standard two-join dataflow on canonically ordered edges — pure Catalyst,
shuffle joins (broadcast is disabled session-wide).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def canonical_edges(edges: DataFrame, *, u: str = "u", v: str = "v") -> DataFrame:
    """Undirected edge list with u < v, deduplicated, self-loops dropped."""
    a, b = F.col(u), F.col(v)
    return (
        edges.select(
            F.least(a, b).alias("u"),
            F.greatest(a, b).alias("v"),
        )
        .where(F.col("u") != F.col("v"))
        .dropDuplicates(["u", "v"])
    )


def triangles(edges: DataFrame, *, u: str = "u", v: str = "v") -> DataFrame:
    """All triangles (a < b < c) in the undirected graph.

    Two shuffle joins: wedges a-b-c from (a,b)x(b,c), closed by (a,c).
    """
    e = canonical_edges(edges, u=u, v=v).cache()
    e1 = e.select(F.col("u").alias("a"), F.col("v").alias("b"))
    e2 = e.select(F.col("u").alias("b"), F.col("v").alias("c"))
    wedges = e1.join(e2, "b").select("a", "b", "c")
    closing = e.select(F.col("u").alias("a"), F.col("v").alias("c"))
    return wedges.join(closing, ["a", "c"]).select("a", "b", "c")


def vertex_triangles(edges: DataFrame, *, u: str = "u", v: str = "v") -> DataFrame:
    """One row per (vertex, triangle): columns ``node, a, b, c``.

    γ₂ compares triangle *sets* of two vertices; this exploded form joins
    directly against vertex ids.
    """
    tri = triangles(edges, u=u, v=v)
    return (
        tri.select(F.col("a").alias("node"), "a", "b", "c")
        .unionByName(tri.select(F.col("b").alias("node"), "a", "b", "c"))
        .unionByName(tri.select(F.col("c").alias("node"), "a", "b", "c"))
    )
