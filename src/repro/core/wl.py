"""Normalized Weisfeiler–Lehman sub-graph kernel features (γ₁).

Per the paper, γ₁ compares two same-name SCN vertices by the WL sub-graph
kernel: inner product of label-count feature maps over h WL refinement
iterations, normalized by the self-kernels (eq. 3–4).

Implementation: global WL label refinement on the SCN graph as Spark
dataflow. Initial labels are vertex *names* (so shared co-author names
count), refined labels hash the sorted neighbor multiset. A vertex's
feature map collects its **neighbors'** labels at every iteration — its own
label is excluded so that two singleton vertices of the same name have
empty feature maps (kernel 0) rather than trivially kernel 1.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _bidirectional(edges: DataFrame) -> DataFrame:
    return edges.select("u", "v").unionByName(
        edges.select(F.col("v").alias("u"), F.col("u").alias("v"))
    ).dropDuplicates(["u", "v"])


def wl_features(edges: DataFrame, vertices: DataFrame, *, h: int = 2) -> DataFrame:
    """WL feature maps for every vertex.

    ``edges``: (u, v) SCN vertex-id pairs. ``vertices``: (vertex_id, name).
    Returns (vertex_id, wl_labels array<string>, wl_counts array<double>,
    wl_norm double) where wl_norm is sqrt of the self-kernel. Vertices with
    no SCN edges get empty maps and norm 0.
    """
    adj = _bidirectional(edges).cache()
    labels = vertices.select("vertex_id", F.col("name").alias("label"))

    feat_parts = []
    for it in range(h):
        # Feature rows: neighbor labels, iteration-prefixed so label spaces
        # of different refinement depths do not collide.
        nbr = (
            adj.join(labels.withColumnRenamed("vertex_id", "v"), "v")
            .select(
                F.col("u").alias("vertex_id"),
                F.concat(F.lit(f"{it}:"), F.col("label")).alias("feat"),
            )
        )
        feat_parts.append(nbr)
        if it + 1 < h:
            # Refinement: new label = hash(own label, sorted neighbor labels).
            agg = (
                adj.join(labels.withColumnRenamed("vertex_id", "v"), "v")
                .groupBy("u")
                .agg(F.sort_array(F.collect_list("label")).alias("nbrs"))
            )
            labels = (
                labels.join(agg.withColumnRenamed("u", "vertex_id"), "vertex_id", "left")
                .select(
                    "vertex_id",
                    F.sha2(
                        F.concat_ws("|", F.col("label"), F.concat_ws(",", F.coalesce(F.col("nbrs"), F.array()))),
                        256,
                    ).substr(1, 16).alias("label"),
                )
            )

    feats = feat_parts[0]
    for p in feat_parts[1:]:
        feats = feats.unionByName(p)
    counted = feats.groupBy("vertex_id", "feat").agg(F.count("*").cast("double").alias("cnt"))
    per_vertex = (
        counted.groupBy("vertex_id")
        .agg(F.sort_array(F.collect_list(F.struct("feat", "cnt"))).alias("fc"))
        .select(
            "vertex_id",
            F.col("fc.feat").alias("wl_labels"),
            F.col("fc.cnt").alias("wl_counts"),
            F.sqrt(
                F.aggregate(F.col("fc.cnt"), F.lit(0.0), lambda acc, x: acc + x * x)
            ).alias("wl_norm"),
        )
    )
    return vertices.select("vertex_id").join(per_vertex, "vertex_id", "left").select(
        "vertex_id",
        F.coalesce("wl_labels", F.array().cast("array<string>")).alias("wl_labels"),
        F.coalesce("wl_counts", F.array().cast("array<double>")).alias("wl_counts"),
        F.coalesce("wl_norm", F.lit(0.0)).alias("wl_norm"),
    )
