"""Hub / outlier classification of unclustered vertices (paper §4.3).

A hub neighbors at least two distinct clusters; every other unclustered
vertex (including isolated ones) is an outlier. One join of the
adjacency against the clustering plus a distinct-count per vertex —
the DataFrame counterpart of the paper's map-over-neighbors + reduce.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.query import ClusteringResult
from repro.graph.graphframe import UndirectedGraph


def classify_unclustered(
    g: UndirectedGraph, result: ClusteringResult
) -> DataFrame:
    """(v, is_hub) for every unclustered vertex."""
    clustered = result.assignments.select("v", "cluster")
    unclustered = g.vertices().join(clustered, "v", "left_anti")
    nbr_clusters = (
        g.adjacency()
        .join(F.broadcast(clustered), "v")
        .select(F.col("u").alias("v"), "cluster")
        .join(unclustered, "v")  # only neighbors of unclustered vertices
        .groupBy("v")
        .agg(F.countDistinct("cluster").alias("k"))
    )
    return unclustered.join(nbr_clusters, "v", "left").select(
        "v", (F.coalesce("k", F.lit(0)) >= 2).alias("is_hub")
    )
