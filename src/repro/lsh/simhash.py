"""SimHash sketches and cosine-similarity estimates (paper §2.1.2, §5).

A vertex v is the vector of its *closed* neighborhood weights (diagonal
w(v, v) = 1). Sample j of its sketch is sign(Σ_x w(v,x) · r_j(x)) where
r_j(x) ~ N(0, 1) is derived deterministically from (seed, x, j)
(:func:`repro.lsh.hashing.gaussians`) — the parallel "reduce per
sample" of §5 becomes one grouped pandas aggregation per vertex.

The estimate for an edge is cos(pi · hamming(sketch_u, sketch_v) / k),
the plug-in estimator of Theorem 5.2. Sketches are bit-packed binaries
of ceil(k / 8) bytes.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf

from repro.graph.graphframe import UndirectedGraph
from repro.lsh.hashing import gaussians


def _closed_adjacency(g: UndirectedGraph, scope: DataFrame | None) -> DataFrame:
    """Rows (u, v, w) of the closed neighborhoods to sketch."""
    self_rows = g.vertices().select(
        "v", F.col("v").alias("u"), F.lit(1.0).alias("w")
    ).select("u", "v", "w")
    adj = g.adjacency().unionByName(self_rows)
    if scope is not None:
        adj = adj.join(scope.withColumnRenamed("v", "u"), "u")
    return adj


def simhash_sketches(
    g: UndirectedGraph, k: int, seed: int = 0, scope: DataFrame | None = None
) -> DataFrame:
    """(v, sketch) — bit-packed k-sample SimHash of each closed
    neighborhood; ``scope`` (a (v) DataFrame) restricts which vertices
    get sketched (the §6.3 heuristic sketches only high-degree ones)."""

    def sketch(pdf: pd.DataFrame) -> pd.DataFrame:
        xs = pdf["v"].to_numpy(np.uint64)
        w = pdf["w"].to_numpy(np.float64)
        acc = w @ gaussians(seed, xs, k)  # (k,) signed projections
        bits = np.packbits(acc >= 0.0)
        return pd.DataFrame({"v": [int(pdf["u"].iloc[0])], "sketch": [bits.tobytes()]})

    return (
        _closed_adjacency(g, scope)
        .groupBy("u")
        .applyInPandas(sketch, schema="v long, sketch binary")
    )


def _hamming(col_a: pd.Series, col_b: pd.Series, k: int) -> np.ndarray:
    a = np.vstack([np.frombuffer(x, np.uint8) for x in col_a])
    b = np.vstack([np.frombuffer(x, np.uint8) for x in col_b])
    diff = np.unpackbits(a ^ b, axis=1)[:, :k]
    return diff.sum(axis=1)


def simhash_edge_similarities(
    edges: DataFrame, sketches: DataFrame, k: int
) -> DataFrame:
    """(u, v, sim) — estimated cosine similarity for each edge row.

    ``edges`` needs columns (u, v); every endpoint must have a sketch.
    """

    @pandas_udf("double")
    def est(sa: pd.Series, sb: pd.Series) -> pd.Series:
        if sa.empty:
            return pd.Series([], dtype=float)
        theta = np.pi * _hamming(sa, sb, k) / float(k)
        return pd.Series(np.cos(theta))

    return (
        edges.select("u", "v")
        .join(
            sketches.select(F.col("v").alias("u"), F.col("sketch").alias("sk_u")), "u"
        )
        .join(sketches.select("v", F.col("sketch").alias("sk_v")), "v")
        .select("u", "v", est("sk_u", "sk_v").alias("sim"))
    )
