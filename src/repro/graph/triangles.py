"""Degree-ordered triangle enumeration in Spark SQL.

This is the substrate for exact SCAN similarity computation (paper
§4.1.1 / §6.1). The paper directs each edge toward its higher-degree
endpoint so every triangle is found exactly once and the wedge count is
bounded by O(alpha * m); we do the same with a total *rank* order
``(deg(v), v)`` and express wedge formation and closure as two hash
joins — the Catalyst analog of GBBS's merge-based counting.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.graphframe import UndirectedGraph


def degree_ranked_edges(g: UndirectedGraph) -> DataFrame:
    """Edges oriented by the total order (deg, id): columns
    (a, b, w, ra, rb) where ``ra < rb`` and ``r = deg * (n+1) + id``
    is an injective rank encoding (ties by vertex id, like the paper's
    degeneracy orientation)."""
    # Per-vertex degree tables are tiny relative to the edge set;
    # broadcasting them avoids shuffling the edges twice. (The session
    # disables auto-broadcast to keep OLAP-style joins honest; vertex
    # metadata lookups are exactly where an explicit hint belongs.)
    deg = g.degrees()
    scale = g.num_vertices + 1
    e = (
        g.edges.join(
            F.broadcast(deg.withColumnRenamed("v", "u").withColumnRenamed("deg", "du")),
            "u",
        )
        .join(F.broadcast(deg.withColumnRenamed("deg", "dv")), "v")
        .select(
            "u",
            "v",
            "w",
            (F.col("du") * scale + F.col("u")).alias("ru"),
            (F.col("dv") * scale + F.col("v")).alias("rv"),
        )
    )
    fwd = F.col("ru") < F.col("rv")
    return e.select(
        F.when(fwd, F.col("u")).otherwise(F.col("v")).alias("a"),
        F.when(fwd, F.col("v")).otherwise(F.col("u")).alias("b"),
        "w",
        F.when(fwd, F.col("ru")).otherwise(F.col("rv")).alias("ra"),
        F.when(fwd, F.col("rv")).otherwise(F.col("ru")).alias("rb"),
    )


def triangle_edge_aggregates(g: UndirectedGraph) -> DataFrame:
    """Per-edge triangle aggregates: (u, v, tri, cw) with u < v.

    ``tri``  = |N(u) ∩ N(v)|, the number of triangles through the edge;
    ``cw``   = sum over common neighbors x of w(u,x) * w(v,x), the
    weighted-cosine numerator term (paper §4.1.1).

    Only edges that appear in at least one triangle are returned; the
    caller left-joins and fills zero for the rest.

    Each triangle {x, y, z} with rank(x) < rank(y) < rank(z) is found
    once as wedge (x→y, x→z) closed by edge (y→z), then exploded into
    its three edges with the opposite-side weight product each edge
    contributes to the similarity numerator.
    """
    d = degree_ranked_edges(g)
    # At lite scale the oriented edge table is a few MB: broadcasting
    # the probe sides turns the wedge and closing joins into map-side
    # hash joins (no shuffle of the wedge stream). Gated on a known
    # edge count so a graph that was never materialized — or a genuinely
    # large one — still takes the shuffle path.
    small = g._num_edges is not None and g._num_edges <= 500_000
    maybe_broadcast = F.broadcast if small else (lambda df: df)
    e1 = d.select(
        F.col("a").alias("x"), F.col("b").alias("y"),
        F.col("w").alias("wxy"), F.col("ra").alias("rx"), F.col("rb").alias("ry"),
    )
    e2 = d.select(
        F.col("a").alias("x2"), F.col("b").alias("z"),
        F.col("w").alias("wxz"), F.col("rb").alias("rz"),
    )
    wedges = e1.join(
        maybe_broadcast(e2), (F.col("x") == F.col("x2")) & (F.col("ry") < F.col("rz"))
    ).select("x", "y", "z", "wxy", "wxz")
    closing = d.select(
        F.col("a").alias("y"), F.col("b").alias("z"), F.col("w").alias("wyz")
    )
    tris = wedges.join(maybe_broadcast(closing), ["y", "z"])
    # Explode each triangle into its three edges. Edge (p, q) gains the
    # product of the two weights on the opposite sides (common neighbor
    # contribution w(p,x)*w(q,x) in the similarity numerator).
    contrib = tris.select(
        F.explode(
            F.array(
                F.struct(
                    F.least("x", "y").alias("u"),
                    F.greatest("x", "y").alias("v"),
                    (F.col("wxz") * F.col("wyz")).alias("c"),
                ),
                F.struct(
                    F.least("x", "z").alias("u"),
                    F.greatest("x", "z").alias("v"),
                    (F.col("wxy") * F.col("wyz")).alias("c"),
                ),
                F.struct(
                    F.least("y", "z").alias("u"),
                    F.greatest("y", "z").alias("v"),
                    (F.col("wxy") * F.col("wxz")).alias("c"),
                ),
            )
        ).alias("t")
    ).select("t.u", "t.v", "t.c")
    return contrib.groupBy("u", "v").agg(
        F.count("*").alias("tri"), F.sum("c").alias("cw")
    )


def total_triangles(g: UndirectedGraph) -> int:
    """Total triangle count of the graph (each counted once)."""
    agg = triangle_edge_aggregates(g).agg(F.sum("tri").alias("s")).collect()[0]["s"]
    return 0 if agg is None else int(agg) // 3
