"""Distributed connected components via min-label propagation.

Each vertex starts labeled with its own id; every round each vertex
takes the minimum label in its closed neighborhood, until a fixpoint.
Rounds are DataFrame joins + aggregations; ``localCheckpoint`` truncates
lineage each round so plans do not grow with the iteration count. The
round count is bounded by the subgraph diameter — small for the core
subgraphs SCAN queries produce. (This is the shuffle-world counterpart
of the paper's parallel connectivity; its O(log n)-span PRAM algorithm
has no Catalyst analog, see DESIGN.md §2.)

Resulting labels are the component's minimum vertex id — the repo-wide
canonical cluster naming.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def connected_components_df(
    edges: DataFrame, vertices: DataFrame, max_iter: int = 50
) -> DataFrame:
    """Components of the graph (``edges``: u, v; ``vertices``: v).

    Returns (v, cluster) where cluster = min vertex id of the component.
    Vertices with no incident edge form singleton components.
    """
    sym = edges.select("u", "v").unionByName(
        edges.select(F.col("v").alias("u"), F.col("u").alias("v"))
    )
    labels = vertices.select("v", F.col("v").alias("cluster")).localCheckpoint()
    for _ in range(max_iter):
        nbr_min = (
            sym.join(labels, sym.v == labels.v)
            .groupBy(sym.u.alias("nv"))
            .agg(F.min("cluster").alias("nbr_cluster"))
        )
        updated = (
            labels.join(nbr_min, labels.v == nbr_min.nv, "left")
            .select(
                labels.v,
                F.least(
                    "cluster", F.coalesce("nbr_cluster", F.col("cluster"))
                ).alias("new_cluster"),
                "cluster",
            )
        ).localCheckpoint()
        changed = updated.where(
            F.col("new_cluster") != F.col("cluster")
        ).limit(1).count()
        labels = updated.select("v", F.col("new_cluster").alias("cluster"))
        if changed == 0:
            return labels
    raise RuntimeError(f"connected components did not converge in {max_iter} rounds")
