"""spark-submit entrypoint — query a saved SCAN index.

Usage: spark-submit jobs/query_clusters.py <index_dir> <mu> <eps>
Prints cluster sizes and the hub/outlier counts require the graph, so
this job reports the clustering only.
"""
import sys

from pyspark.sql import functions as F

from repro.core.index import SCANIndex
from repro.core.query import query_clusters
from repro.experiments.harness import get_session


def main() -> None:
    path, mu, eps = sys.argv[1], int(sys.argv[2]), float(sys.argv[3])
    spark = get_session("query_clusters")
    index = SCANIndex.load(spark, path)
    res = query_clusters(index, mu, eps)
    sizes = (
        res.assignments.groupBy("cluster")
        .agg(F.count("*").alias("size"))
        .orderBy(F.col("size").desc())
    )
    print(f"clusters for mu={mu}, eps={eps}:")
    sizes.show(50, truncate=False)


if __name__ == "__main__":
    main()
