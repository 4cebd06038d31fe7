"""Modularity: hand-computed cases, Spark vs pandas implementations,
and the DuckDB term oracle."""
import duckdb
import pandas as pd
import pytest

from repro.core.index import build_index
from repro.core.query import query_clusters
from repro.graph.graphframe import UndirectedGraph
from repro.quality.modularity import modularity, modularity_pandas
from tests.oracle_sql import MODULARITY_TERMS


def _labels_df(spark, labels):
    return spark.createDataFrame(
        pd.DataFrame({"v": list(labels), "cluster": list(labels.values())})
    )


def test_two_triangles_hand_computed(spark):
    """Two disjoint triangles, each its own cluster.

    m = 6; within = 6; each cluster degree sum = 6.
    Q = 1 - 2 * (6 / 12)^2 = 0.5
    """
    edges = [(1, 2), (1, 3), (2, 3), (4, 5), (4, 6), (5, 6)]
    g = UndirectedGraph.from_edge_list(spark, edges, 6).materialize()
    labels = {1: 1, 2: 1, 3: 1, 4: 2, 5: 2, 6: 2}
    assert modularity(g, _labels_df(spark, labels)) == pytest.approx(0.5)
    assert modularity_pandas(g.to_pandas(), labels) == pytest.approx(0.5)
    g.unpersist()


def test_single_cluster_is_zero(spark):
    """Everything in one cluster: Q = W/W - (2W/2W)^2 = 0."""
    edges = [(1, 2), (2, 3), (3, 1)]
    g = UndirectedGraph.from_edge_list(spark, edges, 3).materialize()
    labels = {1: 1, 2: 1, 3: 1}
    assert modularity(g, _labels_df(spark, labels)) == pytest.approx(0.0)
    assert modularity_pandas(g.to_pandas(), labels) == pytest.approx(0.0)
    g.unpersist()


def test_all_singletons_negative(fig1, spark):
    labels = {v: v for v in range(1, 12)}
    q = modularity(fig1, _labels_df(spark, labels))
    assert q < 0
    assert modularity_pandas(fig1.to_pandas(), labels) == pytest.approx(q)


@pytest.mark.parametrize("mu,eps", [(2, 0.3), (3, 0.5), (3, 0.6)])
def test_spark_equals_pandas_on_real_clusterings(fig1, fig1_index, spark, mu, eps):
    res = query_clusters(fig1_index, mu, eps)
    full = res.full_labels(fig1.num_vertices)
    q_spark = modularity(fig1, full)
    labels = dict(full.toPandas().itertuples(index=False))
    q_pandas = modularity_pandas(fig1.to_pandas(), labels)
    assert q_spark == pytest.approx(q_pandas)


@pytest.mark.parametrize(
    "fixture,index_fixture",
    [("sbm_small", "sbm_small_index"), ("weighted_small", "weighted_index")],
)
def test_against_duckdb_terms(fixture, index_fixture, request, spark):
    """Q from DuckDB-computed W, Win, sum-of-squared-cluster-degrees."""
    g = request.getfixturevalue(fixture)
    res = query_clusters(request.getfixturevalue(index_fixture), 3, 0.4)
    full = res.full_labels(g.num_vertices)
    got = modularity(g, full)
    con = duckdb.connect()
    con.register("e", g.to_pandas())
    con.register("labels", full.toPandas())
    W, Win, SS = con.execute(MODULARITY_TERMS).fetchone()
    con.close()
    assert got == pytest.approx(Win / W - SS / (4 * W * W))


def test_planted_partition_recovered_clustering_scores_high(sbm_small, sbm_small_index):
    """SCAN at sensible parameters on an SBM should beat Q = 0.3 —
    the sanity floor for 'found real structure'."""
    res = query_clusters(sbm_small_index, 3, 0.35)
    full = res.full_labels(sbm_small.num_vertices)
    assert modularity(sbm_small, full) > 0.3


def test_weighted_modularity_uses_weights(spark):
    """Same topology, different weights => different Q."""
    e1 = [(1, 2, 1.0), (3, 4, 1.0), (2, 3, 1.0)]
    e2 = [(1, 2, 5.0), (3, 4, 5.0), (2, 3, 1.0)]
    labels = {1: 1, 2: 1, 3: 2, 4: 2}
    g1 = UndirectedGraph.from_edge_list(spark, e1, 4, weighted=True)
    g2 = UndirectedGraph.from_edge_list(spark, e2, 4, weighted=True)
    q1 = modularity(g1, _labels_df(spark, labels))
    q2 = modularity(g2, _labels_df(spark, labels))
    assert q2 > q1  # heavier intra-cluster edges => higher Q
    assert modularity_pandas(
        pd.DataFrame(e2, columns=["u", "v", "w"]), labels
    ) == pytest.approx(q2)


def test_empty_graph_zero():
    assert modularity_pandas(pd.DataFrame(columns=["u", "v", "w"]), {1: 1}) == 0.0


def test_modularity_never_exceeds_one(fig1, fig1_index, spark):
    for eps in (0.2, 0.5, 0.8):
        res = query_clusters(fig1_index, 2, eps)
        q = modularity(fig1, res.full_labels(fig1.num_vertices))
        assert q <= 1.0
