"""Hub / outlier classification (paper §4.3)."""
import pytest

from repro.baselines.gs_index_seq import SequentialGSIndex
from repro.core.hubs import classify_unclustered
from repro.core.index import build_index
from repro.core.query import query_clusters
from repro.graph.graphframe import UndirectedGraph


def test_fig1_paper_hubs_and_outliers(fig1, fig1_index):
    res = query_clusters(fig1_index, 3, 0.6)
    out = dict(classify_unclustered(fig1, res).toPandas().itertuples(index=False))
    assert out == {5: True, 9: False, 10: False}  # hub 5, outliers 9 & 10


def test_all_vertices_clustered_gives_empty(fig1, fig1_index):
    res = query_clusters(fig1_index, 2, 0.0)
    assert classify_unclustered(fig1, res).count() == 0


def test_isolated_vertex_is_outlier(spark):
    g = UndirectedGraph.from_edge_list(
        spark, [(1, 2), (1, 3), (2, 3)], num_vertices=4
    ).materialize()
    idx = build_index(g, "cosine")
    res = query_clusters(idx, 2, 0.5)
    out = dict(classify_unclustered(g, res).toPandas().itertuples(index=False))
    assert out == {4: False}
    g.unpersist()


@pytest.fixture(scope="module")
def seq_sbm(sbm_small):
    return SequentialGSIndex(
        sbm_small.to_pandas(), sbm_small.num_vertices, "cosine"
    ).build()


@pytest.mark.parametrize("mu,eps", [(2, 0.3), (3, 0.5), (4, 0.7)])
def test_matches_sequential_reference(sbm_small, sbm_small_index, seq_sbm, mu, eps):
    res = query_clusters(sbm_small_index, mu, eps)
    got = dict(classify_unclustered(sbm_small, res).toPandas().itertuples(index=False))
    expect = seq_sbm.hubs_outliers(seq_sbm.query(mu, eps))
    assert {v: ("hub" if h else "outlier") for v, h in got.items()} == expect


def test_hub_between_two_clusters(spark):
    # two triangles bridged by vertex 7
    edges = [(1, 2), (1, 3), (2, 3), (4, 5), (4, 6), (5, 6), (3, 7), (4, 7)]
    g = UndirectedGraph.from_edge_list(spark, edges, 7).materialize()
    idx = build_index(g, "cosine")
    res = query_clusters(idx, 3, 0.7)
    labels = res.labels_pandas()
    assert 7 not in labels and len(set(labels.values())) == 2
    out = dict(classify_unclustered(g, res).toPandas().itertuples(index=False))
    assert out[7] is True or out[7] == True  # noqa: E712 — numpy bool
    g.unpersist()
