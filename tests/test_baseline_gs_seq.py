"""Sequential GS*-Index reference: self-consistency and agreement with
the Spark engine on similarities, cores and clusterings."""
import pandas as pd
import pytest

from repro.baselines.gs_index_seq import SequentialGSIndex
from repro.core.index import build_index
from repro.core.query import get_cores, query_clusters
from repro.core.similarity import edge_similarities
from repro.graph.generators import FIG1_EDGES


@pytest.fixture(scope="module")
def seq_fig1():
    return SequentialGSIndex(
        pd.DataFrame(FIG1_EDGES, columns=["u", "v"]), 11, "cosine"
    ).build()


def test_fig1_similarities(seq_fig1):
    sims = seq_fig1.sim_lookup
    assert sims[(5, 6)] == pytest.approx(2 / 12**0.5)
    assert sims[(2, 3)] == pytest.approx(3 / 12**0.5)
    assert sims[(1, 3)] == pytest.approx(1.0)


def test_fig1_clustering(seq_fig1):
    assert seq_fig1.query(3, 0.6) == {
        1: 1, 2: 1, 3: 1, 4: 1, 6: 6, 7: 6, 8: 6, 11: 6
    }


def test_fig1_hubs(seq_fig1):
    cl = seq_fig1.query(3, 0.6)
    assert seq_fig1.hubs_outliers(cl) == {5: "hub", 9: "outlier", 10: "outlier"}


def test_fig1_core_order_paper(seq_fig1):
    co3 = seq_fig1.CO[3]
    assert {v for v, _ in co3} == set(range(1, 10))
    thr = dict(seq_fig1.CO[2])
    assert thr[6] == pytest.approx(0.75)


@pytest.mark.parametrize("measure", ["cosine", "jaccard", "wcosine"])
def test_similarities_match_spark(weighted_small, measure):
    seq = SequentialGSIndex(
        weighted_small.to_pandas(), weighted_small.num_vertices, measure
    ).build()
    spark_sims = (
        edge_similarities(weighted_small, measure)
        .toPandas()
        .set_index(["u", "v"])["sim"]
    )
    assert len(spark_sims) == len(seq.sim_lookup)
    for key, s in seq.sim_lookup.items():
        assert spark_sims[key] == pytest.approx(s)


@pytest.fixture(scope="module")
def seq_gnp(gnp_small):
    return SequentialGSIndex(
        gnp_small.to_pandas(), gnp_small.num_vertices, "cosine"
    ).build()


@pytest.mark.parametrize("mu", [2, 3, 5])
@pytest.mark.parametrize("eps", [0.2, 0.5, 0.8])
def test_cores_match_spark(gnp_small_index, seq_gnp, mu, eps):
    got = sorted(r.v for r in get_cores(gnp_small_index, mu, eps).collect())
    assert got == sorted(seq_gnp.cores(mu, eps))


def test_co_prefix_property(seq_fig1):
    """CO lists are sorted descending: the eps filter is a prefix."""
    for mu, lst in seq_fig1.CO.items():
        thr = [t for _, t in lst]
        assert thr == sorted(thr, reverse=True)


def test_no_prefix_property(seq_fig1):
    for v, lst in seq_fig1.NO.items():
        sims = [s for _, s in lst]
        assert sims == sorted(sims, reverse=True)


def test_from_similarities_equals_build(sbm_small):
    pdf = sbm_small.to_pandas()
    built = SequentialGSIndex(pdf, sbm_small.num_vertices, "cosine").build()
    derived = SequentialGSIndex.from_similarities(
        built.similarities_pandas().assign(w=1.0), sbm_small.num_vertices
    )
    for mu, eps in ((2, 0.3), (3, 0.5), (4, 0.7)):
        assert built.query(mu, eps) == derived.query(mu, eps)


def test_query_deterministic(seq_fig1):
    assert seq_fig1.query(2, 0.5) == seq_fig1.query(2, 0.5)


def test_empty_graph_queries():
    seq = SequentialGSIndex(pd.DataFrame(columns=["u", "v"]), 3, "cosine").build()
    assert seq.query(2, 0.5) == {}
    assert seq.hubs_outliers({}) == {1: "outlier", 2: "outlier", 3: "outlier"}
