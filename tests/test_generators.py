"""Property tests for the synthetic graph generators (numpy layer)."""
import numpy as np
import pytest

from repro.graph import generators as gen


def _canonical_ok(pdf):
    assert (pdf["u"] < pdf["v"]).all()
    assert not pdf.duplicated(["u", "v"]).any()


@pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
def test_gnp_deterministic(seed):
    a = gen.gnp_edges_pandas(50, 0.2, seed)
    b = gen.gnp_edges_pandas(50, 0.2, seed)
    assert a.equals(b)


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_gnp_seed_changes_graph(seed):
    a = gen.gnp_edges_pandas(50, 0.2, seed)
    b = gen.gnp_edges_pandas(50, 0.2, seed + 100)
    assert not a.equals(b)


@pytest.mark.parametrize("n,p", [(10, 0.0), (10, 1.0), (50, 0.3), (80, 0.05)])
def test_gnp_canonical_and_size(n, p):
    pdf = gen.gnp_edges_pandas(n, p, 0)
    if p == 0.0:
        assert pdf.empty
        return
    _canonical_ok(pdf)
    if p == 1.0:
        assert len(pdf) == n * (n - 1) // 2
    else:
        expect = p * n * (n - 1) / 2
        assert 0.5 * expect < len(pdf) < 1.7 * expect


@pytest.mark.parametrize("seed", [0, 7])
def test_sbm_denser_within_blocks(seed):
    n, b = 90, 3
    pdf = gen.sbm_edges_pandas(n, b, p_in=0.5, p_out=0.05, seed=seed)
    _canonical_ok(pdf)
    blocks = gen.sbm_blocks(n, b)
    same = pdf.apply(lambda r: blocks[r["u"]] == blocks[r["v"]], axis=1)
    n_in_pairs = sum(
        1
        for i in range(1, n + 1)
        for j in range(i + 1, n + 1)
        if blocks[i] == blocks[j]
    )
    n_out_pairs = n * (n - 1) // 2 - n_in_pairs
    assert same.sum() / n_in_pairs > 3 * (len(pdf) - same.sum()) / n_out_pairs


def test_sbm_weighted_ranges():
    pdf = gen.sbm_edges_pandas(
        60, 3, 0.5, 0.1, seed=1, weighted=True, w_in=(0.6, 1.0), w_out=(0.05, 0.45)
    )
    blocks = gen.sbm_blocks(60, 3)
    same = pdf.apply(lambda r: blocks[r["u"]] == blocks[r["v"]], axis=1)
    assert pdf.loc[same, "w"].between(0.6, 1.0).all()
    assert pdf.loc[~same, "w"].between(0.05, 0.45).all()


def test_sbm_unweighted_weights_are_one():
    pdf = gen.sbm_edges_pandas(40, 2, 0.4, 0.1, seed=2)
    assert (pdf["w"] == 1.0).all()


@pytest.mark.parametrize("m", [200, 1000])
def test_powerlaw_size_and_canonical(m):
    pdf = gen.powerlaw_edges_pandas(500, m, seed=0)
    _canonical_ok(pdf)
    assert 0.6 * m <= len(pdf) <= m


def test_powerlaw_skewed_degrees():
    pdf = gen.powerlaw_edges_pandas(500, 1500, gamma=2.1, seed=0)
    deg = (
        pdf[["u"]].rename(columns={"u": "x"})["x"].value_counts().add(
            pdf[["v"]].rename(columns={"v": "x"})["x"].value_counts(), fill_value=0
        )
    )
    assert deg.max() > 10 * deg.median()


def test_fig1_edge_count():
    assert len(gen.FIG1_EDGES) == 13
    assert gen.FIG1_NUM_VERTICES == 11
    assert len({tuple(sorted(e)) for e in gen.FIG1_EDGES}) == 13


def test_fig1_graph_wrapper(fig1):
    assert fig1.num_edges() == 13
    assert fig1.num_vertices == 11


def test_sbm_blocks_round_robin():
    b = gen.sbm_blocks(7, 3)
    assert b == {1: 0, 2: 1, 3: 2, 4: 0, 5: 1, 6: 2, 7: 0}


def test_dedup_removes_self_loops_and_duplicates():
    pdf = gen._dedup(
        np.array([1, 2, 2, 3]), np.array([2, 1, 2, 4]), np.ones(4)
    )
    assert list(map(tuple, pdf[["u", "v"]].to_numpy())) == [(1, 2), (3, 4)]
