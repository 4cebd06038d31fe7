"""MinHash (standard + k-partition/OPH) sketches and Jaccard estimates."""
import numpy as np
import pytest

from repro.core.similarity import edge_similarities
from repro.lsh.minhash import EMPTY, minhash_edge_similarities, minhash_sketches


def _estimates(g, k, variant, seed=0):
    sk = minhash_sketches(g, k, seed, variant=variant)
    return (
        minhash_edge_similarities(g.edges, sk, k, variant=variant)
        .toPandas()
        .set_index(["u", "v"])["sim"]
    )


@pytest.mark.parametrize("variant", ["standard", "oph"])
def test_sketch_shape(fig1, variant):
    sk = minhash_sketches(fig1, 24, 0, variant=variant).toPandas()
    assert len(sk) == 11
    assert all(len(s) == 24 for s in sk["sketch"])


@pytest.mark.parametrize("variant", ["standard", "oph"])
def test_sketches_deterministic(fig1, variant):
    a = minhash_sketches(fig1, 16, 3, variant=variant).toPandas().sort_values("v")
    b = minhash_sketches(fig1, 16, 3, variant=variant).toPandas().sort_values("v")
    assert [tuple(s) for s in a["sketch"]] == [tuple(s) for s in b["sketch"]]


@pytest.mark.parametrize("variant", ["standard", "oph"])
def test_identical_sets_estimate_one(fig1, variant):
    # N̄(1) == N̄(3): Jaccard 1, sketches identical
    est = _estimates(fig1, 32, variant)
    assert est[(1, 3)] == pytest.approx(1.0)


def test_standard_estimates_in_unit_interval(sbm_small):
    est = _estimates(sbm_small, 16, "standard")
    assert (est >= 0).all() and (est <= 1).all()


def test_oph_estimates_in_unit_interval(sbm_small):
    est = _estimates(sbm_small, 16, "oph")
    assert (est >= 0).all() and (est <= 1).all()


@pytest.mark.parametrize("variant", ["standard", "oph"])
@pytest.mark.parametrize("seed", [0, 1])
def test_high_k_estimates_converge(sbm_small, exact_sims, variant, seed):
    est = _estimates(sbm_small, 512, variant, seed)
    exact = exact_sims(sbm_small, "jaccard")
    assert (est - exact).abs().mean() < 0.05


@pytest.mark.parametrize("variant", ["standard", "oph"])
def test_error_shrinks_with_k(sbm_small, exact_sims, variant):
    est8 = _estimates(sbm_small, 8, variant)
    exact = exact_sims(sbm_small, "jaccard")
    est256 = _estimates(sbm_small, 256, variant)
    assert (est256 - exact).abs().mean() < (est8 - exact).abs().mean()


def test_standard_minhash_unbiased_across_seeds(fig1, exact_sims):
    """Mean of the standard estimator over several seeds ~ exact
    Jaccard (MinHash match probability IS the Jaccard similarity)."""
    exact = exact_sims(fig1, "jaccard")
    acc = None
    seeds = range(8)
    for s in seeds:
        est = _estimates(fig1, 96, "standard", seed=s)
        acc = est if acc is None else acc + est
    mean = acc / len(seeds)
    assert (mean - exact).abs().mean() < 0.05


def test_oph_empty_bins_marked(spark):
    """Small sets with k >> |set| must leave empty bins (sentinel)."""
    from repro.graph.graphframe import UndirectedGraph

    g = UndirectedGraph.from_edge_list(spark, [(1, 2)], 2).materialize()
    sk = minhash_sketches(g, 64, 0, variant="oph").toPandas()
    for s in sk["sketch"]:
        arr = np.array(s)
        assert (arr == EMPTY).sum() >= 62  # |closed set| = 2, k = 64
        assert (arr[arr != EMPTY] >= 0).all()
    g.unpersist()


def test_theorem_53_classification(sbm_small, exact_sims):
    """Standard MinHash with k >= ln(nm)/(2 delta^2): edges outside
    (eps - delta, eps + delta) classify correctly w.h.p."""
    eps, delta = 0.4, 0.3
    n, m = sbm_small.num_vertices, sbm_small.num_edges()
    k = int(np.ceil(np.log(n * m) / (2 * delta**2)))
    est = _estimates(sbm_small, k, "standard", seed=4)
    exact = exact_sims(sbm_small, "jaccard")
    for key in exact.index:
        s = exact[key]
        if eps - delta < s < eps + delta:
            continue
        assert (est[key] >= eps) == (s >= eps), (key, s, est[key])


def test_invalid_variant_raises(fig1):
    with pytest.raises(ValueError):
        minhash_sketches(fig1, 8, 0, variant="bogus")
