"""SimHash sketches and cosine estimation: determinism, statistical
convergence, and the Theorem-5.2 classification property."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.similarity import edge_similarities
from repro.lsh.simhash import simhash_edge_similarities, simhash_sketches


def _estimates(g, k, seed=0):
    sk = simhash_sketches(g, k, seed)
    return (
        simhash_edge_similarities(g.edges, sk, k)
        .toPandas()
        .set_index(["u", "v"])["sim"]
    )


def test_sketch_length_and_coverage(fig1):
    sk = simhash_sketches(fig1, 32, 0).toPandas()
    assert len(sk) == 11
    assert all(len(b) == 4 for b in sk["sketch"])  # 32 bits = 4 bytes


def test_sketches_deterministic(fig1):
    a = simhash_sketches(fig1, 16, 5).toPandas().sort_values("v")
    b = simhash_sketches(fig1, 16, 5).toPandas().sort_values("v")
    assert list(a["sketch"]) == list(b["sketch"])


def test_sketches_differ_across_seeds(sbm_small):
    a = simhash_sketches(sbm_small, 64, 0).toPandas().sort_values("v")
    b = simhash_sketches(sbm_small, 64, 1).toPandas().sort_values("v")
    assert list(a["sketch"]) != list(b["sketch"])


def test_identical_closed_neighborhoods_identical_sketches(fig1):
    # N̄(1) == N̄(3) == {1,2,3,4} in the Figure-1 graph
    sk = dict(simhash_sketches(fig1, 64, 0).toPandas().itertuples(index=False))
    assert sk[1] == sk[3]


def test_estimate_is_one_for_identical_neighborhoods(fig1):
    sk = simhash_sketches(fig1, 32, 0)
    est = dict(
        simhash_edge_similarities(fig1.edges, sk, 32)
        .toPandas()
        .set_index(["u", "v"])["sim"]
        .items()
    )
    assert est[(1, 3)] == pytest.approx(1.0)  # exact sigma(1,3) = 1


def test_estimates_in_valid_range(sbm_small):
    est = _estimates(sbm_small, 32)
    assert (est >= -1.0).all() and (est <= 1.0).all()


@pytest.mark.parametrize("seed", [0, 1])
def test_high_k_estimates_converge(sbm_small, exact_sims, seed):
    est = _estimates(sbm_small, 512, seed)
    exact = exact_sims(sbm_small, "cosine")
    err = (est - exact).abs()
    # per-edge sd ~ pi*sqrt(p(1-p)/k) ~= 0.07; mean over ~350 edges is
    # tight, the max is a ~4-sigma order statistic
    assert err.mean() < 0.06
    assert err.max() < 0.3


def test_error_shrinks_with_k(sbm_small, exact_sims):
    est8 = _estimates(sbm_small, 8)
    exact = exact_sims(sbm_small, "cosine")
    est256 = _estimates(sbm_small, 256)
    assert (est256 - exact).abs().mean() < (est8 - exact).abs().mean()


def test_theorem_52_classification(sbm_small, exact_sims):
    """With k >= pi^2 ln(nm) / (2 delta^2), edges outside
    (eps - delta, eps + sqrt(1-eps^2) delta) classify correctly
    w.h.p. — checked exhaustively for one (eps, delta)."""
    eps, delta = 0.5, 0.35
    n, m = sbm_small.num_vertices, sbm_small.num_edges()
    k = int(np.ceil(np.pi**2 * np.log(n * m) / (2 * delta**2)))
    est = _estimates(sbm_small, k, seed=3)
    exact = exact_sims(sbm_small, "cosine")
    lo, hi = eps - delta, eps + np.sqrt(1 - eps**2) * delta
    for key in exact.index:
        s = exact[key]
        if lo < s < hi:
            continue  # theorem makes no claim inside the window
        assert (est[key] >= eps) == (s >= eps), (key, s, est[key])


def test_weighted_sketches_respect_weights(weighted_small, exact_sims):
    est = _estimates(weighted_small, 512, seed=2)
    exact = exact_sims(weighted_small, "wcosine")
    assert (est - exact).abs().mean() < 0.08


def test_scope_restricts_sketched_vertices(fig1, spark):
    import pandas as pd

    scope = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3]}))
    sk = simhash_sketches(fig1, 16, 0, scope=scope).toPandas()
    assert set(sk["v"]) == {1, 2, 3}
