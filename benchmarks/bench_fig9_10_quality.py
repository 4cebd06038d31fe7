"""Figure 9/10 benchmark: the quality-evaluation pipeline.

The figures' *timing* axis is index construction (bench_fig8); what
this file pins is the rest of the pipeline: producing a clustering from
an approximate index and scoring it (modularity sweep / ARI), so
regressions in the quality harness itself are visible.
"""
import pytest

from repro.baselines.gs_index_seq import SequentialGSIndex
from repro.core.approx import build_approx_index
from repro.experiments.exp_approx_quality import (
    _best_modularity,
    _full_labels,
    _index_sims_pandas,
)
from repro.quality.ari import adjusted_rand_index_pandas


@pytest.fixture(scope="module")
def cochlea_driver_index(graphs):
    g = graphs["cochlea_lite"]
    idx, _ = build_approx_index(g, 32, "wcosine", seed=0)
    driver = SequentialGSIndex.from_similarities(
        _index_sims_pandas(idx.persist()), g.num_vertices
    )
    idx.unpersist()
    return g.to_pandas(), driver


def test_modularity_grid_sweep(benchmark, cochlea_driver_index):
    edges, driver = cochlea_driver_index
    q, mu, eps = benchmark.pedantic(
        lambda: _best_modularity(edges, driver), rounds=1, iterations=1
    )
    assert -1 <= q <= 1


def test_ari_evaluation(benchmark, cochlea_driver_index):
    _, driver = cochlea_driver_index
    a = _full_labels(driver, 4, 0.5)
    b = _full_labels(driver, 4, 0.55)
    ari = benchmark.pedantic(
        lambda: adjusted_rand_index_pandas(a, b), rounds=3, iterations=1
    )
    assert -1 <= ari <= 1
