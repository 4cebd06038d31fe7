"""Figure 8 benchmark: approximate index construction time vs samples.

Covers the densest weighted graph (cochlea_lite — where LSH should
win), the dense unweighted graph (brain_lite — both schemes), and the
sparse orkut_lite (where the paper finds approximation unhelpful).
Compare against the exact builds in bench_fig5_index_construction.py.
"""
import pytest

from repro.core.approx import build_approx_index
from repro.experiments import datasets

CASES = [
    ("cochlea_lite", "wcosine", 16),
    ("cochlea_lite", "wcosine", 64),
    ("brain_lite", "cosine", 16),
    ("brain_lite", "cosine", 64),
    ("brain_lite", "jaccard", 16),
    ("brain_lite", "jaccard", 64),
    ("orkut_lite", "cosine", 16),
    ("orkut_lite", "jaccard", 16),
]


@pytest.mark.parametrize("name,measure,k", CASES)
def test_approx_index_construction(benchmark, graphs, name, measure, k):
    g = graphs[name]

    def build():
        idx, stats = build_approx_index(g, k, measure, seed=0)
        idx.persist()
        idx.unpersist()
        return stats.n_edges_approx

    benchmark.pedantic(build, rounds=2, iterations=1)
