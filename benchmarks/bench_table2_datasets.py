"""Table 2 benchmark: generation + materialization of each lite graph.

Not a paper timing (Table 2 is a data summary) — this pins the cost of
the substrate every other benchmark builds on, and asserts the analog
sizes stay in the intended regime.
"""
import pytest

from repro.experiments import datasets


@pytest.mark.parametrize("name", list(datasets.REGISTRY))
def test_generate_dataset(benchmark, spark, name):
    def gen():
        g = datasets.load(spark, name)
        m = g.num_edges()
        g.unpersist()
        return m

    m = benchmark.pedantic(gen, rounds=1, iterations=1)
    assert m > 5_000  # every analog is a non-trivial graph
