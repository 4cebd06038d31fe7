"""Figure 5 benchmark: exact index construction per graph.

Compares the parallel Spark construction against the sequential
GS*-Index reference on every Table-2-lite graph. EXPERIMENTS.md records
the resulting rows next to the paper's Figure-5 readings.
"""
import pytest

from repro.baselines.gs_index_seq import SequentialGSIndex
from repro.core.index import build_index
from repro.experiments import datasets

NAMES = list(datasets.REGISTRY)


@pytest.mark.parametrize("name", NAMES)
def test_spark_parallel_construction(benchmark, graphs, name):
    g = graphs[name]
    measure = datasets.measure_for(name)

    def build():
        idx = build_index(g, measure).persist()
        idx.unpersist()
        return idx

    benchmark.pedantic(build, rounds=2, iterations=1)


@pytest.mark.parametrize("name", NAMES)
def test_sequential_gs_index_construction(benchmark, graphs, name):
    g = graphs[name]
    measure = datasets.measure_for(name)
    pdf = g.to_pandas()

    def build():
        return SequentialGSIndex(pdf, g.num_vertices, measure).build()

    benchmark.pedantic(build, rounds=2, iterations=1)
