"""Benchmark fixtures: materialized Table-2-lite graphs and prebuilt
indices, shared session-wide so pytest-benchmark times only the
operation under study."""
from __future__ import annotations

import os

# Benchmark graphs are laptop-scale (<= ~60k edges); 16 shuffle
# partitions keeps per-task overhead from dominating the timings. An
# explicit SPARK_SHUFFLE_PARTITIONS env var still wins (see the root
# conftest).
os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "16")

import pytest

from repro.baselines.gs_index_seq import SequentialGSIndex
from repro.core.index import build_index
from repro.experiments import datasets


@pytest.fixture(scope="session")
def graphs(spark):
    """All six registry graphs, materialized once."""
    gs = {name: datasets.load(spark, name) for name in datasets.REGISTRY}
    yield gs
    for g in gs.values():
        g.unpersist()


@pytest.fixture(scope="session")
def spark_indices(graphs):
    """Prebuilt Spark indices (for query benchmarks: construction is
    excluded from query timings, as in the paper)."""
    idx = {
        name: build_index(g, datasets.measure_for(name)).persist()
        for name, g in graphs.items()
        if name in ("orkut_lite", "brain_lite")
    }
    yield idx
    for i in idx.values():
        i.unpersist()


@pytest.fixture(scope="session")
def seq_indices(graphs):
    """Prebuilt sequential GS*-Index instances for query benchmarks."""
    return {
        name: SequentialGSIndex(
            graphs[name].to_pandas(), graphs[name].num_vertices,
            datasets.measure_for(name),
        ).build()
        for name in ("orkut_lite", "brain_lite")
    }
