"""Table-2-lite: scaled-down synthetic analogs of the paper's graphs.

The paper's graphs (Table 2) span 70M–1.8B edges and are not obtainable
offline; each analog below preserves the property its experiments
exercise (DESIGN.md §3.2):

- ``orkut_lite`` / ``friendster_lite`` — sparse social networks with
  planted communities (SCAN's target structure).
- ``webbase_lite`` — very sparse, skewed-degree, low-arboricity web
  crawl analog (where LSH should *not* help).
- ``brain_lite`` — dense unweighted graph (high average degree, the
  regime where LSH wins).
- ``bloodvessel_lite`` / ``cochlea_lite`` — dense *weighted* graphs
  (HumanBase analogs; cochlea denser than blood vessel, as in the
  paper), run with weighted cosine similarity only, like the paper.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from pyspark.sql import SparkSession

from repro.graph import generators as gen
from repro.graph.graphframe import UndirectedGraph


@dataclass(frozen=True)
class DatasetSpec:
    """One registry entry."""

    name: str
    paper_name: str
    paper_n: int
    paper_m: int
    weighted: bool
    dense: bool
    factory: Callable[[SparkSession], UndirectedGraph]


def _orkut(spark):
    # Sparse overall but with tight planted communities (block size 60,
    # p_in = .7) so in-block similarities reach ~.6 and the paper's
    # eps sweep (.1–.9) crosses from "everything clustered" to "nothing
    # clustered", as on the real social graphs.
    return gen.sbm_graph(spark, n=3000, n_blocks=50, p_in=0.70, p_out=0.001, seed=11)


def _friendster(spark):
    return gen.sbm_graph(spark, n=4500, n_blocks=75, p_in=0.50, p_out=0.0008, seed=12)


def _webbase(spark):  # very sparse skewed web crawl analog
    return gen.powerlaw_graph(spark, n=20000, m=50000, gamma=2.3, seed=13)


def _brain(spark):  # dense unweighted
    return gen.sbm_graph(spark, n=700, n_blocks=7, p_in=0.70, p_out=0.10, seed=14)


def _bloodvessel(spark):  # dense weighted
    return gen.sbm_graph(
        spark, n=400, n_blocks=5, p_in=0.80, p_out=0.25, seed=15, weighted=True
    )


def _cochlea(spark):  # densest weighted
    return gen.sbm_graph(
        spark, n=400, n_blocks=4, p_in=0.90, p_out=0.45, seed=16, weighted=True
    )


REGISTRY: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("orkut_lite", "Orkut", 3_072_441, 117_185_083, False, False, _orkut),
        DatasetSpec("brain_lite", "brain", 784_262, 267_844_669, False, True, _brain),
        DatasetSpec(
            "webbase_lite", "WebBase", 118_142_155, 854_809_761, False, False, _webbase
        ),
        DatasetSpec(
            "friendster_lite",
            "Friendster",
            65_608_366,
            1_806_067_135,
            False,
            False,
            _friendster,
        ),
        DatasetSpec(
            "bloodvessel_lite", "blood vessel", 25_825, 70_240_269, True, True, _bloodvessel
        ),
        DatasetSpec("cochlea_lite", "cochlea", 25_825, 282_977_319, True, True, _cochlea),
    ]
}

#: Similarity measure each dataset runs with (paper: cosine everywhere,
#: weighted cosine on the two weighted graphs).
def measure_for(name: str) -> str:
    return "wcosine" if REGISTRY[name].weighted else "cosine"


def load(spark: SparkSession, name: str) -> UndirectedGraph:
    """Build + materialize one registry graph."""
    return REGISTRY[name].factory(spark).materialize()


def table2_rows(spark: SparkSession) -> list[dict]:
    """The Table-2 analog: our sizes next to the paper's."""
    rows = []
    for spec in REGISTRY.values():
        g = load(spark, spec.name)
        rows.append(
            {
                "dataset": spec.name,
                "paper_graph": spec.paper_name,
                "n": g.num_vertices,
                "m": g.num_edges(),
                "type": "weighted" if spec.weighted else "unweighted",
                "avg_deg": round(2 * g.num_edges() / g.num_vertices, 1),
                "paper_n": spec.paper_n,
                "paper_m": spec.paper_m,
            }
        )
        g.unpersist()
    return rows
