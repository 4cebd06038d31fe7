"""Connected components: distributed label propagation vs union-find
vs the DuckDB recursive-CTE oracle."""
import pandas as pd
import pytest

from repro.cc.label_prop import connected_components_df
from repro.cc.union_find import components_from_edges
from repro.graph import generators as gen
from repro.oracle import assert_equivalent
from tests.oracle_sql import COMPONENTS


def _to_spark(spark, edges, n):
    e = spark.createDataFrame(pd.DataFrame(edges, columns=["u", "v"])) if edges else (
        spark.createDataFrame([], "u long, v long")
    )
    v = spark.createDataFrame(pd.DataFrame({"v": range(1, n + 1)}))
    return e, v


CASES = [
    ("path", [(1, 2), (2, 3), (3, 4), (4, 5)], 5),
    ("two_components", [(1, 2), (2, 3), (4, 5)], 6),
    ("star", [(1, x) for x in range(2, 8)], 7),
    ("cycle", [(1, 2), (2, 3), (3, 4), (4, 1)], 4),
    ("singletons", [], 4),
]


@pytest.mark.parametrize("name,edges,n", CASES, ids=[c[0] for c in CASES])
def test_label_prop_matches_duckdb(spark, name, edges, n):
    e, v = _to_spark(spark, edges, n)
    assert_equivalent(connected_components_df(e, v), COMPONENTS, edges=e, verts=v)


@pytest.mark.parametrize("name,edges,n", CASES, ids=[c[0] for c in CASES])
def test_union_find_matches_duckdb_cases(spark, name, edges, n):
    got = components_from_edges(edges, range(1, n + 1))
    e, v = _to_spark(spark, edges, n)
    pdf = pd.DataFrame(
        sorted(got.items()), columns=["v", "cluster"]
    )
    import duckdb

    con = duckdb.connect()
    con.register("edges", e.toPandas())
    con.register("verts", v.toPandas())
    expect = con.execute(COMPONENTS).fetchdf().sort_values("v").reset_index(drop=True)
    con.close()
    assert pdf.astype("int64").equals(expect.astype("int64"))


@pytest.mark.parametrize("seed", [0, 1])
def test_label_prop_vs_union_find_random(spark, seed):
    pdf = gen.gnp_edges_pandas(50, 0.05, seed)
    e = spark.createDataFrame(pdf[["u", "v"]])
    v = spark.createDataFrame(pd.DataFrame({"v": range(1, 51)}))
    got = dict(
        connected_components_df(e, v).toPandas().itertuples(index=False)
    )
    expect = components_from_edges(
        list(map(tuple, pdf[["u", "v"]].to_numpy())), range(1, 51)
    )
    assert got == expect


def test_label_prop_labels_are_component_minimum(spark):
    e, v = _to_spark(spark, [(5, 9), (9, 2), (7, 8)], 9)
    got = dict(connected_components_df(e, v).toPandas().itertuples(index=False))
    assert got[5] == got[9] == got[2] == 2
    assert got[7] == got[8] == 7
    assert got[1] == 1


def test_union_find_canonical_min_labels():
    got = components_from_edges([(3, 7), (7, 9)], [1, 3, 7, 9])
    assert got == {1: 1, 3: 3, 7: 3, 9: 3}
