"""The provided TPC-H-lite generators still work, and the graph-schema
extension is exposed through synth_data."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_generates(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    assert li.count() == 6000
    assert "l_orderkey" in li.columns


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    assert a.equals(b)


def test_orders_oracle_roundtrip(spark):
    """The provided DuckDB oracle wiring works on provided generators."""
    o = synth_data.orders(spark, sf=0.001)
    from pyspark.sql import functions as F

    got = o.groupBy("o_orderstatus").agg(F.count("*").alias("cnt"))
    assert_equivalent(
        got,
        "SELECT o_orderstatus, COUNT(*) AS cnt FROM o GROUP BY o_orderstatus",
        o=o,
    )


def test_graph_generators_reexported(spark):
    g = synth_data.fig1_graph(spark)
    assert g.num_edges() == 13
    pdf = synth_data.sbm_edges_pandas(30, 3, 0.5, 0.1, seed=0)
    assert not pdf.empty
    pdf2 = synth_data.powerlaw_edges_pandas(100, 150, seed=0)
    assert not pdf2.empty


def test_zipf_and_uniform_keys(spark):
    z = synth_data.zipf_keys(spark, n=1000, n_keys=50).toPandas()
    u = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    # zipf is skewed: top key much more frequent than uniform's top key
    assert z["k"].value_counts().iloc[0] > 2 * u["k"].value_counts().iloc[0]
