"""Provided TPC-H-lite generators + the graph extension, with oracle smoke."""
import pytest

from repro import oracle, synth_data


def test_lineitem_shape_and_determinism(gspark):
    a = synth_data.lineitem(gspark, sf=0.001, seed=3)
    b = synth_data.lineitem(gspark, sf=0.001, seed=3)
    assert a.count() == b.count() == 6000
    assert sorted(a.columns)[:3] == ["l_discount", "l_extendedprice", "l_linenumber"]


def test_orders_customer_part(gspark):
    o = synth_data.orders(gspark, sf=0.001)
    c = synth_data.customer(gspark, sf=0.001)
    p = synth_data.part(gspark, sf=0.001)
    assert o.count() == 1500
    assert c.count() == 150
    assert p.count() == 200


def test_key_generators(gspark):
    z = synth_data.zipf_keys(gspark, n=2000, n_keys=50)
    u = synth_data.uniform_keys(gspark, n=2000, n_keys=50)
    zc = z.groupBy("k").count().toPandas()
    uc = u.groupBy("k").count().toPandas()
    assert zc["count"].max() > 2 * uc["count"].max()  # zipf is skewed


def test_tpch_lite_oracle_smoke(gspark):
    """A join+agg over lineitem/orders checked against DuckDB."""
    li = synth_data.lineitem(gspark, sf=0.001)
    o = synth_data.orders(gspark, sf=0.001)
    got = (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg({"l_quantity": "sum"})
        .withColumnRenamed("sum(l_quantity)", "q")
    )
    oracle.assert_equivalent(
        got,
        """
        SELECT o_orderpriority, SUM(l_quantity) AS q
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=o,
    )


def test_digraph_edges_extension(gspark):
    df = synth_data.digraph_edges(gspark, kind="power_law", n=200, avg_deg=4, seed=1)
    assert df.columns == ["src", "dst"]
    n = df.count()
    assert 200 <= n <= 800
