"""Provided TPC-H-lite generators: determinism, schema, and an oracle
round-trip tying them into the entropy pipeline."""
import pytest

from repro import synth_data
from repro.entropy.local_pli import LocalPLIEngine
from repro.oracle import assert_equivalent
from tests.helpers import naive_entropy


@pytest.fixture(scope="module")
def li(spark):
    df = synth_data.lineitem(spark, sf=0.001, seed=0)
    df.persist()
    df.count()
    yield df
    df.unpersist()


def test_lineitem_schema(li):
    assert {"l_orderkey", "l_partkey", "l_returnflag", "l_linestatus"} <= set(
        li.columns
    )
    assert li.count() == 6000


def test_orders_and_customer_and_part(spark):
    assert synth_data.orders(spark, sf=0.001).count() == 1500
    assert synth_data.customer(spark, sf=0.001).count() == 150
    assert synth_data.part(spark, sf=0.001).count() == 200


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    assert a.equals(b)


def test_zipf_and_uniform_keys(spark):
    z = synth_data.zipf_keys(spark, n=1000, n_keys=50).toPandas()
    u = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert z["k"].value_counts().iloc[0] > u["k"].value_counts().iloc[0]


def test_entropy_over_lineitem(li):
    """Entropy of categorical lineitem columns via the PLI engine equals
    the direct Eq. (5) computation."""
    cols = ["l_returnflag", "l_linestatus"]
    pdf = li.select(*cols).toPandas()
    eng = LocalPLIEngine.from_spark(li.select(*cols))
    assert eng.entropy(cols) == pytest.approx(naive_entropy(pdf, cols), abs=1e-9)


def test_lineitem_aggregation_oracle(spark, li):
    from pyspark.sql import functions as F

    got = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("n"), F.sum("l_quantity").alias("qty")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS n, sum(l_quantity) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )
